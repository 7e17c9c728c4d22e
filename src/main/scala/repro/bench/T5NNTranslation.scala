package repro.bench

import repro.bench.BenchUtil._
import repro.data.HospitalData
import repro.linalg.Tensor
import repro.ml.NNTranslator
import repro.onnx.Session
import repro.runtime.{ClassicRuntime, SimGpu}

/** Table 5 — NN translation (Fig. 2(d)).
  *
  * Paper numbers (hospital random forest): RF-NN on CPU ~2× faster than
  * scikit-learn RF at 1K tuples, the gap closing as size grows; RF-NN on
  * a K80 GPU ~10% faster than CPU at 1K and up to ~15× over scikit-learn
  * at 1M tuples (the parallel device wins with utilization).
  *
  * GPU substitution (no device in this container): the same LA graph
  * executed with row-parallel kernels across all cores plus a simulated
  * launch-latency/PCIe-transfer charge — see [[repro.runtime.SimGpu]].
  *
  * Substrate caveat (discussed in EXPERIMENTS.md): the paper's baseline is
  * scikit-learn (interpreted-framework overheads) and its GEMM runs on
  * SIMD BLAS; our baseline is compiled JVM tree traversal and our GEMM is
  * scalar JVM code, so the absolute CPU-translation advantage inverts.
  * The device-parallelism shape — GPU ≫ CPU-NN, growing with batch size —
  * is what this table reproduces.
  */
object T5NNTranslation {

  def run(sizes: Seq[Int] = Seq(1000, 10000, 100000, 300000)): BenchTable = {
    val mp = BenchModels.hospitalForestPipeline
    val graph = NNTranslator.translateModel(BenchModels.hospitalForest, "t5_rf")
    val cpu = new Session(graph)
    val gpu = new SimGpu.GpuSession(graph)

    val maxN = sizes.max
    val allRaw = HospitalData.localJoined(maxN, seed = 91).map(HospitalData.rawValues)
    val allFeats = allRaw.map(mp.pipeline.transform)

    // correctness: the three paths agree (float32 tolerance)
    val check = allFeats.take(2000)
    val a = check.map(BenchModels.hospitalForest.predict)
    val b = cpu.predictBatch(check)
    val c = new SimGpu.GpuSession(graph, SimGpu.GpuSpec(kernelLaunchMicros = 0.0)).predictBatch(check)
    a.indices.foreach { i =>
      require(math.abs(a(i) - b(i)) < 1e-3 && b(i) == c(i), s"paths diverged at $i: ${a(i)} ${b(i)} ${c(i)}")
    }

    val rows = sizes.map { n =>
      val raw = allRaw.take(n)
      val reps = if (n >= 300000) 2 else 3
      // every path pays featurization: the paper translates the END-TO-END
      // pipeline, so featurize+infer is the measured unit on all sides
      def featurize(): Array[Array[Double]] = raw.map(mp.pipeline.transform)
      val tRf = timeMillis(warmup = 1, reps = reps)(ClassicRuntime.scoreRaw(raw, mp))
      val tCpu = timeMillis(warmup = 1, reps = reps)(cpu.run(Tensor.ofDoubleRows(featurize())))
      val tGpu = timeMillis(warmup = 1, reps = reps)(
        gpu.run(Map(NNTranslator.InputName -> Tensor.ofDoubleRows(featurize()))))
      Seq(n.toString, fmt(tRf), fmt(tCpu), fmt(tGpu),
        fmtX(tRf / tCpu), fmtX(tRf / tGpu), fmtX(tCpu / tGpu))
    }

    BenchTable(
      "T5: NN translation, hospital RF [paper Fig 2(d): RF-NN CPU ~2x at 1K, gap closes; GPU up to 15x at 1M]",
      Seq("rows", "rf_classic_ms", "rfnn_cpu_ms", "rfnn_gpu_ms", "cpu_speedup", "gpu_speedup", "gpu_vs_cpu"),
      rows)
  }

  def main(args: Array[String]): Unit = run().print()
}

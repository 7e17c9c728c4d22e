package repro.onnx

import repro.linalg.Tensor

/** An inference session over an OnnxLite graph — the analogue of an ONNX
  * Runtime `InferenceSession`.
  *
  * Construction validates the graph and runs the optimizer passes (this
  * cost is what SQL Server's inference-session cache amortizes across
  * queries, per §5 of the paper — the standalone "ORT" backend pays it on
  * every query, the in-process "Raven" backend pays it once).
  *
  * @param parallelism row-parallelism for GEMM kernels; 1 models
  *                    single-threaded ORT, >1 the simulated GPU.
  */
final class Session(
    rawGraph: GraphDef,
    optimizeGraph: Boolean = true,
    val parallelism: Int = 1,
) extends Serializable {

  val graph: GraphDef =
    if (optimizeGraph) Passes.optimize(rawGraph.validated) else rawGraph.validated

  /** Run the graph over named input batches; every live input must be provided. */
  def run(feeds: Map[String, Tensor]): Tensor = {
    val live = graph.liveInputs
    live.foreach(i => require(feeds.contains(i), s"${graph.name}: missing feed for input '$i'"))
    val env = scala.collection.mutable.Map[String, Tensor](graph.initializers.toSeq: _*)
    feeds.foreach { case (k, v) => if (live.contains(k)) env(k) = v }
    graph.nodes.foreach { n =>
      env(n.output) = Ops.execute(n, n.inputs.map(env), parallelism)
    }
    env(graph.output)
  }

  /** Convenience for single-input graphs ("X" → featurized batch). */
  def run(input: Tensor): Tensor = {
    val live = graph.liveInputs
    require(live.size <= 1, s"${graph.name}: graph has inputs $live; use run(Map)")
    run(live.headOption.map(_ -> input).toMap)
  }

  /** Predictions as a double column for a batch given as double rows. */
  def predictBatch(rows: Array[Array[Double]]): Array[Double] = {
    if (rows.isEmpty) return Array.empty
    val out = run(Tensor.ofDoubleRows(rows))
    require(out.cols == 1, s"${graph.name}: expected single output column, got ${out.cols}")
    out.data.map(_.toDouble)
  }
}

/** Process-wide session cache keyed by model id — the analogue of SQL
  * Server's model/inference-session cache that makes warm small-batch
  * queries fast (§5 observation ii).
  */
object SessionCache {
  private val cache = new java.util.concurrent.ConcurrentHashMap[String, Session]()

  def get(modelId: String, graph: => GraphDef, parallelism: Int = 1): Session =
    cache.computeIfAbsent(modelId, _ => new Session(graph, optimizeGraph = true, parallelism))

  def invalidate(modelId: String): Unit = cache.remove(modelId)
  def clear(): Unit = cache.clear()
  def size: Int = cache.size
}

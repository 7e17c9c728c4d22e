package repro.core.opt

import org.scalatest.funsuite.AnyFunSuite
import repro.TestModels
import repro.data.{FlightData, HospitalData}

class ModelClusteringSpec extends AnyFunSuite {

  private lazy val flightSample =
    TestModels.flightRows.take(2000).map(FlightData.rawValues)

  test("clustered flight model predicts identically to the base model (fallback-correct)") {
    val clustered = ModelClustering.compile(TestModels.flightLrPipeline, flightSample, k = 8)
    TestModels.flightRows.slice(2000, 3000).foreach { f =>
      val raw = FlightData.rawValues(f)
      val base = TestModels.flightLrPipeline.predictRaw(raw)
      val got = clustered.predictRaw(raw)
      assert(math.abs(got - base) < 1e-9, s"flight ${f.flight_id}")
    }
  }

  test("flight clusters compile to substantially fewer features") {
    val clustered = ModelClustering.compile(TestModels.flightLrPipeline, flightSample, k = 16)
    val baseUsed = TestModels.flightLrPipeline.model.usedFeatures.size.toDouble
    assert(clustered.meanFeatures < baseUsed * 0.8,
      s"mean ${clustered.meanFeatures} vs base $baseUsed")
  }

  test("more clusters drop more features (monotone trend, Fig. 2(b))") {
    val m2 = ModelClustering.compile(TestModels.flightLrPipeline, flightSample, k = 2).meanFeatures
    val m16 = ModelClustering.compile(TestModels.flightLrPipeline, flightSample, k = 16).meanFeatures
    assert(m16 < m2, s"k=2 -> $m2, k=16 -> $m16")
  }

  test("hospital data barely benefits (categoricals already binary)") {
    val sample = TestModels.hospitalRows.take(2000).map(HospitalData.rawValues)
    val clustered = ModelClustering.compile(TestModels.hospitalTreePipeline, sample, k = 8)
    val baseUsed = TestModels.hospitalTreePipeline.model.usedFeatures.size.toDouble
    // numeric-heavy feature space: most used features survive clustering
    assert(clustered.meanFeatures > baseUsed * 0.5,
      s"unexpectedly large reduction: ${clustered.meanFeatures} of $baseUsed")
    // correctness still holds
    TestModels.hospitalRows.slice(2000, 2500).foreach { j =>
      val raw = HospitalData.rawValues(j)
      assert(math.abs(clustered.predictRaw(raw) - TestModels.hospitalTreePipeline.predictRaw(raw)) < 1e-9)
    }
  }

  test("cluster assignment is consistent with the router") {
    val clustered = ModelClustering.compile(TestModels.flightLrPipeline, flightSample, k = 4)
    flightSample.take(100).foreach { raw =>
      val c = clustered.assign(raw)
      assert(c >= 0 && c < 4)
    }
  }

  test("compile reports clustering and compile costs") {
    val clustered = ModelClustering.compile(TestModels.flightLrPipeline, flightSample.take(500), k = 4)
    assert(clustered.clusterMillis >= 0 && clustered.compileMillis >= 0)
    assert(clustered.clusters.size == 4)
  }
}

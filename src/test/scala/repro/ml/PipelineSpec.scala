package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.TestModels
import repro.core.opt.ModelClustering.CompactFeaturizer
import repro.data.HospitalData

class PipelineSpec extends AnyFunSuite {

  test("ModelPipeline scores raw rows end to end") {
    val mp = TestModels.handTreePipeline
    val j = TestModels.hospitalRows(0)
    val feats = HospitalData.pipeline.transform(HospitalData.rawValues(j))
    assert(mp.predictRaw(HospitalData.rawValues(j)) == TestModels.handTree.predict(feats))
  }

  test("scaler is applied between featurization and the model") {
    val mp = TestModels.hospitalMlpPipeline
    val j = TestModels.hospitalRows(1)
    val feats = HospitalData.pipeline.transform(HospitalData.rawValues(j))
    val scaled = mp.scaler.get.transform(feats)
    assert(mp.predictRaw(HospitalData.rawValues(j)) == mp.model.predict(scaled))
  }

  test("optimizeFor refuses to prune through a scaler") {
    assertThrows[IllegalArgumentException] {
      TestModels.hospitalMlpPipeline.optimizeFor(Seq(NumRange("age", FeatureConstraint.atLeast(35))))
    }
  }

  test("predictRawBatch equals per-row scoring") {
    val mp = TestModels.flightLrPipeline
    val rows = TestModels.flightRows.take(20).map(repro.data.FlightData.rawValues).toIndexedSeq
    assert(mp.predictRawBatch(rows).toSeq == rows.map(mp.predictRaw))
  }

  test("CompactFeaturizer over all features matches the full pipeline") {
    val pipe = HospitalData.pipeline
    val cf = CompactFeaturizer(pipe, (0 until pipe.numFeatures).toIndexedSeq)
    TestModels.hospitalRows.take(50).foreach { j =>
      val raw = HospitalData.rawValues(j)
      assert(cf.transform(raw).toSeq == pipe.transform(raw).toSeq)
    }
  }

  test("CompactFeaturizer over a subset computes exactly those features") {
    val pipe = HospitalData.pipeline
    val ageIdx = pipe.numericIndex("age")
    val (gOff, gEnc) = pipe.encoderBlock("gender")
    val fIdx = gOff + gEnc.indexOf("F")
    val cf = CompactFeaturizer(pipe, IndexedSeq(ageIdx, fIdx))
    TestModels.hospitalRows.take(50).foreach { j =>
      val raw = HospitalData.rawValues(j)
      val full = pipe.transform(raw)
      assert(cf.transform(raw).toSeq == Seq(full(ageIdx), full(fIdx)))
    }
  }

  test("CompactFeaturizer cost model: output width equals kept size") {
    val pipe = repro.data.FlightData.pipeline
    val cf = CompactFeaturizer(pipe, IndexedSeq(0, 1, 5, 20, 130))
    assert(cf.numFeatures == 5)
    assert(cf.transform(repro.data.FlightData.rawValues(TestModels.flightRows(0))).length == 5)
  }
}

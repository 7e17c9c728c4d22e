package repro.bench

import repro.data.{FlightData, HospitalData}
import repro.ml._

/** Models shared by the benchmark harnesses — trained once per JVM on
  * larger samples than the unit-test fixtures.
  */
object BenchModels {

  val TrainN = 20000

  // ---- hospital -----------------------------------------------------------

  lazy val hospitalTrain: Array[HospitalData.Joined] = HospitalData.localJoined(TrainN, seed = 7101)
  lazy val (hospitalX, hospitalY) = HospitalData.featurized(hospitalTrain)

  /** Length-of-stay regression tree (Fig. 2(c), §4.1 pruning). */
  lazy val hospitalTree: DecisionTreeModel =
    DecisionTree.train(hospitalX, hospitalY, isClassifier = false, maxDepth = 8, minSamplesLeaf = 20)

  lazy val hospitalTreePipeline: ModelPipeline =
    ModelPipeline("bench_hospital_dt", HospitalData.pipeline, None, hospitalTree)

  /** Random forest for NN translation (Fig. 2(d)) and Fig. 3. */
  lazy val hospitalForest: RandomForestModel =
    RandomForest.train(hospitalX, hospitalY, isClassifier = false,
      numTrees = 10, maxDepth = 5, minSamplesLeaf = 20)

  lazy val hospitalForestPipeline: ModelPipeline =
    ModelPipeline("bench_hospital_rf", HospitalData.pipeline, None, hospitalForest)

  /** Compact forest for the Fig. 3 end-to-end comparison — sized so the
    * single-threaded standalone path stays in benchmark budget at 500K rows.
    */
  lazy val fig3ForestPipeline: ModelPipeline = {
    val forest = RandomForest.train(hospitalX, hospitalY, isClassifier = false,
      numTrees = 10, maxDepth = 4, minSamplesLeaf = 50)
    ModelPipeline("fig3_hospital_rf", HospitalData.pipeline, None, forest)
  }

  /** MLP pipeline (featurize → scale → 13-32-16-1 net) for Fig. 3. */
  lazy val hospitalMlpPipeline: ModelPipeline = {
    val scaler = StandardScaler.fit(hospitalX)
    val y = hospitalY.map(v => if (v > 7) 1.0 else 0.0)
    val mlp = MlpModel.train(hospitalX.map(scaler.transform), y, hidden = Seq(32, 16), epochs = 2)
    ModelPipeline("bench_hospital_mlp", HospitalData.pipeline, Some(scaler), mlp)
  }

  // ---- flight -------------------------------------------------------------

  lazy val flightTrain: Array[FlightData.Flight] = FlightData.localFlights(TrainN, seed = 7202)
  lazy val (flightX, flightY) = FlightData.featurized(flightTrain)

  /** Dense logistic-regression delay model (predicate pruning, clustering). */
  lazy val flightLr: LinearModel =
    LinearModel.train(flightX, flightY, logistic = true, l1 = 0.0, epochs = 60, lr = 0.3)

  lazy val flightLrPipeline: ModelPipeline =
    ModelPipeline("bench_flight_lr", FlightData.pipeline, None, flightLr)

  /** The two Fig. 2(a) models, pinned to the paper's sparsity levels. */
  lazy val flightLrSparse4175: LinearModel = flightLr.sparsify(0.4175)
  lazy val flightLrSparse8096: LinearModel = flightLr.sparsify(0.8096)
}

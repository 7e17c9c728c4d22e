package repro.sparkext

import org.apache.spark.sql.catalyst.plans.logical.{Join, LogicalPlan}
import org.scalatest.BeforeAndAfterEach
import org.scalatest.funsuite.AnyFunSuite
import repro.{Oracle, SparkSpec, TestModels, TestTables}
import repro.data.HospitalData
import repro.ml._

/** Catalyst-level integration: the `raven_predict` expression plus the
  * optimizer rules injected via `extraOptimizations`.
  */
class RavenSparkSpec extends AnyFunSuite with SparkSpec with BeforeAndAfterEach {

  private lazy val tables = TestTables.tables(spark)

  override def beforeEach(): Unit = {
    super.beforeEach()
    tables // force registration of temp views
    Raven.installRuntimeOnly(spark)
    Raven.deploy(TestModels.handTreePipeline)
    Raven.deploy(TestModels.flightLrPipeline)
    spark.experimental.extraOptimizations = Nil
    RavenRules.RavenIntegrity.clear()
  }

  override def afterEach(): Unit = {
    spark.experimental.extraOptimizations = Nil
    super.afterEach()
  }

  private def withRules[A](rules: Seq[org.apache.spark.sql.catalyst.rules.Rule[LogicalPlan]])(f: => A): A = {
    spark.experimental.extraOptimizations = rules
    try f
    finally spark.experimental.extraOptimizations = Nil
  }

  private def predictsIn(plan: LogicalPlan): Seq[PredictExpression] =
    plan.collect { case p => p.expressions.flatMap(_.collect { case e: PredictExpression => e }) }.flatten

  private lazy val handSql = {
    Raven.deploy(TestModels.handTreePipeline)
    Raven.predictSql(TestModels.handTreePipeline.id)
  }

  test("raven_predict evaluates the deployed pipeline per row") {
    val df = spark.sql(s"SELECT patient_id, $handSql AS score FROM patients_all")
    val got = df.collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
    HospitalData.localJoined(TestTables.HospitalN.toInt).take(200).foreach { j =>
      val want = TestModels.handTreePipeline.predictRaw(HospitalData.rawValues(j))
      assert(got(j.patient_id) == want)
    }
  }

  test("raven_predict validates arity and model id") {
    assertThrows[Exception](spark.sql("SELECT raven_predict('hospital_hand_dt', age) FROM patients_all").collect())
    assertThrows[Exception](spark.sql("SELECT raven_predict('nope') FROM patients_all").collect())
  }

  test("predicate pruning rule specializes the model below a filter") {
    withRules(Seq(RavenRules.PredicateModelPruning)) {
      val df = spark.sql(
        s"SELECT patient_id, $handSql AS score FROM patients_all WHERE pregnant = 1")
      val predicts = predictsIn(df.queryExecution.optimizedPlan)
      assert(predicts.nonEmpty)
      assert(predicts.forall(_.modelId != TestModels.handTreePipeline.id), s"not specialized: $predicts")
      val derived = ModelRegistry.get(predicts.head.modelId)
      assert(derived.model.asInstanceOf[DecisionTreeModel].nodeCount < TestModels.handTree.nodeCount)
      // results identical to the unoptimized run
      val got = df.collect().map(r => (r.getLong(0), r.getDouble(1))).sortBy(_._1)
      spark.experimental.extraOptimizations = Nil
      val want = spark.sql(
        s"SELECT patient_id, $handSql AS score FROM patients_all WHERE pregnant = 1")
        .collect().map(r => (r.getLong(0), r.getDouble(1))).sortBy(_._1)
      assert(got.toSeq == want.toSeq)
    }
  }

  test("sibling conjuncts in the same filter license pruning (score > 7 AND pregnant = 1)") {
    withRules(Seq(RavenRules.PredicateModelPruning)) {
      val df = spark.sql(
        s"SELECT patient_id FROM patients_all WHERE pregnant = 1 AND $handSql > 7")
      val predicts = predictsIn(df.queryExecution.optimizedPlan)
      assert(predicts.nonEmpty && predicts.forall(_.modelId != TestModels.handTreePipeline.id))
      // semantics: same rows as without rules
      val got = df.collect().map(_.getLong(0)).sorted
      spark.experimental.extraOptimizations = Nil
      val want = spark.sql(
        s"SELECT patient_id FROM patients_all WHERE pregnant = 1 AND $handSql > 7")
        .collect().map(_.getLong(0)).sorted
      assert(got.toSeq == want.toSeq)
    }
  }

  test("range predicates prune too (bp >= 140 collapses the bp split)") {
    withRules(Seq(RavenRules.PredicateModelPruning)) {
      val df = spark.sql(
        s"SELECT patient_id, $handSql AS score FROM patients_all WHERE pregnant = 1 AND bp >= 140")
      val predicts = predictsIn(df.queryExecution.optimizedPlan)
      val derived = ModelRegistry.get(predicts.head.modelId)
      val tree = derived.model.asInstanceOf[DecisionTreeModel]
      assert(tree.nodeCount == 3, s"expected only the age split, got ${tree.nodeCount} nodes")
    }
  }

  test("no pruning across the nullable side of a left outer join") {
    withRules(Seq(RavenRules.PredicateModelPruning)) {
      tables("patient_info").createOrReplaceTempView("pi_keys")
      val df = spark.sql(
        s"""SELECT a.patient_id, $handSql AS score
           |FROM (SELECT patient_id FROM pi_keys) a
           |LEFT JOIN (SELECT * FROM patients_all WHERE pregnant = 1) b
           |ON a.patient_id = b.patient_id""".stripMargin)
      val predicts = predictsIn(df.queryExecution.optimizedPlan)
      assert(predicts.nonEmpty)
      assert(predicts.forall(_.modelId == TestModels.handTreePipeline.id),
        "outer-join nullable-side constraint must not prune")
    }
  }

  test("inner join constraints do prune across sides") {
    withRules(Seq(RavenRules.PredicateModelPruning)) {
      val df = spark.sql(
        s"""SELECT a.patient_id, $handSql AS score
           |FROM (SELECT * FROM patients_all WHERE pregnant = 1) a
           |JOIN (SELECT patient_id AS pid FROM patient_info) k ON a.patient_id = k.pid""".stripMargin)
      val predicts = predictsIn(df.queryExecution.optimizedPlan)
      assert(predicts.nonEmpty && predicts.forall(_.modelId != TestModels.handTreePipeline.id))
    }
  }

  test("model-projection pushdown narrows the predict's children") {
    // L1-regularized to the point where the origin and dest one-hot blocks
    // are entirely zero: those raw columns become dead inputs.
    val pipe = repro.data.FlightData.pipeline
    val w = TestModels.flightLr.weights.clone()
    Seq("origin", "dest").foreach { col =>
      val (off, enc) = pipe.encoderBlock(col)
      (off until off + enc.width).foreach(w(_) = 0.0)
    }
    val mp = ModelPipeline("flight_lr_blocksparse", pipe, None,
      TestModels.flightLr.copy(weights = w))
    Raven.deploy(mp)
    withRules(Seq(RavenRules.ModelProjectionPushdown)) {
      val df = spark.sql(s"SELECT flight_id, ${Raven.predictSql("flight_lr_blocksparse")} AS p FROM flights")
      val predicts = predictsIn(df.queryExecution.optimizedPlan)
      assert(predicts.nonEmpty)
      val derived = ModelRegistry.get(predicts.head.modelId)
      assert(derived.inputCols == pipe.inputCols.filterNot(Set("origin", "dest")))
      assert(predicts.head.children.size == derived.inputCols.size)
      assert(derived.pipeline.numFeatures == mp.pipeline.numFeatures - 200)
      // semantics preserved
      val got = df.collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
      TestModels.flightRows.take(100).foreach { f =>
        if (got.contains(f.flight_id)) {
          val want = mp.predictRaw(repro.data.FlightData.rawValues(f))
          assert(math.abs(got(f.flight_id) - want) < 1e-12)
        }
      }
    }
  }

  test("join elimination drops a contribution-free FK join") {
    RavenRules.RavenIntegrity.declareRowPreserving("patient_id", "patient_id")
    // model over patient_info columns only
    val agePipe = ModelPipeline("age_model",
      FeaturePipeline(Seq("age"), Nil), None, LinearModel(Array(0.1), 0.0, logistic = false))
    Raven.deploy(agePipe)
    withRules(Seq(RavenRules.JoinElimination)) {
      val df = spark.sql(
        """SELECT raven_predict('age_model', p.age) AS s
          |FROM patient_info p JOIN prenatal_tests t ON p.patient_id = t.patient_id""".stripMargin)
      val joins = df.queryExecution.optimizedPlan.collect { case j: Join => j }
      assert(joins.isEmpty, s"join not eliminated:\n${df.queryExecution.optimizedPlan}")
      assert(df.count() == TestTables.HospitalN)
    }
  }

  test("join elimination does not fire without a declared constraint") {
    val agePipe = ModelPipeline("age_model2",
      FeaturePipeline(Seq("age"), Nil), None, LinearModel(Array(0.1), 0.0, logistic = false))
    Raven.deploy(agePipe)
    withRules(Seq(RavenRules.JoinElimination)) {
      val df = spark.sql(
        """SELECT raven_predict('age_model2', p.age) AS s
          |FROM patient_info p JOIN prenatal_tests t ON p.patient_id = t.patient_id""".stripMargin)
      assert(df.queryExecution.optimizedPlan.collect { case j: Join => j }.nonEmpty)
    }
  }

  test("join elimination does not fire when the right side is filtered") {
    RavenRules.RavenIntegrity.declareRowPreserving("patient_id", "patient_id")
    val agePipe = ModelPipeline("age_model3",
      FeaturePipeline(Seq("age"), Nil), None, LinearModel(Array(0.1), 0.0, logistic = false))
    Raven.deploy(agePipe)
    withRules(Seq(RavenRules.JoinElimination)) {
      val df = spark.sql(
        """SELECT raven_predict('age_model3', p.age) AS s
          |FROM patient_info p JOIN (SELECT * FROM prenatal_tests WHERE bp > 120) t
          |ON p.patient_id = t.patient_id""".stripMargin)
      assert(df.queryExecution.optimizedPlan.collect { case j: Join => j }.nonEmpty)
    }
  }

  test("model inlining removes the predict expression and preserves results") {
    val noRules = spark.sql(s"SELECT patient_id, $handSql AS score FROM patients_all").collect()
      .map(r => (r.getLong(0), r.getDouble(1))).sortBy(_._1)
    withRules(Seq(RavenRules.ModelInlining(512))) {
      val df = spark.sql(s"SELECT patient_id, $handSql AS score FROM patients_all")
      assert(predictsIn(df.queryExecution.optimizedPlan).isEmpty, "predict should be inlined")
      val got = df.collect().map(r => (r.getLong(0), r.getDouble(1))).sortBy(_._1)
      assert(got.toSeq == noRules.toSeq)
    }
  }

  test("model inlining respects the node budget") {
    withRules(Seq(RavenRules.ModelInlining(2))) {
      val df = spark.sql(s"SELECT patient_id, $handSql AS score FROM patients_all")
      assert(predictsIn(df.queryExecution.optimizedPlan).nonEmpty)
    }
  }

  test("forest inlining averages the trees") {
    val forest = RandomForestModel(IndexedSeq(TestModels.handTree, TestModels.handTree), isClassifier = false)
    Raven.deploy(ModelPipeline("hand_rf", HospitalData.pipeline, None, forest))
    withRules(Seq(RavenRules.ModelInlining(512))) {
      val df = spark.sql(s"SELECT patient_id, ${Raven.predictSql("hand_rf")} AS score FROM patients_all")
      assert(predictsIn(df.queryExecution.optimizedPlan).isEmpty)
      val got = df.collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
      HospitalData.localJoined(50).foreach { j =>
        val want = forest.predict(HospitalData.pipeline.transform(HospitalData.rawValues(j)))
        assert(math.abs(got(j.patient_id) - want) < 1e-12)
      }
    }
  }

  test("full install: Fig-1 query end-to-end with all rules, oracle-checked against inlined SQL") {
    withRules(Raven.rules(512)) {
      RavenRules.RavenIntegrity.declareRowPreserving("patient_id", "patient_id")
      val query =
        s"""SELECT p.patient_id AS patient_id, $handSql AS score
           |FROM patient_info p
           |JOIN blood_tests b ON p.patient_id = b.patient_id
           |JOIN prenatal_tests t ON p.patient_id = t.patient_id
           |WHERE p.pregnant = 1""".stripMargin
            .replace(handSql, ravenPredictJoined)
      val df = spark.sql(query)
      assert(predictsIn(df.queryExecution.optimizedPlan).isEmpty, "should be fully inlined")
      // oracle: same tree as portable CASE SQL over the same tables
      val featureExprs = repro.core.opt.CrossOptimizer.ModelInlining.featureSqlExprs(HospitalData.pipeline)
      val caseSql = TestModels.handTree.toCaseSql(featureExprs)
      Oracle.assertEquivalent(
        df,
        s"""SELECT p.patient_id AS patient_id, ($caseSql) AS score
           |FROM patient_info p
           |JOIN blood_tests b ON p.patient_id = b.patient_id
           |JOIN prenatal_tests t ON p.patient_id = t.patient_id
           |WHERE p.pregnant = 1""".stripMargin,
        "patient_info" -> tables("patient_info"),
        "blood_tests" -> tables("blood_tests"),
        "prenatal_tests" -> tables("prenatal_tests"),
      )
    }
  }

  /** raven_predict over the 3-table join's columns in pipeline order. */
  private def ravenPredictJoined: String = {
    val colSource = Map(
      "age" -> "p.age", "pregnant" -> "p.pregnant", "num_prev_admissions" -> "p.num_prev_admissions",
      "hematocrit" -> "b.hematocrit", "neutrophils" -> "b.neutrophils", "glucose" -> "b.glucose",
      "bmi" -> "b.bmi", "pulse" -> "b.pulse", "bp" -> "t.bp", "fetal_hr" -> "t.fetal_hr",
      "gestation_weeks" -> "t.gestation_weeks", "gender" -> "p.gender")
    val args = HospitalData.pipeline.inputCols.map(colSource)
    s"raven_predict('${TestModels.handTreePipeline.id}', ${args.mkString(", ")})"
  }

  test("batched runtime predictions equal per-row expression predictions") {
    val batched = RavenRuntime.predictBatch(tables("patients_all"), TestModels.handTreePipeline.id, "score")
    val perRow = spark.sql(s"SELECT *, $handSql AS score FROM patients_all")
    TestTables.assertSameRows(
      batched.select("patient_id", "score"), perRow.select("patient_id", "score"), eps = 0.0)
  }

  test("derived model memoization is stable") {
    val id1 = ModelRegistry.deriveFor(TestModels.handTreePipeline.id, Seq(NumRange("pregnant", FeatureConstraint.equalTo(1.0))))
    val id2 = ModelRegistry.deriveFor(TestModels.handTreePipeline.id, Seq(NumRange("pregnant", FeatureConstraint.equalTo(1.0))))
    assert(id1 == id2)
    // deriving from the derived model with the same constraints is a fixpoint
    val id3 = ModelRegistry.deriveFor(id1, Seq(NumRange("pregnant", FeatureConstraint.equalTo(1.0))))
    assert(id3 == id1)
  }
}

package repro.core.opt

import org.scalatest.funsuite.AnyFunSuite
import repro.{SparkSpec, TestModels, TestTables}
import repro.core.analysis.StaticAnalyzer
import repro.core.codegen.RuntimeCodeGenerator
import repro.core.ir._
import repro.ml._

class CrossOptimizerSpec extends AnyFunSuite with SparkSpec {

  private val catalog = TestTables.hospitalCatalog
  private def store: String => ModelPipeline = Map(
    "hospital_dt" -> TestModels.handTreePipeline,
    "flight_lr" -> TestModels.flightLrPipeline,
  )

  private val fig1Sql =
    """SELECT patient_id, PREDICT(hospital_dt) AS los
      |FROM patient_info
      |JOIN blood_tests ON patient_info.patient_id = blood_tests.patient_id
      |JOIN prenatal_tests ON patient_info.patient_id = prenatal_tests.patient_id
      |WHERE pregnant = 1 AND PREDICT(hospital_dt) > 7""".stripMargin

  private def fig1Ir: IRNode = StaticAnalyzer.analyzeSql(fig1Sql, catalog, store).ir

  private def run(ir: IRNode) = RuntimeCodeGenerator.toDataFrame(ir, TestTables.tables(spark))

  test("filter pushdown moves pregnant=1 to the patient_info side of the joins") {
    val pushed = CrossOptimizer.FilterPushdown(fig1Ir)
    val filterOnScan = pushed.collectNodes.collectFirst {
      case IRFilter(p, IRScan("patient_info", _)) => p.toSql
    }
    assert(filterOnScan.contains("(pregnant = 1)"))
  }

  test("filter pushdown keeps the score predicate above the predict") {
    val pushed = CrossOptimizer.FilterPushdown(fig1Ir)
    val above = pushed.collectNodes.collectFirst { case IRFilter(p, _: IRPredict) => p.toSql }
    assert(above.contains("(los > 7)"))
  }

  test("filter pushdown merges stacked filters") {
    val ir = IRFilter(Cmp("<", ColRef("age"), NumLit(50)),
      IRFilter(Cmp(">", ColRef("age"), NumLit(20)), IRScan("patient_info", catalog.table("patient_info").columns)))
    val pushed = CrossOptimizer.FilterPushdown(ir)
    assert(pushed.collectNodes.count(_.isInstanceOf[IRFilter]) == 1)
  }

  test("filter pushdown renames through project aliases") {
    val ir = IRFilter(Cmp(">", ColRef("years"), NumLit(30)),
      IRProject(Seq(NamedExpr("years", ColRef("age")), NamedExpr("patient_id", ColRef("patient_id"))),
        IRScan("patient_info", catalog.table("patient_info").columns)))
    val pushed = CrossOptimizer.FilterPushdown(ir)
    val below = pushed.collectNodes.collectFirst { case IRFilter(p, _: IRScan) => p.toSql }
    assert(below.contains("(age > 30)"))
  }

  test("predicate-based model pruning shrinks the tree under pregnant=1") {
    val optimized = CrossOptimizer.PredicateModelPruning(CrossOptimizer.FilterPushdown(fig1Ir))
    val predict = optimized.collectNodes.collectFirst { case p: IRPredict => p }.get
    val pruned = predict.pipeline.model.asInstanceOf[DecisionTreeModel]
    assert(pruned.nodeCount < TestModels.handTree.nodeCount)
    assert(predict.pipeline.id.endsWith("#pruned"))
  }

  test("pruning + projection pushdown drop unused raw columns (pregnant=0 needs no bp)") {
    val sql = fig1Sql.replace("pregnant = 1", "pregnant = 0")
    var plan = StaticAnalyzer.analyzeSql(sql, catalog, store).ir
    plan = CrossOptimizer.FilterPushdown(plan)
    plan = CrossOptimizer.PredicateModelPruning(plan)
    plan = CrossOptimizer.ModelProjectionPushdown(plan)
    val predict = plan.collectNodes.collectFirst { case p: IRPredict => p }.get
    // pregnant=0 branch of the hand tree uses only age
    assert(predict.pipeline.inputCols == Seq("age"))
  }

  test("projection pruning narrows scans to needed columns") {
    val plan = CrossOptimizer.optimize(fig1Ir, catalog,
      OptimizerConfig(inlineMaxNodes = 0, joinElimination = false))
    val scanCols = plan.collectNodes.collectFirst { case IRScan("blood_tests", cols) => cols }.get
    // pruned pregnant=1 tree uses age + bp; blood_tests contributes only its key
    assert(scanCols == Seq("patient_id"))
  }

  test("join elimination drops FK joins that contribute nothing (pregnant=0: no prenatal columns)") {
    val sql = fig1Sql.replace("pregnant = 1", "pregnant = 0")
    val plan = CrossOptimizer.optimize(StaticAnalyzer.analyzeSql(sql, catalog, store).ir, catalog,
      OptimizerConfig(inlineMaxNodes = 0))
    val scans = plan.collectNodes.collect { case IRScan(t, _) => t }
    assert(!scans.contains("prenatal_tests"), s"plan:\n${plan.treeString}")
    assert(!scans.contains("blood_tests"))
  }

  test("join elimination requires a declared FK") {
    val noFk = new SchemaCatalog() // same tables, no FK declarations
    Seq("patient_info", "blood_tests", "prenatal_tests").foreach(t => noFk.register(catalog.table(t)))
    val sql = fig1Sql.replace("pregnant = 1", "pregnant = 0")
    val plan = CrossOptimizer.optimize(StaticAnalyzer.analyzeSql(sql, noFk, store).ir, noFk,
      OptimizerConfig(inlineMaxNodes = 0))
    val scans = plan.collectNodes.collect { case IRScan(t, _) => t }
    assert(scans.contains("prenatal_tests"))
  }

  test("model inlining turns small trees into relational CASE logic") {
    val plan = CrossOptimizer.optimize(fig1Ir, catalog, OptimizerConfig(inlineMaxNodes = 512))
    assert(plan.collectNodes.forall(!_.isInstanceOf[IRPredict]))
    val inline = plan.collectNodes.collectFirst { case p: IRInlinePredict => p }.get
    assert(inline.caseSql.contains("CASE WHEN"))
    assert(plan.collectNodes.forall(_.category != OpCategory.MLD))
  }

  test("model inlining respects the node budget") {
    val plan = CrossOptimizer.optimize(fig1Ir, catalog, OptimizerConfig(inlineMaxNodes = 2))
    assert(plan.collectNodes.exists(_.isInstanceOf[IRPredict]))
  }

  test("linear model inlining emits sigmoid arithmetic") {
    val ir = IRPredict("p", TestModels.flightLrPipeline, IRScan("flights", catalog.table("flights").columns))
    val plan = CrossOptimizer.ModelInlining(ir, OptimizerConfig(inlineLinear = true))
    val inline = plan.asInstanceOf[IRInlinePredict]
    assert(inline.caseSql.contains("EXP"))
  }

  test("NN translation replaces Predict with an LA operator") {
    val plan = CrossOptimizer.optimize(fig1Ir, catalog,
      OptimizerConfig(inlineMaxNodes = 0, nnTranslate = true))
    val nn = plan.collectNodes.collectFirst { case p: IRNNPredict => p }
    assert(nn.isDefined)
    assert(nn.get.category == OpCategory.LA)
  }

  // ---- end-to-end semantics ------------------------------------------------

  private def resultsOf(config: OptimizerConfig, sql: String = fig1Sql) = {
    val ir = StaticAnalyzer.analyzeSql(sql, catalog, store).ir
    run(CrossOptimizer.optimize(ir, catalog, config))
  }

  test("optimized plans return identical results to the unoptimized plan") {
    val baseline = resultsOf(OptimizerConfig.off)
    assert(baseline.count() > 0, "query must select some rows to be meaningful")
    for (config <- Seq(
        OptimizerConfig(inlineMaxNodes = 0, predicatePruning = false),
        OptimizerConfig(inlineMaxNodes = 0),
        OptimizerConfig(inlineMaxNodes = 512),
        OptimizerConfig(inlineMaxNodes = 0, nnTranslate = true),
        OptimizerConfig(filterPushdown = false, inlineMaxNodes = 512),
      )) {
      TestTables.assertSameRows(baseline, resultsOf(config), eps = 1e-4)
    }
  }

  test("pregnant=0 variant (join eliminated) returns identical results") {
    val sql = fig1Sql.replace("pregnant = 1", "pregnant = 0").replace("> 7", "> 3")
    val baseline = resultsOf(OptimizerConfig.off, sql)
    assert(baseline.count() > 0)
    TestTables.assertSameRows(baseline, resultsOf(OptimizerConfig(), sql), eps = 1e-4)
  }

  test("fully-inlined plan validates against the DuckDB oracle") {
    val ir = StaticAnalyzer.analyzeSql(fig1Sql, catalog, store).ir
    val optimized = CrossOptimizer.optimize(ir, catalog, OptimizerConfig(inlineMaxNodes = 512))
    val sqlOpt = RuntimeCodeGenerator.toSql(optimized)
    assert(sqlOpt.isDefined, "inlined plan must render as portable SQL")
    val tables = TestTables.tables(spark)
    val df = run(optimized)
    repro.Oracle.assertEquivalent(
      df, sqlOpt.get,
      "patient_info" -> tables("patient_info"),
      "blood_tests" -> tables("blood_tests"),
      "prenatal_tests" -> tables("prenatal_tests"),
    )
  }

  test("flight query: categorical predicate prunes the one-hot block and enables projection") {
    val sql = "SELECT flight_id, PREDICT(flight_lr) AS p FROM flights WHERE dest = 'AP00'"
    val ir = StaticAnalyzer.analyzeSql(sql, catalog, store).ir
    var plan = CrossOptimizer.FilterPushdown(ir)
    plan = CrossOptimizer.PredicateModelPruning(plan)
    plan = CrossOptimizer.ModelProjectionPushdown(plan)
    val predict = plan.collectNodes.collectFirst { case p: IRPredict => p }.get
    assert(!predict.pipeline.inputCols.contains("dest"))
    assert(predict.pipeline.pipeline.numFeatures < TestModels.flightLrPipeline.pipeline.numFeatures)
    // semantics preserved
    val baseline = run(StaticAnalyzer.analyzeSql(sql, catalog, store).ir)
    TestTables.assertSameRows(baseline, run(CrossOptimizer.optimize(ir, catalog, OptimizerConfig())), eps = 1e-6)
  }
}

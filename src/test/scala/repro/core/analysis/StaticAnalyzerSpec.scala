package repro.core.analysis

import org.scalatest.funsuite.AnyFunSuite
import repro.TestModels
import repro.core.ir._

class StaticAnalyzerSpec extends AnyFunSuite {

  private val catalog = new SchemaCatalog()
    .register(TableDef("patient_info",
      Seq("patient_id", "age", "gender", "pregnant", "num_prev_admissions"), Some("patient_id")))
    .register(TableDef("blood_tests",
      Seq("patient_id", "hematocrit", "neutrophils", "glucose", "bmi", "pulse"), Some("patient_id")))
    .register(TableDef("prenatal_tests",
      Seq("patient_id", "bp", "fetal_hr", "gestation_weeks"), Some("patient_id")))

  private val store: String => repro.ml.ModelPipeline =
    Map("hospital_dt" -> TestModels.handTreePipeline)

  test("running example: canonical IR shape (Fig. 1)") {
    val res = StaticAnalyzer.analyzeSql(
      """SELECT patient_id, PREDICT(hospital_dt) AS los
        |FROM patient_info
        |JOIN blood_tests ON patient_info.patient_id = blood_tests.patient_id
        |JOIN prenatal_tests ON patient_info.patient_id = prenatal_tests.patient_id
        |WHERE pregnant = 1 AND PREDICT(hospital_dt) > 7""".stripMargin,
      catalog, store)

    val project = res.ir.asInstanceOf[IRProject]
    assert(project.outputCols == Seq("patient_id", "los"))
    val scoreFilter = project.child.asInstanceOf[IRFilter]
    assert(scoreFilter.pred.toSql == "(los > 7)")
    val predict = scoreFilter.child.asInstanceOf[IRPredict]
    assert(predict.pipeline.id == TestModels.handTreePipeline.id)
    val relFilter = predict.child.asInstanceOf[IRFilter]
    assert(relFilter.pred.toSql == "(pregnant = 1)")
    val join2 = relFilter.child.asInstanceOf[IRJoin]
    assert(join2.right.asInstanceOf[IRScan].table == "prenatal_tests")
    assert(join2.left.asInstanceOf[IRJoin].right.asInstanceOf[IRScan].table == "blood_tests")
  }

  test("score column naming follows the select alias") {
    val res = StaticAnalyzer.analyzeSql(
      "SELECT PREDICT(hospital_dt) AS mylos FROM patient_info " +
        "JOIN blood_tests ON patient_id = patient_id JOIN prenatal_tests ON patient_id = patient_id",
      catalog, store)
    assert(res.ir.outputCols == Seq("mylos"))
  }

  test("predict only in WHERE still scores, with default column name") {
    val res = StaticAnalyzer.analyzeSql(
      "SELECT patient_id FROM patient_info " +
        "JOIN blood_tests ON patient_id = patient_id JOIN prenatal_tests ON patient_id = patient_id " +
        "WHERE PREDICT(hospital_dt) > 7",
      catalog, store)
    assert(res.ir.outputCols == Seq("patient_id"))
    assert(res.ir.collectNodes.exists {
      case IRFilter(p, _) => p.toSql == s"(${StaticAnalyzer.ScoreCol} > 7)"
      case _ => false
    })
  }

  test("SELECT * keeps all columns plus score") {
    val res = StaticAnalyzer.analyzeSql(
      "SELECT * FROM patient_info WHERE age > 35", catalog, store)
    assert(res.ir.outputCols == catalog.table("patient_info").columns)
  }

  test("missing model inputs are rejected") {
    val err = intercept[IllegalArgumentException] {
      StaticAnalyzer.analyzeSql("SELECT PREDICT(hospital_dt) AS p FROM patient_info", catalog, store)
    }
    assert(err.getMessage.contains("missing columns"))
  }

  test("multiple distinct models are rejected") {
    val store2: String => repro.ml.ModelPipeline = Map(
      "m1" -> TestModels.handTreePipeline, "m2" -> TestModels.handTreePipeline)
    assertThrows[IllegalArgumentException] {
      StaticAnalyzer.analyzeSql(
        "SELECT PREDICT(m1) AS a FROM patient_info WHERE PREDICT(m2) > 1", catalog, store2)
    }
  }

  test("analysis is fast (<10ms, §3.2)") {
    for (_ <- 1 to 3)
      StaticAnalyzer.analyzeSql("SELECT patient_id FROM patient_info WHERE age > 35", catalog, store)
    val res = StaticAnalyzer.analyzeSql(
      "SELECT patient_id FROM patient_info WHERE age > 35 AND pregnant = 1", catalog, store)
    assert(res.elapsedMicros < 10000, s"took ${res.elapsedMicros} us")
  }

  test("category tags: RA vs MLD operators") {
    val res = StaticAnalyzer.analyzeSql(
      """SELECT patient_id, PREDICT(hospital_dt) AS los FROM patient_info
        |JOIN blood_tests ON patient_id = patient_id
        |JOIN prenatal_tests ON patient_id = patient_id""".stripMargin, catalog, store)
    val cats = res.ir.collectNodes.map(_.category).toSet
    assert(cats.contains(OpCategory.RA) && cats.contains(OpCategory.MLD))
  }
}

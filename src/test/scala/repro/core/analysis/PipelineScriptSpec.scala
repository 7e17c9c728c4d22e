package repro.core.analysis

import org.scalatest.funsuite.AnyFunSuite
import repro.TestModels
import repro.core.ir._

class PipelineScriptSpec extends AnyFunSuite {

  private val catalog = new SchemaCatalog()
    .register(TableDef("patients", Seq("patient_id", "age", "pregnant", "gender"), Some("patient_id")))
    .register(TableDef("tests", Seq("patient_id", "bp"), Some("patient_id")))

  private val store: String => repro.ml.ModelPipeline = {
    case "hospital_hand_dt" => TestModels.handTreePipeline
    case other              => throw new IllegalArgumentException(s"no model $other")
  }

  private def analyze(script: String) = PipelineScript.analyze(script, catalog, store)

  test("straight-line script: read, filter, project") {
    val res = analyze(
      """df = read("patients")
        |df = df[df.age > 35]
        |df = df[["patient_id", "age"]]
        |return df""".stripMargin)
    assert(!res.fallbackToUdf)
    assert(res.plans.size == 1)
    val ir = res.plans.head.ir
    assert(ir.isInstanceOf[IRProject])
    assert(ir.outputCols == Seq("patient_id", "age"))
    val filter = ir.collectNodes.collectFirst { case f: IRFilter => f }.get
    assert(filter.pred.toSql == "(age > 35)")
  }

  test("join and model invocation build Predict over Join") {
    val hospitalCatalog = new SchemaCatalog()
      .register(TableDef("patient_info",
        Seq("patient_id", "age", "gender", "pregnant", "num_prev_admissions"), Some("patient_id")))
      .register(TableDef("labs",
        Seq("patient_id", "hematocrit", "neutrophils", "glucose", "bmi", "pulse",
          "bp", "fetal_hr", "gestation_weeks"), Some("patient_id")))
    val res = PipelineScript.analyze(
      """a = read("patient_info")
        |b = read("labs")
        |j = join(a, b, "patient_id")
        |m = load_model("hospital_hand_dt")
        |out = m.predict(j)""".stripMargin, hospitalCatalog, store)
    val p = res.plans.head.ir.asInstanceOf[IRPredict]
    assert(p.outputCol == "prediction")
    assert(p.pipeline.id == "hospital_hand_dt")
    assert(p.child.isInstanceOf[IRJoin])
    assert(p.outputCols.last == "prediction")
  }

  test("predict type-checks model inputs against frame columns") {
    val err = intercept[PipelineScript.AnalysisError](analyze(
      """a = read("patients")
        |m = load_model("hospital_hand_dt")
        |out = m.predict(a)""".stripMargin))
    assert(err.getMessage.contains("lacks model inputs"))
  }

  test("string filters parse") {
    val res = analyze(
      """df = read("patients")
        |df = df[df.gender == "F"]""".stripMargin)
    val f = res.plans.head.ir.asInstanceOf[IRFilter]
    assert(f.pred == Cmp("=", ColRef("gender"), StrLit("F")))
  }

  test("undefined variable is a scope error") {
    val err = intercept[PipelineScript.AnalysisError](analyze("df = nope[nope.age > 3]"))
    assert(err.getMessage.contains("undefined variable"))
  }

  test("filtering a model is a type error") {
    val err = intercept[PipelineScript.AnalysisError](analyze(
      """m = load_model("hospital_hand_dt")
        |df = m[m.age > 3]""".stripMargin))
    assert(err.getMessage.contains("is a model"))
  }

  test("unknown table is an error") {
    assertThrows[PipelineScript.AnalysisError](analyze("""df = read("nope")"""))
  }

  test("unknown column in filter is an error") {
    assertThrows[PipelineScript.AnalysisError](analyze(
      """df = read("patients")
        |df = df[df.nope > 3]""".stripMargin))
  }

  test("unparseable statement reports the line") {
    val err = intercept[PipelineScript.AnalysisError](analyze(
      """df = read("patients")
        |df = df.groupby("age")""".stripMargin))
    assert(err.getMessage.startsWith("line 2"))
  }

  test("unknown call becomes a UDF operator") {
    val res = analyze(
      """df = read("patients")
        |df = normalize(df)""".stripMargin)
    val udf = res.plans.head.ir.asInstanceOf[IRUdf]
    assert(udf.name == "normalize")
    assert(udf.category == OpCategory.UDF)
    // opaque UDFs analyze fine but are not executable
    assertThrows[UnsupportedOperationException](udf.fn(IndexedSeq(1)))
  }

  test("registered UDFs are executable") {
    val udfs = new PipelineScript.UdfRegistry().register("double_age", r => r(1).asInstanceOf[Int] * 2)
    val res = PipelineScript.analyze(
      """df = read("patients")
        |df = double_age(df)""".stripMargin, catalog, store, udfs)
    val udf = res.plans.head.ir.asInstanceOf[IRUdf]
    assert(udf.fn(IndexedSeq(1L, 21, 0, "F")) == 42)
  }

  test("conditional produces one plan per execution path") {
    val res = analyze(
      """df = read("patients")
        |if mode > 0:
        |    df = df[df.age > 35]
        |else:
        |    df = df[df.age <= 35]
        |return df""".stripMargin)
    assert(res.plans.size == 2)
    assert(res.plans.map(_.pathCondition) == Seq(Some("mode > 0"), Some("not(mode > 0)")))
    val conds = res.plans.map(_.ir.asInstanceOf[IRFilter].pred.toSql)
    assert(conds == Seq("(age > 35)", "(age <= 35)"))
  }

  test("if without else still has two execution paths (filter applied or not)") {
    val res = analyze(
      """df = read("patients")
        |if mode > 0:
        |    df = df[df.age > 35]
        |return df""".stripMargin)
    assert(res.plans.size == 2)
    assert(res.plans.head.pathCondition.contains("mode > 0"))
    assert(res.plans(0).ir.isInstanceOf[IRFilter])
    assert(res.plans(1).ir.isInstanceOf[IRScan])
  }

  test("loops trigger whole-script UDF fallback (§3.2)") {
    val res = analyze(
      """df = read("patients")
        |for row in df:
        |    df = df[df.age > 1]""".stripMargin)
    assert(res.fallbackToUdf)
    assert(res.plans.isEmpty)
  }

  test("while loops also fall back") {
    assert(analyze("while x > 0:").fallbackToUdf)
  }

  test("comments and blank lines are ignored") {
    val res = analyze(
      """# load the data
        |df = read("patients")  # inline comment
        |
        |return df""".stripMargin)
    assert(res.plans.head.ir == IRScan("patients", catalog.table("patients").columns))
  }

  test("static analysis completes in under 10 ms (paper §3.2)") {
    // warm up classes, then measure
    for (_ <- 1 to 3) analyze("""df = read("patients")
                                |df = df[df.age > 35]
                                |return df""".stripMargin)
    val res = analyze(
      """df = read("patients")
        |df = df[df.age > 35]
        |df = df[["patient_id", "age", "pregnant"]]
        |return df""".stripMargin)
    assert(res.elapsedMicros < 10000, s"analysis took ${res.elapsedMicros} us")
  }

  test("script with no frame fails") {
    assertThrows[PipelineScript.AnalysisError](analyze("""m = load_model("hospital_hand_dt")"""))
  }
}

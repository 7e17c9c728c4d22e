package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.ir.{ForeignKey, SchemaCatalog, TableDef}
import repro.data.{FlightData, HospitalData}

/** Shared Spark-side tables + IR catalog for optimizer/codegen tests. */
object TestTables {

  val HospitalN = 1500L
  val FlightN = 2000L

  /** IR catalog with the hospital star schema (PKs + enforced FKs). */
  lazy val hospitalCatalog: SchemaCatalog = new SchemaCatalog()
    .register(TableDef("patient_info",
      Seq("patient_id", "age", "gender", "pregnant", "num_prev_admissions"), Some("patient_id")))
    .register(TableDef("blood_tests",
      Seq("patient_id", "hematocrit", "neutrophils", "glucose", "bmi", "pulse"), Some("patient_id")))
    .register(TableDef("prenatal_tests",
      Seq("patient_id", "bp", "fetal_hr", "gestation_weeks"), Some("patient_id")))
    .register(TableDef("patients_all",
      Seq("patient_id", "age", "gender", "pregnant", "num_prev_admissions", "hematocrit",
        "neutrophils", "glucose", "bmi", "pulse", "bp", "fetal_hr", "gestation_weeks", "lengthofstay"),
      Some("patient_id")))
    .register(TableDef("flights",
      Seq("flight_id", "month", "day_of_week", "dep_hour", "distance", "airline", "origin", "dest", "delayed"),
      Some("flight_id")))
    .registerFk(ForeignKey("patient_info", "patient_id", "blood_tests", "patient_id"))
    .registerFk(ForeignKey("patient_info", "patient_id", "prenatal_tests", "patient_id"))

  @volatile private var registered = false

  /** DataFrames for every table; also registered as temp views on first use. */
  def tables(spark: SparkSession): Map[String, DataFrame] = {
    val m = Map(
      "patient_info" -> HospitalData.patientInfo(spark, HospitalN),
      "blood_tests" -> HospitalData.bloodTests(spark, HospitalN),
      "prenatal_tests" -> HospitalData.prenatalTests(spark, HospitalN),
      "patients_all" -> HospitalData.joinedDf(spark, HospitalN),
      "flights" -> FlightData.flightsDf(spark, FlightN),
    )
    if (!registered) synchronized {
      if (!registered) {
        m.foreach { case (name, df) => df.createOrReplaceTempView(name) }
        registered = true
      }
    }
    m
  }

  /** Sorted-row equality of two frames with per-value numeric tolerance.
    * Rows are ordered by their non-floating fields (tests select a unique
    * key column, so ordering is stable), then compared pairwise.
    */
  def assertSameRows(a: DataFrame, b: DataFrame, eps: Double = 1e-9): Unit = {
    require(a.columns.toSeq == b.columns.toSeq,
      s"column mismatch: ${a.columns.toSeq} vs ${b.columns.toSeq}")
    def sortKey(r: Seq[Any]): String = r.collect {
      case s: String => s
      case i: Int    => f"$i%020d"
      case l: Long   => f"$l%020d"
    }.mkString("|")
    val ra = a.collect().toSeq.map(_.toSeq).sortBy(sortKey)
    val rb = b.collect().toSeq.map(_.toSeq).sortBy(sortKey)
    require(ra.size == rb.size, s"row count differs: ${ra.size} vs ${rb.size}")
    ra.zip(rb).zipWithIndex.foreach { case ((x, y), i) =>
      x.zip(y).foreach {
        case (dx: Double, dy: Double) =>
          require(math.abs(dx - dy) <= eps, s"row $i: $dx vs $dy (eps=$eps)\n  a=$x\n  b=$y")
        case (vx, vy) =>
          require(vx == vy, s"row $i: $vx vs $vy\n  a=$x\n  b=$y")
      }
    }
  }
}

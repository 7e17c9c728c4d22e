package repro.bench

import java.nio.file.Files
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions.{expr, sum}
import repro.bench.BenchUtil._
import repro.core.opt.CrossOptimizer.ModelInlining
import repro.data.HospitalData
import repro.ml.{FeatureConstraint, ModelPruner, NumRange}
import repro.runtime.{ClassicRuntime, CsvData, OutOfProcess}
import repro.sparkext.{ModelRegistry, Raven, RavenRuntime}

/** Table 4 — Model inlining (Fig. 2(c)).
  *
  * Paper numbers (hospital decision tree, 300K tuples): translating the
  * tree to SQL and inlining it yields ~17× over scikit-learn reading the
  * data from the DB — most of the gain comes from avoiding data movement
  * and staying inside the engine; adding predicate-based pruning brings
  * the total to ~24.5×.
  *
  * Reproduction mapping: "scikit-learn reading from the DB" = the model
  * runs in a separate framework process that the engine exports rows to
  * (a real forked JVM fed over pipes, like the paper's external Python);
  * an in-driver collect+score ablation isolates the process-boundary cost;
  * "inlined UDF" = the tree as a CASE expression compiled by Spark
  * whole-stage codegen, running scan+score distributed in-engine.
  */
object T4ModelInlining {

  def run(spark: SparkSession, rows: Int = 300000): BenchTable = {
    val mp = BenchModels.hospitalTreePipeline
    Raven.deploy(mp)
    Raven.installRuntimeOnly(spark)

    val work = Files.createTempDirectory("t4")
    val modelDir = work.resolve("model")
    Files.createDirectories(modelDir)
    ModelRegistry.save(mp, modelDir.resolve("classic.bin"))

    val df = HospitalData.joinedDf(spark, rows, seed = 92).cache()
    df.count() // materialize the "database table"

    val featureExprs = ModelInlining.featureSqlExprs(mp.pipeline)
    val caseSql = BenchModels.hospitalTree.toCaseSql(featureExprs)
    val rawIdx = mp.inputCols.map(df.schema.fieldIndex).toArray

    /** Framework outside the DB: export the table and pipe it through a
      * separate interpreter process scoring per row.
      */
    def sklearnExternal(d: DataFrame): Double = {
      val csv = work.resolve("export.csv")
      val rows = d.collect()
      CsvData.write(rows.iterator.map(r => rawIdx.map(r.get).toIndexedSeq: IndexedSeq[Any]), csv)
      val res = OutOfProcess.run(modelDir, csv, mode = "classic")
      require(res.exitCode == 0 && res.rows == rows.length, s"external run failed: $res")
      res.checksum
    }
    def sklearnDriver(d: DataFrame): Double = ClassicRuntime.scoreCollected(d, mp).sum
    def predictOp(d: DataFrame): Double = collectSum(RavenRuntime.predictBatch(d, mp.id, "score"))
    def inlined(d: DataFrame, sql: String = caseSql): Double = collectSum(d.withColumn("score", expr(sql)))

    // correctness: all paths agree on the checksum
    val sums = Seq(sklearnExternal(df), sklearnDriver(df), predictOp(df), inlined(df))
    require(sums.forall(s => math.abs(s - sums.head) / math.abs(sums.head) < 1e-4), s"paths diverged: $sums")

    val tExternal = timeMillis(warmup = 0, reps = 2)(sklearnExternal(df))
    val tDriver = timeMillis(warmup = 1, reps = 2)(sklearnDriver(df))
    val tPredict = timeMillis(warmup = 1, reps = 2)(predictOp(df))
    val tInline = timeMillis(warmup = 1, reps = 2)(inlined(df))

    // pruning on top: pregnant = 1 cohort
    val cohort = df.filter("pregnant = 1").cache()
    cohort.count()
    val pruned = ModelPruner.pruneTree(BenchModels.hospitalTree,
      ModelPruner.toFeatureConstraints(mp.pipeline, Seq(NumRange("pregnant", FeatureConstraint.equalTo(1.0)))))
    val prunedSql = pruned.toCaseSql(featureExprs)
    val tExternalCohort = timeMillis(warmup = 0, reps = 2)(sklearnExternal(cohort))
    val tInlinePruned = timeMillis(warmup = 1, reps = 2)(inlined(cohort, prunedSql))

    df.unpersist(); cohort.unpersist()

    BenchTable(
      s"T4: model inlining, hospital DT ($rows rows) [paper Fig 2(c): inlining ~17x, +pruning ~24.5x]",
      Seq("path", "rows", "time_ms", "speedup_vs_sklearn"),
      Seq(
        Seq("sklearn out-of-DB (export + external process)", rows.toString, fmt(tExternal), "1.00x"),
        Seq("sklearn in-driver (collect + per-row)", rows.toString, fmt(tDriver), fmtX(tExternal / tDriver)),
        Seq("in-engine PREDICT operator (batched)", rows.toString, fmt(tPredict), fmtX(tExternal / tPredict)),
        Seq("inlined CASE (whole-stage codegen)", rows.toString, fmt(tInline), fmtX(tExternal / tInline)),
        Seq("sklearn out-of-DB on pregnant=1 cohort", "cohort", fmt(tExternalCohort), "1.00x"),
        Seq("inlined + predicate-pruned on cohort", "cohort", fmt(tInlinePruned), fmtX(tExternalCohort / tInlinePruned)),
      ))
  }

  private def collectSum(df: DataFrame): Double =
    df.agg(sum("score")).collect()(0).getDouble(0)

  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("T4ModelInlining")
    run(spark).print()
    spark.stop()
  }
}

package repro.jobs

import repro.bench._

/** spark-submit entrypoints, one per evaluation table.
  *
  * Example:
  *   spark-submit --class repro.jobs.T4ModelInliningJob target/scala-2.13/repro_2.13-*.jar
  *
  * Driver-local tables (T1/T2/T3/T5/T7) also run with plain `java -cp`.
  */
object T1PredicatePruningJob { def main(args: Array[String]): Unit = T1PredicatePruning.run().foreach(_.print()) }

object T2ProjectionPushdownJob { def main(args: Array[String]): Unit = T2ProjectionPushdown.run().print() }

object T3ModelClusteringJob { def main(args: Array[String]): Unit = T3ModelClustering.run().foreach(_.print()) }

object T4ModelInliningJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("T4ModelInlining")
    try T4ModelInlining.run(spark, rows = args.headOption.map(_.toInt).getOrElse(300000)).print()
    finally spark.stop()
  }
}

object T5NNTranslationJob { def main(args: Array[String]): Unit = T5NNTranslation.run().print() }

object T6IntegratedInferenceJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("T6IntegratedInference")
    try T6IntegratedInference.run(spark).foreach(_.print())
    finally spark.stop()
  }
}

object T7BatchingJob { def main(args: Array[String]): Unit = T7Batching.run().print() }

/** Run every table in sequence (the full evaluation). */
object AllTablesJob {
  def main(args: Array[String]): Unit = {
    T1PredicatePruning.run().foreach(_.print())
    T2ProjectionPushdown.run().print()
    T3ModelClustering.run().foreach(_.print())
    T5NNTranslation.run().print()
    T7Batching.run().print()
    val spark = JobSpark.session("AllTables")
    try {
      T4ModelInlining.run(spark).print()
      T6IntegratedInference.run(spark).foreach(_.print())
    } finally spark.stop()
  }
}

package repro.sparkext

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.catalyst.FunctionIdentifier
import org.apache.spark.sql.catalyst.expressions.{Expression, ExpressionInfo}
import repro.ml.ModelPipeline

/** Session-level installation of Raven: deploys the cross-optimizer rules
  * into Catalyst and registers the `raven_predict` SQL function, after
  * which inference queries are plain Spark SQL:
  *
  * {{{
  * Raven.install(spark)
  * Raven.deploy(pipeline)
  * spark.sql("SELECT *, raven_predict('hospital_dt', age, ..., gender) AS score FROM patients")
  * }}}
  */
object Raven {

  /** Default inlining budget (tree nodes) for the Catalyst inlining rule. */
  val DefaultInlineMaxNodes = 512

  @volatile private var installedSessions = Set.empty[SparkSession]

  def install(spark: SparkSession, inlineMaxNodes: Int = DefaultInlineMaxNodes): Unit = synchronized {
    registerFunction(spark)
    if (!installedSessions.contains(spark)) {
      spark.experimental.extraOptimizations ++= rules(inlineMaxNodes)
      installedSessions += spark
    }
  }

  /** Install only the runtime (`raven_predict` function), no optimizer
    * rules — the unoptimized baseline configuration.
    */
  def installRuntimeOnly(spark: SparkSession): Unit = registerFunction(spark)

  def rules(inlineMaxNodes: Int): Seq[org.apache.spark.sql.catalyst.rules.Rule[
      org.apache.spark.sql.catalyst.plans.logical.LogicalPlan]] = Seq(
    RavenRules.PredicateModelPruning,
    RavenRules.ModelProjectionPushdown,
    RavenRules.ModelInlining(inlineMaxNodes),
    org.apache.spark.sql.catalyst.optimizer.ColumnPruning,
    org.apache.spark.sql.catalyst.optimizer.CollapseProject,
    RavenRules.JoinElimination,
  )

  private def registerFunction(spark: SparkSession): Unit = {
    val info = new ExpressionInfo(classOf[PredictExpression].getName, "raven_predict")
    spark.sessionState.functionRegistry.registerFunction(
      FunctionIdentifier("raven_predict"),
      info,
      (args: Seq[Expression]) => PredictExpression.fromArgs(args),
    )
  }

  def deploy(mp: ModelPipeline): Unit = ModelRegistry.deploy(mp)

  /** The SQL fragment invoking a deployed model over its input columns. */
  def predictSql(modelId: String): String = {
    val mp = ModelRegistry.get(modelId)
    s"raven_predict('$modelId', ${mp.inputCols.mkString(", ")})"
  }
}

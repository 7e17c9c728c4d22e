package repro.sparkext

import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.{Expression, Literal}
import org.apache.spark.sql.catalyst.expressions.codegen.CodegenFallback
import org.apache.spark.sql.types.{DataType, DoubleType, StringType}
import org.apache.spark.unsafe.types.UTF8String

/** The `PREDICT` scalar expression: invokes a deployed model pipeline on
  * each input row, inside the query plan (the paper's in-process PREDICT
  * operator, §5).
  *
  * This is the per-tuple evaluation path; [[RavenRuntime.predictBatch]] is
  * the vectorized path (the paper reports ~an order of magnitude between
  * them, §5 observation v). `CodegenFallback` keeps the surrounding plan
  * codegen-able while the model call stays interpreted.
  */
final case class PredictExpression(modelId: String, children: Seq[Expression])
    extends Expression with CodegenFallback {

  @transient private lazy val pipeline = ModelRegistry.get(modelId)

  override def dataType: DataType = DoubleType
  override def nullable: Boolean = false
  override def prettyName: String = "raven_predict"

  override def eval(input: InternalRow): Any = {
    val n = children.size
    val vals = new Array[Any](n)
    var i = 0
    while (i < n) {
      vals(i) = children(i).eval(input) match {
        case s: UTF8String => s.toString
        case other         => other
      }
      i += 1
    }
    pipeline.predictRaw(scala.collection.immutable.ArraySeq.unsafeWrapArray(vals))
  }

  override protected def withNewChildrenInternal(newChildren: IndexedSeq[Expression]): Expression =
    copy(children = newChildren)
}

object PredictExpression {

  /** Builder for SQL registration: `raven_predict('model_id', f1, f2, ...)`.
    * Argument order must match the deployed pipeline's `inputCols`.
    */
  def fromArgs(args: Seq[Expression]): PredictExpression = {
    require(args.nonEmpty, "raven_predict needs a model id argument")
    val id = args.head match {
      case Literal(s: UTF8String, StringType) => s.toString
      case other => throw new IllegalArgumentException(s"first argument must be a model id string, got $other")
    }
    val mp = ModelRegistry.get(id)
    require(args.size - 1 == mp.inputCols.size,
      s"model '$id' expects ${mp.inputCols.size} feature columns (${mp.inputCols.mkString(",")}), got ${args.size - 1}")
    PredictExpression(id, args.tail)
  }
}

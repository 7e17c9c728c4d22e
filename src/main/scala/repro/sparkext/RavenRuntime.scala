package repro.sparkext

import org.apache.spark.sql.{DataFrame, Encoders, Row}
import org.apache.spark.sql.types.{DoubleType, StructType}
import repro.ml.NNPipelineModel

/** Batched, partition-parallel model execution over DataFrames — the
  * in-process integrated runtime: Spark parallelizes scan + predict across
  * cores exactly like SQL Server parallelizes scan + PREDICT (§5
  * observation iii), and inference runs per batch, not per tuple
  * (observation v).
  */
object RavenRuntime {

  val DefaultBatchSize = 4096

  /** Append `outputCol` with pipeline predictions (classical model path). */
  def predictBatch(
      df: DataFrame,
      modelId: String,
      outputCol: String,
      batchSize: Int = DefaultBatchSize,
  ): DataFrame = {
    val mp = ModelRegistry.get(modelId)
    val inputCols = mp.inputCols
    withPredictions(df, inputCols, outputCol, batchSize) { batch =>
      // Executors resolve the pipeline from the shared registry (local mode:
      // one JVM), keeping the deployed model instance — and any lazily built
      // state — cached across batches and queries.
      ModelRegistry.get(modelId).predictRawBatch(batch)
    }
  }

  /** Append `outputCol` with NN-translated pipeline predictions executed by
    * the OnnxLite runtime (LA path). The `NNPipelineModel` instance caches
    * its inference session, so passing a registry-held instance gives
    * session reuse across queries.
    */
  def predictNNBatch(
      df: DataFrame,
      nn: NNPipelineModel,
      outputCol: String,
      batchSize: Int = DefaultBatchSize,
  ): DataFrame =
    withPredictions(df, nn.inputCols, outputCol, batchSize)(batch => nn.predictRawBatch(batch.toIndexedSeq))

  /** Append `outputCol` computed by an opaque row UDF (the fallback path). */
  def applyUdf(
      df: DataFrame,
      inputCols: Seq[String],
      outputCol: String,
      fn: IndexedSeq[Any] => Any,
  ): DataFrame =
    withPredictions(df, inputCols, outputCol, 1024)(batch => batch.map(r => anyToDouble(fn(r))).toArray)

  private def anyToDouble(v: Any): Double = v match {
    case d: Double => d
    case f: Float  => f.toDouble
    case i: Int    => i.toDouble
    case l: Long   => l.toDouble
    case other     => throw new IllegalArgumentException(s"UDF must return a number, got $other")
  }

  private def withPredictions(
      df: DataFrame,
      inputCols: Seq[String],
      outputCol: String,
      batchSize: Int,
  )(score: Seq[IndexedSeq[Any]] => Array[Double]): DataFrame = {
    val schema: StructType = df.schema.add(outputCol, DoubleType, nullable = false)
    val fieldIdx = inputCols.map(df.schema.fieldIndex).toArray
    df.mapPartitions { it: Iterator[Row] =>
      it.grouped(batchSize).flatMap { rows =>
        val feats = rows.map(r => fieldIdx.map(r.get).toIndexedSeq)
        val preds = score(feats)
        rows.iterator.zipWithIndex.map { case (r, i) =>
          Row.fromSeq(r.toSeq :+ preds(i))
        }
      }
    }(Encoders.row(schema))
  }
}

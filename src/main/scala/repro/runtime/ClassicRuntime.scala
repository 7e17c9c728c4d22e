package repro.runtime

import org.apache.spark.sql.DataFrame
import repro.ml.ModelPipeline

/** The "classical framework" execution path (scikit-learn analogue): pull
  * the data out of the engine to the driver and score row-by-row with the
  * interpreted model objects. This is the baseline the paper's model
  * inlining and NN translation are measured against (Fig. 2(c)/(d)) —
  * single-threaded, per-row dispatch, and paying the engine→framework
  * data transfer.
  */
object ClassicRuntime {

  /** Collect the frame out of Spark ("reading data from the DB") and score
    * on the driver.
    */
  def scoreCollected(df: DataFrame, mp: ModelPipeline): Array[Double] = {
    val idx = mp.inputCols.map(df.schema.fieldIndex).toArray
    val rows = df.collect()
    scoreRowsIndexed(rows, idx, mp)
  }

  def scoreRowsIndexed(rows: Array[org.apache.spark.sql.Row], idx: Array[Int], mp: ModelPipeline): Array[Double] = {
    val out = new Array[Double](rows.length)
    var i = 0
    while (i < rows.length) {
      val r = rows(i)
      out(i) = mp.predictRaw(idx.map(r.get).toIndexedSeq)
      i += 1
    }
    out
  }

  /** Score pre-extracted raw rows (when data is already outside the DB). */
  def scoreRaw(rows: Array[IndexedSeq[Any]], mp: ModelPipeline): Array[Double] = {
    val out = new Array[Double](rows.length)
    var i = 0
    while (i < rows.length) { out(i) = mp.predictRaw(rows(i)); i += 1 }
    out
  }
}

package repro.ml

import repro.linalg.Tensor
import repro.onnx.{GraphDef, Session}

/** A numeric-vector model backed by an OnnxLite graph (post NN
  * translation). The session is built lazily and cached per instance.
  */
final case class NNModel(graph: GraphDef, numFeatures: Int) extends Model {

  @transient private lazy val session = new Session(graph)

  def predict(x: Array[Double]): Double = predictBatch(Array(x))(0)

  override def predictBatch(xs: Array[Array[Double]]): Array[Double] =
    if (xs.isEmpty) Array.empty else session.predictBatch(xs)

  /** Unknown at the graph level without shape analysis; report all. */
  def usedFeatures: Set[Int] = (0 until numFeatures).toSet
}

/** A whole NN-translated pipeline: raw rows in, predictions out. Feeds the
  * graph one column at a time (numerics as-is, categoricals as vocabulary
  * indices).
  */
final case class NNPipelineModel(graph: GraphDef, pipeline: FeaturePipeline) extends Serializable {

  @transient private lazy val session = new Session(graph)

  def inputCols: Seq[String] = pipeline.inputCols

  def predictRawBatch(rows: IndexedSeq[IndexedSeq[Any]]): Array[Double] = {
    if (rows.isEmpty) return Array.empty
    val feeds = buildFeeds(rows)
    val out = session.run(feeds)
    require(out.cols == 1, s"${graph.name}: expected single output column")
    out.data.map(_.toDouble)
  }

  private def buildFeeds(rows: IndexedSeq[IndexedSeq[Any]]): Map[String, Tensor] = {
    val cols = pipeline.inputCols
    val perRow = rows.map(pipeline.toGraphFeeds)
    cols.zipWithIndex.map { case (c, i) =>
      c -> new Tensor(rows.size, 1, Array.tabulate(rows.size)(r => perRow(r)(i).toFloat))
    }.toMap
  }
}

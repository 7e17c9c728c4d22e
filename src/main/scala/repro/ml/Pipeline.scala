package repro.ml

/** A model pipeline in the paper's sense: data featurization steps plus a
  * trained model, deployed and invoked as a unit.
  *
  * Raw inputs are positional in [[FeaturePipeline.inputCols]] order.
  * An optional scaler (fitted on featurized vectors) sits between
  * featurization and the model, as in typical MLP pipelines.
  */
final case class ModelPipeline(
    id: String,
    pipeline: FeaturePipeline,
    scaler: Option[StandardScaler],
    model: Model,
) extends Serializable {

  def inputCols: Seq[String] = pipeline.inputCols

  def predictRaw(raw: IndexedSeq[Any]): Double = {
    val feats = pipeline.transform(raw)
    model.predict(scaler.map(_.transform(feats)).getOrElse(feats))
  }

  def predictRawBatch(rows: Iterable[IndexedSeq[Any]]): Array[Double] =
    rows.iterator.map(predictRaw).toArray

  /** Apply predicate-based pruning followed by model-projection pushdown.
    * Returns the optimized pipeline and the raw columns it no longer needs.
    */
  def optimizeFor(predicates: Seq[ColPredicate]): (ModelPipeline, Seq[String]) = {
    require(scaler.isEmpty, "pruning through a scaler is not supported; fold the scaler first")
    val constraints = ModelPruner.toFeatureConstraints(pipeline, predicates)
    val pruned = ModelPruner.prune(model, constraints)
    val (newPipe, projected, dropped) = ModelPruner.projectPipeline(pipeline, pruned)
    (copy(pipeline = newPipe, model = projected), dropped)
  }
}

package repro.ml

/** Predicate-based model pruning and model-projection pushdown (§4.1) at
  * the model level. The cross-optimizer (and the Catalyst rules) call into
  * these rewrites; everything here is engine-independent.
  */
object ModelPruner {

  /** Prune tree branches unreachable under the given per-feature
    * constraints. Semantics preserved for every input satisfying the
    * constraints (property-tested).
    */
  def pruneTree(model: DecisionTreeModel, constraints: Map[Int, FeatureConstraint]): DecisionTreeModel = {
    def walk(n: TreeNode): TreeNode = n match {
      case l: Leaf => l
      case Split(f, t, l, r) =>
        constraints.get(f) match {
          case Some(c) if c.alwaysBelow(t)   => walk(l)
          case Some(c) if c.alwaysAtLeast(t) => walk(r)
          case _                             => Split(f, t, walk(l), walk(r))
        }
    }
    model.copy(root = walk(model.root))
  }

  def pruneForest(model: RandomForestModel, constraints: Map[Int, FeatureConstraint]): RandomForestModel =
    model.copy(trees = model.trees.map(pruneTree(_, constraints)))

  /** Fold pinned features (`x_i = v`) into the intercept and zero their
    * weights. The zeroed weights then make the features eligible for
    * model-projection pushdown.
    */
  def pruneLinear(model: LinearModel, constraints: Map[Int, FeatureConstraint]): LinearModel = {
    val w = model.weights.clone()
    var b = model.intercept
    constraints.foreach { case (f, c) =>
      c.equalTo.foreach { v =>
        if (f < w.length && w(f) != 0.0) { b += w(f) * v; w(f) = 0.0 }
      }
    }
    model.copy(weights = w, intercept = b)
  }

  def prune(model: Model, constraints: Map[Int, FeatureConstraint]): Model = model match {
    case m: DecisionTreeModel => pruneTree(m, constraints)
    case m: RandomForestModel => pruneForest(m, constraints)
    case m: LinearModel       => pruneLinear(m, constraints)
    case other                => other // MLP/NN: no structural pruning implemented
  }

  /** Translate raw-column predicates into feature-index constraints through
    * a featurization pipeline.
    *
    * A numeric predicate maps to its passthrough feature. A categorical
    * equality `col = v` pins the whole one-hot block: the matching
    * indicator to 1, every sibling to 0 (and an unseen `v` pins the whole
    * block to 0).
    */
  def toFeatureConstraints(
      pipeline: FeaturePipeline,
      predicates: Seq[ColPredicate],
  ): Map[Int, FeatureConstraint] = {
    val out = scala.collection.mutable.Map[Int, FeatureConstraint]()
    def add(i: Int, c: FeatureConstraint): Unit =
      out(i) = out.get(i).map(_.intersect(c)).getOrElse(c)

    predicates.foreach {
      case NumRange(col, c) if pipeline.numericCols.contains(col) =>
        add(pipeline.numericIndex(col), c)
      case CatEquals(col, value) if pipeline.isCategorical(col) =>
        val (off, enc) = pipeline.encoderBlock(col)
        val hit = enc.indexOf(value)
        (0 until enc.width).foreach { i =>
          add(off + i, FeatureConstraint.equalTo(if (i == hit) 1.0 else 0.0))
        }
      case _ => // predicate on a column the model does not consume: nothing to prune
    }
    out.toMap
  }

  /** Model-projection pushdown at the pipeline level: after pruning, drop
    * raw input columns none of whose features are used by the model.
    *
    * Returns the projected pipeline, the rewritten model over the compact
    * feature space, and the dropped raw columns (which the relational
    * optimizer can then prune from scans and may use to eliminate joins).
    */
  def projectPipeline(pipeline: FeaturePipeline, model: Model): (FeaturePipeline, Model, Seq[String]) = {
    val used = model.usedFeatures
    val keepCols = pipeline.inputCols.filter { col =>
      val indices = featureIndicesOf(pipeline, col)
      indices.exists(used)
    }.toSet
    val dropped = pipeline.inputCols.filterNot(keepCols)
    if (dropped.isEmpty) return (pipeline, model, Nil)

    val newPipeline = pipeline.project(keepCols)
    val keptFeatureIdx: IndexedSeq[Int] =
      newPipeline.featureNames.map(n => pipeline.featureNames.indexOf(n))
    require(keptFeatureIdx.forall(_ >= 0), "projection lost a feature name")

    val newModel = reindex(model, keptFeatureIdx, pipeline.numFeatures)
    (newPipeline, newModel, dropped)
  }

  /** Feature indices fed by one raw column. */
  def featureIndicesOf(pipeline: FeaturePipeline, col: String): Seq[Int] =
    if (pipeline.numericCols.contains(col)) Seq(pipeline.numericIndex(col))
    else {
      val (off, enc) = pipeline.encoderBlock(col)
      off until (off + enc.width)
    }

  /** Rewrite a model to read features from a compacted vector where old
    * index `kept(i)` now lives at `i`. Features outside `kept` must be
    * unused by the model.
    */
  def reindex(model: Model, kept: IndexedSeq[Int], oldNumFeatures: Int): Model = {
    val oldToNew = Array.fill(oldNumFeatures)(-1)
    kept.zipWithIndex.foreach { case (old, nw) => oldToNew(old) = nw }
    require(model.usedFeatures.forall(f => oldToNew(f) >= 0),
      "cannot reindex: model uses a dropped feature")

    def reTree(t: DecisionTreeModel): DecisionTreeModel = {
      def walk(n: TreeNode): TreeNode = n match {
        case l: Leaf           => l
        case Split(f, th, l, r) => Split(oldToNew(f), th, walk(l), walk(r))
      }
      t.copy(root = walk(t.root), numFeatures = kept.size)
    }

    model match {
      case m: DecisionTreeModel => reTree(m)
      case m: RandomForestModel => m.copy(trees = m.trees.map(reTree))
      case m: LinearModel       => m.copy(weights = kept.map(m.weights).toArray)
      case other =>
        throw new IllegalArgumentException(s"reindex unsupported for ${other.getClass.getSimpleName}")
    }
  }
}

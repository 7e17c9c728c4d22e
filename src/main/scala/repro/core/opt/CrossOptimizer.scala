package repro.core.opt

import repro.core.ir._
import repro.ml._

/** Configuration of Raven's heuristic Cross Optimizer (§4.3): every
  * optimization is a transformation rule; the initial optimizer applies
  * them in a fixed order.
  *
  * @param inlineMaxNodes inline tree models with at most this many nodes
  *                       as relational CASE logic (0 disables inlining)
  * @param inlineLinear   inline linear/logistic models as arithmetic SQL
  * @param nnTranslate    translate remaining Predict operators to LA graphs
  */
final case class OptimizerConfig(
    filterPushdown: Boolean = true,
    predicatePruning: Boolean = true,
    projectionPushdown: Boolean = true,
    projectionPruning: Boolean = true,
    joinElimination: Boolean = true,
    inlineMaxNodes: Int = 512,
    inlineLinear: Boolean = false,
    nnTranslate: Boolean = false,
)

object OptimizerConfig {
  /** Everything off — the unoptimized baseline. */
  val off: OptimizerConfig = OptimizerConfig(
    filterPushdown = false, predicatePruning = false, projectionPushdown = false,
    projectionPruning = false, joinElimination = false, inlineMaxNodes = 0)
}

/** The Cross Optimizer: cross-IR optimizations (§4.1) + operator
  * transformations (§4.2) applied as rewrite rules over the unified IR.
  */
object CrossOptimizer {

  def optimize(ir: IRNode, catalog: SchemaCatalog, config: OptimizerConfig = OptimizerConfig()): IRNode = {
    var plan = ir
    if (config.filterPushdown) plan = FilterPushdown(plan)
    if (config.predicatePruning) plan = PredicateModelPruning(plan)
    if (config.projectionPushdown) plan = ModelProjectionPushdown(plan)
    plan = ModelInlining(plan, config)
    if (config.nnTranslate) plan = NNTranslation(plan)
    if (config.projectionPruning) plan = ProjectionPruning(plan, catalog, config.joinElimination)
    plan
  }

  /** Bottom-up node transform. */
  def transformUp(ir: IRNode)(f: PartialFunction[IRNode, IRNode]): IRNode = {
    val withNewChildren = ir match {
      case s: IRScan          => s
      case n: IRFilter        => n.copy(child = transformUp(n.child)(f))
      case n: IRProject       => n.copy(child = transformUp(n.child)(f))
      case n: IRJoin          => n.copy(left = transformUp(n.left)(f), right = transformUp(n.right)(f))
      case n: IRPredict       => n.copy(child = transformUp(n.child)(f))
      case n: IRInlinePredict => n.copy(child = transformUp(n.child)(f))
      case n: IRNNPredict     => n.copy(child = transformUp(n.child)(f))
      case n: IRUdf           => n.copy(child = transformUp(n.child)(f))
    }
    f.applyOrElse(withNewChildren, identity[IRNode])
  }

  // ---- standard relational rules -----------------------------------------

  /** Push filter conjuncts through projections, model invocations (when the
    * predicate does not reference the score), and to the relevant side of
    * joins. Runs to fixpoint.
    */
  object FilterPushdown {
    def apply(ir: IRNode): IRNode = {
      var cur = ir
      var changed = true
      while (changed) {
        val next = step(cur)
        changed = next != cur
        cur = next
      }
      cur
    }

    private def step(ir: IRNode): IRNode = transformUp(ir) {
      case IRFilter(pred, IRFilter(inner, c)) => IRFilter(And(pred, inner), c)

      case f @ IRFilter(pred, p @ IRProject(cols, c)) =>
        val passthrough = cols.collect { case NamedExpr(n, ColRef(src)) => n -> src }.toMap
        val (pushable, stuck) = ScalarExpr.conjuncts(pred)
          .partition(_.references.forall(passthrough.contains))
        if (pushable.isEmpty) f
        else {
          val renamed = pushable.map(rename(_, passthrough))
          val below = IRFilter(ScalarExpr.conjunction(renamed).get, c)
          val proj = p.copy(child = below)
          ScalarExpr.conjunction(stuck).map(IRFilter(_, proj)).getOrElse(proj)
        }

      case f @ IRFilter(pred, pr: IRPredict) =>
        pushThroughAppend(f, pred, pr.outputCol, pr.child, ch => pr.copy(child = ch))
      case f @ IRFilter(pred, pr: IRInlinePredict) =>
        pushThroughAppend(f, pred, pr.outputCol, pr.child, ch => pr.copy(child = ch))
      case f @ IRFilter(pred, pr: IRNNPredict) =>
        pushThroughAppend(f, pred, pr.outputCol, pr.child, ch => pr.copy(child = ch))

      case f @ IRFilter(pred, j @ IRJoin(l, r, _, _)) =>
        val lCols = l.outputCols.toSet
        val rCols = r.outputCols.toSet
        val (toL, rest) = ScalarExpr.conjuncts(pred).partition(_.references.subsetOf(lCols))
        val (toR, stuck) = rest.partition(_.references.subsetOf(rCols))
        if (toL.isEmpty && toR.isEmpty) f
        else {
          val nl = ScalarExpr.conjunction(toL).map(IRFilter(_, l)).getOrElse(l)
          val nr = ScalarExpr.conjunction(toR).map(IRFilter(_, r)).getOrElse(r)
          val nj = j.copy(left = nl, right = nr)
          ScalarExpr.conjunction(stuck).map(IRFilter(_, nj)).getOrElse(nj)
        }
    }

    private def pushThroughAppend(
        orig: IRNode, pred: ScalarExpr, outputCol: String, child: IRNode, rebuild: IRNode => IRNode): IRNode = {
      val (stuck, pushable) = ScalarExpr.conjuncts(pred).partition(_.references.contains(outputCol))
      if (pushable.isEmpty) orig
      else {
        val below = IRFilter(ScalarExpr.conjunction(pushable).get, child)
        val rebuilt = rebuild(below)
        ScalarExpr.conjunction(stuck).map(IRFilter(_, rebuilt)).getOrElse(rebuilt)
      }
    }

    private def rename(e: ScalarExpr, m: Map[String, String]): ScalarExpr = e match {
      case ColRef(n)     => ColRef(m.getOrElse(n, n))
      case Cmp(op, l, r) => Cmp(op, rename(l, m), rename(r, m))
      case And(l, r)     => And(rename(l, m), rename(r, m))
      case Or(l, r)      => Or(rename(l, m), rename(r, m))
      case Not(x)        => Not(rename(x, m))
      case other         => other
    }
  }

  // ---- cross-IR optimizations (§4.1) -------------------------------------

  /** Predicate-based model pruning (data-to-model): predicates anywhere
    * below a Predict constrain its input rows (inner-join plans), so the
    * model can be specialized — tree branches eliminated, pinned one-hot
    * blocks folded into linear intercepts.
    */
  object PredicateModelPruning {
    def apply(ir: IRNode): IRNode = transformUp(ir) {
      case p @ IRPredict(out, mp, child) if mp.scaler.isEmpty =>
        val preds = collectPredicates(child)
        if (preds.isEmpty) p
        else {
          val constraints = ModelPruner.toFeatureConstraints(mp.pipeline, preds)
          if (constraints.isEmpty) p
          else {
            val pruned = ModelPruner.prune(mp.model, constraints)
            IRPredict(out, mp.copy(id = s"${mp.id}#pruned", model = pruned), child)
          }
        }
    }

    /** All `col op literal` conjuncts of filters in the subtree. Sound for
      * the supported plan shapes: every operator here either preserves rows
      * (project/predict/udf append) or intersects them (filter, inner join).
      */
    def collectPredicates(ir: IRNode): Seq[ColPredicate] =
      ir.collectNodes.collect { case IRFilter(pred, _) => ScalarExpr.toColPredicates(pred) }.flatten
  }

  /** Model-projection pushdown (model-to-data): drop raw input columns
    * whose features the (possibly pruned) model no longer uses. The scan
    * pruning and join elimination this unlocks happen in
    * [[ProjectionPruning]].
    */
  object ModelProjectionPushdown {
    def apply(ir: IRNode): IRNode = transformUp(ir) {
      case p @ IRPredict(out, mp, child) if mp.scaler.isEmpty && projectable(mp.model) =>
        val (optimized, dropped) = mp.optimizeFor(Nil)
        if (dropped.isEmpty) p
        else IRPredict(out, optimized.copy(id = s"${mp.id}#proj"), child)
    }

    /** Models we can rewrite over a compacted feature space. */
    private def projectable(m: Model): Boolean = m match {
      case _: DecisionTreeModel | _: RandomForestModel | _: LinearModel => true
      case _                                                           => false
    }
  }

  // ---- operator transformations (§4.2) -----------------------------------

  /** Model inlining: translate small tree (or forest) models — and
    * optionally linear models — into portable SQL scalar expressions so the
    * relational engine executes them natively (the Froid-style UDF-inlining
    * path; in this reproduction the win comes from Spark whole-stage
    * codegen and the elimination of the per-row model-runtime boundary).
    */
  object ModelInlining {
    def apply(ir: IRNode, config: OptimizerConfig): IRNode = transformUp(ir) {
      case p @ IRPredict(out, mp, child) if mp.scaler.isEmpty =>
        val featureExprs = featureSqlExprs(mp.pipeline)
        mp.model match {
          case t: DecisionTreeModel if config.inlineMaxNodes > 0 && t.nodeCount <= config.inlineMaxNodes =>
            IRInlinePredict(out, t.toCaseSql(featureExprs), mp.inputCols, child)
          case f: RandomForestModel if config.inlineMaxNodes > 0 && f.totalNodes <= config.inlineMaxNodes =>
            val sum = f.trees.map(t => s"(${t.toCaseSql(featureExprs)})").mkString(" + ")
            IRInlinePredict(out, s"(($sum) / ${f.trees.size})", mp.inputCols, child)
          case m: LinearModel if config.inlineLinear =>
            val terms = m.weights.zipWithIndex.collect {
              case (w, i) if w != 0.0 => s"($w * ${featureExprs(i)})"
            }
            val z = (terms :+ m.intercept.toString).mkString(" + ")
            val sql = if (m.logistic) s"(1.0 / (1.0 + EXP(-($z))))" else s"($z)"
            IRInlinePredict(out, sql, mp.inputCols, child)
          case _ => p
        }
    }

    /** SQL expression per feature index: numerics read the column directly,
      * one-hot features become indicator CASE expressions.
      */
    def featureSqlExprs(pipeline: FeaturePipeline): IndexedSeq[String] =
      (pipeline.numericCols.map(c => s"CAST($c AS DOUBLE)") ++
        pipeline.encoders.flatMap(e => e.categories.map(v =>
          s"(CASE WHEN ${e.inputCol} = '${v.replace("'", "''")}' THEN 1.0 ELSE 0.0 END)"))).toIndexedSeq
  }

  /** NN translation: compile remaining Predict operators (featurizers
    * included) into OnnxLite LA graphs for execution by the NN runtime.
    */
  object NNTranslation {
    def apply(ir: IRNode): IRNode = transformUp(ir) {
      case IRPredict(out, mp, child) if translatable(mp) =>
        IRNNPredict(out, NNPipelineModel(NNTranslator.translatePipeline(mp), mp.pipeline), child)
    }

    def translatable(mp: ModelPipeline): Boolean = mp.model match {
      case _: DecisionTreeModel | _: RandomForestModel | _: LinearModel | _: MlpModel => true
      case _ => false
    }
  }

  /** Projection pruning + join elimination: narrow scans to the columns the
    * plan actually needs; an inner FK-join whose right side contributes
    * nothing but its (primary-key) join key is dropped entirely — the
    * situation model-projection pushdown creates when a table only supplied
    * now-pruned features (§4.1).
    */
  object ProjectionPruning {
    def apply(ir: IRNode, catalog: SchemaCatalog, joinElim: Boolean): IRNode =
      prune(ir, ir.outputCols.toSet, catalog, joinElim)

    private def prune(ir: IRNode, needed: Set[String], catalog: SchemaCatalog, je: Boolean): IRNode = ir match {
      case IRScan(t, cols) =>
        val kept = cols.filter(needed.contains)
        IRScan(t, if (kept.isEmpty) cols.take(1) else kept) // keep ≥1 col for well-formedness
      case IRFilter(pred, c) =>
        IRFilter(pred, prune(c, needed ++ pred.references, catalog, je))
      case IRProject(cols, c) =>
        val keptCols = cols.filter(ne => needed.contains(ne.name))
        val finalCols = if (keptCols.isEmpty) cols else keptCols
        IRProject(finalCols, prune(c, finalCols.flatMap(_.expr.references).toSet, catalog, je))
      case IRJoin(l, r, lk, rk) =>
        val neededL = needed.intersect(l.outputCols.toSet) + lk
        val neededR = needed.intersect(r.outputCols.toSet) + rk
        val fromRight = needed.intersect(r.outputCols.toSet) - rk
        // rk must not be referenced downstream under a different name than lk
        val keyNameSafe = lk == rk || !needed.contains(rk)
        if (je && fromRight.isEmpty && keyNameSafe && rowPreserving(l, lk, r, rk, catalog))
          prune(l, needed.intersect(l.outputCols.toSet) + lk, catalog, je)
        else
          IRJoin(prune(l, neededL, catalog, je), prune(r, neededR, catalog, je), lk, rk)
      case p @ IRPredict(out, mp, c) =>
        p.copy(child = prune(c, (needed - out) ++ mp.inputCols, catalog, je))
      case p @ IRInlinePredict(out, _, inputCols, c) =>
        p.copy(child = prune(c, (needed - out) ++ inputCols, catalog, je))
      case p @ IRNNPredict(out, nn, c) =>
        p.copy(child = prune(c, (needed - out) ++ nn.inputCols, catalog, je))
      case u @ IRUdf(_, out, inputCols, _, c) =>
        u.copy(child = prune(c, (needed - out) ++ inputCols, catalog, je))
    }

    /** The join is droppable iff the right side is a bare scan of a table
      * whose primary key is `rk` and a declared FK guarantees every left
      * row matches exactly once.
      */
    private def rowPreserving(l: IRNode, lk: String, r: IRNode, rk: String, catalog: SchemaCatalog): Boolean =
      r match {
        case IRScan(t, _) =>
          ownerTable(l, lk).exists(lt => catalog.isRowPreserving(lt, lk, t, rk))
        case _ => false
      }

    /** Table in the left subtree that produces column `lk`. */
    private def ownerTable(ir: IRNode, col: String): Option[String] =
      ir.collectNodes.collectFirst { case IRScan(t, cols) if cols.contains(col) => t }
  }
}

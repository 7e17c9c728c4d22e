package repro.sparkext

import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.catalyst.plans.Inner
import org.apache.spark.sql.catalyst.plans.logical._
import org.apache.spark.sql.catalyst.rules.Rule
import org.apache.spark.sql.types._
import org.apache.spark.unsafe.types.UTF8String
import repro.ml._

/** Raven's cross-optimizations expressed as Catalyst optimizer rules
  * (injected via `spark.experimental.extraOptimizations`, so the same
  * rewrites the IR-level Cross Optimizer performs also fire on arbitrary
  * DataFrame/SQL plans containing [[PredictExpression]]).
  */
object RavenRules {

  /** A value constraint on an attribute, keyed by `ExprId`. */
  sealed trait AttrConstraint
  final case class NumC(c: FeatureConstraint) extends AttrConstraint
  final case class CatC(value: String) extends AttrConstraint

  type Constraints = Map[ExprId, AttrConstraint]

  /** Predicate-based model pruning (§4.1) on Catalyst plans.
    *
    * Constraints are collected bottom-up from Filter conditions and joined
    * flow-sensitively: a predict's input rows are constrained by filters
    * below it; and because rows failing a filter above the predict never
    * reach the query output, sibling conjuncts in the *same* Filter also
    * license pruning (the Fig. 1 `pregnant = 1 AND score > 7` case).
    * Outer joins drop the null-padded side's constraints.
    */
  object PredicateModelPruning extends Rule[LogicalPlan] {

    def apply(plan: LogicalPlan): LogicalPlan = rewrite(plan)._1

    private def rewrite(plan: LogicalPlan): (LogicalPlan, Constraints) = plan match {
      case f @ Filter(cond, child) =>
        val (newChild, cc) = rewrite(child)
        val here = extractConstraints(cond)
        val all = merge(cc, here)
        // conjuncts in this very filter constrain each other's predicts
        val newCond = rewriteExpr(cond, all)
        (f.copy(condition = newCond, child = newChild), all)

      case p @ Project(list, child) =>
        val (newChild, cc) = rewrite(child)
        val newList = list.map(ne => rewriteExpr(ne, cc).asInstanceOf[NamedExpression])
        // propagate constraints through aliases of bare attributes
        val aliased = newList.collect {
          case a @ Alias(ar: AttributeReference, _) if cc.contains(ar.exprId) => a.exprId -> cc(ar.exprId)
        }
        (p.copy(projectList = newList, child = newChild), cc ++ aliased)

      case j @ Join(left, right, joinType, cond, hint) =>
        val (nl, cl) = rewrite(left)
        val (nr, cr) = rewrite(right)
        val childConstraints = joinType match {
          case Inner                                      => merge(cl, cr)
          case org.apache.spark.sql.catalyst.plans.LeftOuter  => cl
          case org.apache.spark.sql.catalyst.plans.RightOuter => cr
          case org.apache.spark.sql.catalyst.plans.LeftSemi   => cl
          case _                                          => Map.empty[ExprId, AttrConstraint]
        }
        val newCond = cond.map(rewriteExpr(_, childConstraints))
        (Join(nl, nr, joinType, newCond, hint), childConstraints)

      case u: Union =>
        // Branch-specific constraints do not hold for the union output.
        val rewritten = u.children.map(c => rewrite(c)._1)
        (u.withNewChildren(rewritten), Map.empty)

      case leaf: LeafNode => (leaf, Map.empty)

      case other =>
        // Generic unary/n-ary node: rewrite children; pass constraints
        // through only for single-child nodes that preserve attribute values.
        val results = other.children.map(rewrite)
        val newPlan = other.withNewChildren(results.map(_._1))
        val cc: Constraints = if (results.size == 1) results.head._2 else Map.empty
        val withExprs = newPlan.mapExpressions(e => rewriteExpr(e, cc))
        (withExprs, cc)
    }

    private def merge(a: Constraints, b: Constraints): Constraints =
      b.foldLeft(a) { case (acc, (id, c)) =>
        acc.get(id) match {
          case Some(NumC(x)) =>
            c match { case NumC(y) => acc + (id -> NumC(x.intersect(y))); case _ => acc }
          case Some(_: CatC) => acc
          case None          => acc + (id -> c)
        }
      }

    /** Rewrite every PredictExpression inside `e` against the constraints. */
    private def rewriteExpr(e: Expression, cc: Constraints): Expression =
      if (cc.isEmpty) e
      else e.transformUp {
        case p: PredictExpression => specialize(p, cc)
      }

    private[sparkext] def specialize(p: PredictExpression, cc: Constraints): Expression = {
      val mp = ModelRegistry.get(p.modelId)
      val cols = mp.inputCols
      val preds = p.children.zipWithIndex.flatMap { case (child, i) =>
        // constraint via the attribute, or via a constant that Spark's own
        // ConstantPropagation already folded into the argument
        val fromAttr = attrOf(child).flatMap(a => cc.get(a.exprId))
        val fromLit = child match {
          case LitNum(v)                              => Some(NumC(FeatureConstraint.equalTo(v)))
          case Literal(s: UTF8String, StringType)     => Some(CatC(s.toString))
          case _                                      => None
        }
        fromAttr.orElse(fromLit).map {
          case NumC(c)  => NumRange(cols(i), c)
          case CatC(v)  => CatEquals(cols(i), v)
        }
      }
      if (preds.isEmpty) p
      else {
        val derivedId = ModelRegistry.deriveFor(p.modelId, preds)
        if (derivedId == p.modelId) p
        else {
          val derived = ModelRegistry.get(derivedId)
          val keep = derived.inputCols.map(c => p.children(cols.indexOf(c)))
          PredictExpression(derivedId, keep)
        }
      }
    }

    private def attrOf(e: Expression): Option[AttributeReference] = e match {
      case a: AttributeReference                         => Some(a)
      case Cast(a: AttributeReference, dt, _, _) if dt.isInstanceOf[NumericType] => Some(a)
      case _                                             => None
    }

    private[sparkext] def extractConstraints(cond: Expression): Constraints = {
      val conjuncts = splitConjuncts(cond)
      conjuncts.flatMap {
        case EqualTo(AttrNum(a), LitNum(v))            => Some(a.exprId -> NumC(FeatureConstraint.equalTo(v)))
        case EqualTo(LitNum(v), AttrNum(a))            => Some(a.exprId -> NumC(FeatureConstraint.equalTo(v)))
        case GreaterThan(AttrNum(a), LitNum(v))        => Some(a.exprId -> NumC(FeatureConstraint.greaterThan(v)))
        case GreaterThan(LitNum(v), AttrNum(a))        => Some(a.exprId -> NumC(FeatureConstraint.lessThan(v)))
        case GreaterThanOrEqual(AttrNum(a), LitNum(v)) => Some(a.exprId -> NumC(FeatureConstraint.atLeast(v)))
        case GreaterThanOrEqual(LitNum(v), AttrNum(a)) => Some(a.exprId -> NumC(FeatureConstraint.atMost(v)))
        case LessThan(AttrNum(a), LitNum(v))           => Some(a.exprId -> NumC(FeatureConstraint.lessThan(v)))
        case LessThan(LitNum(v), AttrNum(a))           => Some(a.exprId -> NumC(FeatureConstraint.greaterThan(v)))
        case LessThanOrEqual(AttrNum(a), LitNum(v))    => Some(a.exprId -> NumC(FeatureConstraint.atMost(v)))
        case LessThanOrEqual(LitNum(v), AttrNum(a))    => Some(a.exprId -> NumC(FeatureConstraint.atLeast(v)))
        case EqualTo(a: AttributeReference, Literal(s: UTF8String, StringType)) => Some(a.exprId -> CatC(s.toString))
        case EqualTo(Literal(s: UTF8String, StringType), a: AttributeReference) => Some(a.exprId -> CatC(s.toString))
        case _ => None
      }.foldLeft(Map.empty: Constraints) { case (acc, (id, c)) => merge(acc, Map(id -> c)) }
    }

    private def splitConjuncts(e: Expression): Seq[Expression] = e match {
      case org.apache.spark.sql.catalyst.expressions.And(l, r) => splitConjuncts(l) ++ splitConjuncts(r)
      case other => Seq(other)
    }

    private object AttrNum {
      def unapply(e: Expression): Option[AttributeReference] = e match {
        case a: AttributeReference if a.dataType.isInstanceOf[NumericType] || a.dataType == BooleanType => Some(a)
        case Cast(a: AttributeReference, dt, _, _)
            if dt.isInstanceOf[NumericType] && a.dataType.isInstanceOf[NumericType] => Some(a)
        case _ => None
      }
    }

    private object LitNum {
      def unapply(e: Expression): Option[Double] = e match {
        case Literal(v, _: NumericType) => v match {
          case i: Int     => Some(i.toDouble)
          case l: Long    => Some(l.toDouble)
          case d: Double  => Some(d)
          case f: Float   => Some(f.toDouble)
          case s: Short   => Some(s.toDouble)
          case b: Byte    => Some(b.toDouble)
          case d: Decimal => Some(d.toDouble)
          case _          => None
        }
        case _ => None
      }
    }
  }

  /** Model-projection pushdown (§4.1): drop predict arguments whose
    * features the model no longer uses; Catalyst column pruning then
    * narrows the scans, and [[JoinElimination]] may drop joins.
    */
  object ModelProjectionPushdown extends Rule[LogicalPlan] {
    def apply(plan: LogicalPlan): LogicalPlan = plan.transformAllExpressions {
      case p: PredictExpression =>
        val derivedId = ModelRegistry.deriveFor(p.modelId, Nil)
        if (derivedId == p.modelId) p
        else {
          val cols = ModelRegistry.get(p.modelId).inputCols
          val derived = ModelRegistry.get(derivedId)
          PredictExpression(derivedId, derived.inputCols.map(c => p.children(cols.indexOf(c))))
        }
    }
  }

  /** Model inlining (§4.2): small decision trees / forests become If/Case
    * scalar expressions — pure relational logic that whole-stage codegen
    * compiles, removing the model-runtime boundary entirely.
    */
  final case class ModelInlining(maxNodes: Int) extends Rule[LogicalPlan] {
    def apply(plan: LogicalPlan): LogicalPlan = plan.transformAllExpressions {
      case p: PredictExpression => maybeInline(p).getOrElse(p)
    }

    private def maybeInline(p: PredictExpression): Option[Expression] = {
      val mp = ModelRegistry.get(p.modelId)
      if (mp.scaler.nonEmpty) return None
      lazy val feats = featureExprs(mp.pipeline, p.children)
      mp.model match {
        case t: DecisionTreeModel if t.nodeCount <= maxNodes =>
          Some(inlineTree(t.root, feats))
        case f: RandomForestModel if f.totalNodes <= maxNodes =>
          val sum = f.trees.map(t => inlineTree(t.root, feats)).reduce[Expression](Add(_, _))
          Some(Divide(sum, Literal(f.trees.size.toDouble)))
        case _ => None
      }
    }

    private def inlineTree(n: TreeNode, feats: IndexedSeq[Expression]): Expression = n match {
      case Leaf(v)           => Literal(v)
      case repro.ml.Split(f, t, l, r) =>
        If(LessThan(feats(f), Literal(t)), inlineTree(l, feats), inlineTree(r, feats))
    }

    /** Catalyst expression per feature index over the predict's children. */
    private def featureExprs(pipeline: FeaturePipeline, children: Seq[Expression]): IndexedSeq[Expression] = {
      val byCol = pipeline.inputCols.zip(children).toMap
      (pipeline.numericCols.map(c => Cast(byCol(c), DoubleType)) ++
        pipeline.encoders.flatMap(e => e.categories.map(v =>
          If(EqualTo(byCol(e.inputCol), Literal(UTF8String.fromString(v), StringType)),
            Literal(1.0), Literal(0.0))))).toIndexedSeq
    }
  }

  /** Join elimination licensed by declared integrity constraints: an inner
    * equi-join whose right side is an unfiltered base relation joined on
    * its primary key via an enforced FK, contributing no other referenced
    * columns, is row-preserving and dropped. Constraint declaration is by
    * key-column-name pair ([[RavenIntegrity]]) — a simplification of
    * catalog-level FK metadata.
    */
  object JoinElimination extends Rule[LogicalPlan] {
    def apply(plan: LogicalPlan): LogicalPlan = plan.transformUp {
      case p @ Project(projList, Join(l, r, Inner, Some(EqualTo(x: AttributeReference, y: AttributeReference)), _))
          if eligible(projList, l, r, x, y) => p.copy(child = l)
    }

    private def eligible(
        projList: Seq[NamedExpression], l: LogicalPlan, r: LogicalPlan,
        x: AttributeReference, y: AttributeReference): Boolean = {
      val (lk, rk) =
        if (l.outputSet.contains(x) && r.outputSet.contains(y)) (x, y)
        else if (l.outputSet.contains(y) && r.outputSet.contains(x)) (y, x)
        else return false
      val refs = AttributeSet(projList.flatMap(_.references))
      refs.intersect(r.outputSet).isEmpty &&
        RavenIntegrity.isRowPreserving(lk.name, rk.name) &&
        unfilteredRelation(r)
    }

    /** Right side must be a base relation (possibly column-pruned) — any
      * filtering would break row preservation. Typed-dataset plumbing
      * (serialize/map/deserialize) is 1:1 and therefore row-preserving.
      */
    private def unfilteredRelation(plan: LogicalPlan): Boolean = plan match {
      case _: LeafNode             => true
      case Project(list, child)    => list.forall(_.isInstanceOf[AttributeReference]) && unfilteredRelation(child)
      case s: SerializeFromObject  => unfilteredRelation(s.child)
      case m: MapElements          => unfilteredRelation(m.child)
      case d: DeserializeToObject  => unfilteredRelation(d.child)
      case _                       => false
    }
  }

  /** Declared PK/FK integrity by join-key column names. */
  object RavenIntegrity {
    private val pairs = java.util.concurrent.ConcurrentHashMap.newKeySet[(String, String)]()
    def declareRowPreserving(leftKey: String, rightKey: String): Unit = pairs.add((leftKey, rightKey))
    def isRowPreserving(leftKey: String, rightKey: String): Boolean = pairs.contains((leftKey, rightKey))
    def clear(): Unit = pairs.clear()
  }
}

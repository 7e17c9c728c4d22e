package repro.core.analysis

import repro.core.ir._
import repro.ml.ModelPipeline

/** Raven's Static Analyzer (§3.2): turns an inference query — SQL and/or
  * an imperative pipeline script — into a unified-IR plan.
  */
object StaticAnalyzer {

  final case class SqlAnalysis(ir: IRNode, elapsedMicros: Long)

  /** Column name used for the model score when PREDICT appears only in the
    * WHERE clause.
    */
  val ScoreCol = "score"

  /** Analyze an inference SQL query into IR.
    *
    * Plan construction places relational WHERE conjuncts below the model
    * invocation and score predicates above it, then projects the select
    * list — the canonical pre-optimization shape of Fig. 1.
    */
  def analyzeSql(
      sql: String,
      catalog: SchemaCatalog,
      modelStore: String => ModelPipeline,
  ): SqlAnalysis = {
    val t0 = System.nanoTime()
    val q = SqlParser.parse(sql)

    // FROM + JOIN chain
    var plan: IRNode = IRScan(q.fromTable, catalog.table(q.fromTable).columns)
    q.joins.foreach { j =>
      val right = IRScan(j.table, catalog.table(j.table).columns)
      val (lk, rk) =
        if (plan.outputCols.contains(j.leftKey)) (j.leftKey, j.rightKey)
        else (j.rightKey, j.leftKey) // ON b.k = a.k order-insensitivity
      require(plan.outputCols.contains(lk), s"join key '$lk' not found on left side")
      require(right.outputCols.contains(rk), s"join key '$rk' not found in ${j.table}")
      plan = IRJoin(plan, right, lk, rk)
    }

    // Relational predicates below the model, score predicates above.
    val plainPreds = q.where.collect { case SqlParser.PlainPred(e) => e }
    ScalarExpr.conjunction(plainPreds).foreach(p => plan = IRFilter(p, plan))

    val predictsInWhere = q.where.collect { case p: SqlParser.PredictPred => p }
    val predictsInSelect = q.select.collect { case s: SqlParser.SelectPredict => s }
    val modelIds = (predictsInWhere.map(_.modelId) ++ predictsInSelect.map(_.modelId)).distinct
    require(modelIds.size <= 1, s"at most one model per inference query is supported, got $modelIds")

    val scoreColName = predictsInSelect.headOption.flatMap(_.alias).getOrElse(ScoreCol)
    modelIds.headOption.foreach { id =>
      val mp = modelStore(id)
      val missing = mp.inputCols.filterNot(plan.outputCols.contains)
      require(missing.isEmpty, s"model '$id' needs missing columns: ${missing.mkString(",")}")
      plan = IRPredict(scoreColName, mp, plan)
      predictsInWhere.foreach { p =>
        plan = IRFilter(Cmp(p.op, ColRef(scoreColName), NumLit(p.value)), plan)
      }
    }

    // SELECT list
    val hasStar = q.select.contains(SqlParser.SelectStar)
    if (!hasStar) {
      val cols = q.select.map {
        case SqlParser.SelectExpr(e, alias) =>
          NamedExpr(alias.getOrElse(e match {
            case ColRef(n) => n
            case other     => throw new IllegalArgumentException(s"alias required for ${other.toSql}")
          }), e)
        case SqlParser.SelectPredict(_, alias) =>
          NamedExpr(alias.getOrElse(ScoreCol), ColRef(scoreColName))
        case SqlParser.SelectStar => throw new IllegalStateException("unreachable")
      }
      plan = IRProject(cols, plan)
    }
    SqlAnalysis(plan, (System.nanoTime() - t0) / 1000)
  }
}

package repro.core.analysis

import repro.core.ir._

/** Recursive-descent parser for the inference-query SQL dialect.
  *
  * Covers the shape of the paper's inference queries (Fig. 1): a SELECT
  * over inner equi-joins with a conjunctive WHERE clause, invoking a
  * deployed model with `PREDICT(model_id)` in the select list and/or the
  * WHERE clause (the SQL Server 2017 `PREDICT` statement, simplified: the
  * feature columns are taken from the model's deployed pipeline instead of
  * an explicit `USING` clause).
  *
  * Deliberately small — OR, subqueries and aggregates are out of scope for
  * the reproduction and rejected with a parse error.
  */
object SqlParser {

  final case class ParseError(msg: String, pos: Int) extends RuntimeException(s"$msg (near token $pos)")

  // ---- lexer --------------------------------------------------------------

  sealed trait Tok
  final case class TIdent(s: String) extends Tok
  final case class TNum(v: Double) extends Tok
  final case class TStr(s: String) extends Tok
  final case class TSym(s: String) extends Tok // punctuation and operators

  private val TokenRe =
    """\s*(?:([A-Za-z_][A-Za-z_0-9]*)|(\d+\.?\d*(?:[eE][-+]?\d+)?)|'((?:[^']|'')*)'|(<=|>=|<>|=|<|>|\(|\)|,|\.|\*))""".r

  def lex(sql: String): Vector[Tok] = {
    val out = Vector.newBuilder[Tok]
    var pos = 0
    while (pos < sql.length) {
      TokenRe.findPrefixMatchOf(sql.substring(pos)) match {
        case Some(m) =>
          if (m.group(1) != null) out += TIdent(m.group(1))
          else if (m.group(2) != null) out += TNum(m.group(2).toDouble)
          else if (m.group(3) != null) out += TStr(m.group(3).replace("''", "'"))
          else out += TSym(m.group(4))
          pos += m.end
        case None =>
          if (sql.substring(pos).trim.isEmpty) pos = sql.length
          else throw ParseError(s"cannot tokenize at '${sql.substring(pos).take(20)}'", pos)
      }
    }
    out.result()
  }

  // ---- parsed forms -------------------------------------------------------

  /** A select-list item: either a plain scalar expression or a model invocation. */
  sealed trait SelectItem { def alias: Option[String] }
  final case class SelectExpr(expr: ScalarExpr, alias: Option[String]) extends SelectItem
  final case class SelectPredict(modelId: String, alias: Option[String]) extends SelectItem
  case object SelectStar extends SelectItem { def alias: Option[String] = None }

  final case class JoinClause(table: String, leftKey: String, rightKey: String)

  /** WHERE conjunct: plain predicate, or comparison against a PREDICT call. */
  sealed trait WhereConjunct
  final case class PlainPred(expr: ScalarExpr) extends WhereConjunct
  /** `PREDICT(m) <op> literal` — the score predicate of an inference query. */
  final case class PredictPred(modelId: String, op: String, value: Double) extends WhereConjunct

  final case class ParsedQuery(
      select: Seq[SelectItem],
      fromTable: String,
      joins: Seq[JoinClause],
      where: Seq[WhereConjunct],
  )

  // ---- parser -------------------------------------------------------------

  private final class P(toks: Vector[Tok]) {
    var i = 0
    def peek: Option[Tok] = toks.lift(i)
    def next(): Tok = { val t = toks.lift(i).getOrElse(throw ParseError("unexpected end of query", i)); i += 1; t }
    def expectKw(kw: String): Unit = next() match {
      case TIdent(s) if s.equalsIgnoreCase(kw) =>
      case other => throw ParseError(s"expected $kw, got $other", i)
    }
    def expectSym(s: String): Unit = next() match {
      case TSym(x) if x == s =>
      case other => throw ParseError(s"expected '$s', got $other", i)
    }
    def ident(): String = next() match {
      case TIdent(s) => s
      case other     => throw ParseError(s"expected identifier, got $other", i)
    }
    def isKw(kw: String): Boolean = peek.exists { case TIdent(s) => s.equalsIgnoreCase(kw); case _ => false }
    def isSym(s: String): Boolean = peek.contains(TSym(s))
  }

  def parse(sql: String): ParsedQuery = {
    val p = new P(lex(sql))
    p.expectKw("SELECT")
    val select = parseSelectList(p)
    p.expectKw("FROM")
    val from = p.ident()
    val joins = Seq.newBuilder[JoinClause]
    while (p.isKw("JOIN") || p.isKw("INNER")) {
      if (p.isKw("INNER")) p.next()
      p.expectKw("JOIN")
      val t = p.ident()
      p.expectKw("ON")
      val a = qcol(p)
      p.expectSym("=")
      val b = qcol(p)
      joins += JoinClause(t, a, b)
    }
    val where = Seq.newBuilder[WhereConjunct]
    if (p.isKw("WHERE")) {
      p.next()
      where += conjunct(p)
      while (p.isKw("AND")) { p.next(); where += conjunct(p) }
    }
    if (p.peek.isDefined) throw ParseError(s"trailing tokens starting at ${p.peek.get}", p.i)
    ParsedQuery(select, from, joins.result(), where.result())
  }

  private def parseSelectList(p: P): Seq[SelectItem] = {
    val items = Seq.newBuilder[SelectItem]
    def item(): SelectItem = {
      if (p.isSym("*")) { p.next(); SelectStar }
      else if (p.isKw("PREDICT")) {
        p.next(); p.expectSym("(")
        val m = p.next() match {
          case TIdent(s) => s
          case TStr(s)   => s
          case other     => throw ParseError(s"expected model id, got $other", p.i)
        }
        p.expectSym(")")
        SelectPredict(m, alias())
      } else {
        val e = operand(p)
        SelectExpr(e, alias())
      }
    }
    def alias(): Option[String] =
      if (p.isKw("AS")) { p.next(); Some(p.ident()) } else None
    items += item()
    while (p.isSym(",")) { p.next(); items += item() }
    items.result()
  }

  private def qcol(p: P): String = {
    val a = p.ident()
    if (p.isSym(".")) { p.next(); p.ident() } // qualifier dropped: flat column namespace
    else a
  }

  private def operand(p: P): ScalarExpr = p.next() match {
    case TNum(v)   => NumLit(v)
    case TStr(s)   => StrLit(s)
    case TIdent(s) =>
      if (p.isSym(".")) { p.next(); ColRef(p.ident()) } else ColRef(s)
    case other => throw ParseError(s"expected operand, got $other", p.i)
  }

  private def conjunct(p: P): WhereConjunct = {
    if (p.isKw("PREDICT")) {
      p.next(); p.expectSym("(")
      val m = p.next() match {
        case TIdent(s) => s; case TStr(s) => s
        case other => throw ParseError(s"expected model id, got $other", p.i)
      }
      p.expectSym(")")
      val op = cmpOp(p)
      val v = p.next() match {
        case TNum(x) => x
        case other   => throw ParseError(s"expected numeric literal, got $other", p.i)
      }
      PredictPred(m, op, v)
    } else {
      val l = operand(p)
      val op = cmpOp(p)
      val r = operand(p)
      PlainPred(Cmp(op, l, r))
    }
  }

  private def cmpOp(p: P): String = p.next() match {
    case TSym(s) if Set("=", "<>", "<", "<=", ">", ">=").contains(s) => s
    case other => throw ParseError(s"expected comparison operator, got $other", p.i)
  }
}

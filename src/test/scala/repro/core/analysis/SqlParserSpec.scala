package repro.core.analysis

import org.scalatest.funsuite.AnyFunSuite
import repro.core.ir._

class SqlParserSpec extends AnyFunSuite {

  import SqlParser._

  test("lexer tokenizes identifiers, numbers, strings, operators") {
    val toks = lex("SELECT a, b FROM t WHERE x >= 1.5 AND y = 'it''s'")
    assert(toks.contains(TIdent("SELECT")))
    assert(toks.contains(TSym(">=")))
    assert(toks.contains(TNum(1.5)))
    assert(toks.contains(TStr("it's")))
  }

  test("lexer rejects garbage") {
    assertThrows[ParseError](lex("SELECT @@ FROM t"))
  }

  test("parses the running-example inference query") {
    val q = parse(
      """SELECT patient_id, PREDICT(hospital_dt) AS los
        |FROM patient_info
        |JOIN blood_tests ON patient_info.patient_id = blood_tests.patient_id
        |JOIN prenatal_tests ON patient_info.patient_id = prenatal_tests.patient_id
        |WHERE pregnant = 1 AND PREDICT(hospital_dt) > 7""".stripMargin)
    assert(q.fromTable == "patient_info")
    assert(q.joins.map(_.table) == Seq("blood_tests", "prenatal_tests"))
    assert(q.select.collect { case SelectPredict(m, a) => (m, a) } == Seq(("hospital_dt", Some("los"))))
    assert(q.where.collect { case PredictPred(m, op, v) => (m, op, v) } == Seq(("hospital_dt", ">", 7.0)))
    assert(q.where.collect { case PlainPred(e) => e.toSql } == Seq("(pregnant = 1)"))
  }

  test("parses SELECT *") {
    val q = parse("SELECT * FROM flights WHERE dest = 'AP01'")
    assert(q.select == Seq(SelectStar))
    assert(q.where.collect { case PlainPred(Cmp("=", ColRef("dest"), StrLit(v))) => v } == Seq("AP01"))
  }

  test("parses qualified columns, dropping the qualifier") {
    val q = parse("SELECT t.a FROM t WHERE t.b < 3")
    assert(q.select == Seq(SelectExpr(ColRef("a"), None)))
    assert(q.where == Seq(PlainPred(Cmp("<", ColRef("b"), NumLit(3.0)))))
  }

  test("parses model id as string literal") {
    val q = parse("SELECT PREDICT('m1') AS p FROM t")
    assert(q.select == Seq(SelectPredict("m1", Some("p"))))
  }

  test("rejects trailing tokens and missing clauses") {
    assertThrows[ParseError](parse("SELECT a FROM t GROUP BY a"))
    assertThrows[ParseError](parse("SELECT a"))
    assertThrows[ParseError](parse("FROM t"))
    assertThrows[ParseError](parse("SELECT a FROM t WHERE"))
  }

  test("rejects OR (documented out of scope)") {
    assertThrows[ParseError](parse("SELECT a FROM t WHERE a = 1 OR a = 2"))
  }

  test("literal-on-left comparisons parse") {
    val q = parse("SELECT a FROM t WHERE 5 < a")
    assert(q.where == Seq(PlainPred(Cmp("<", NumLit(5.0), ColRef("a")))))
  }
}

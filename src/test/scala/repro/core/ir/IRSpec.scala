package repro.core.ir

import org.scalatest.funsuite.AnyFunSuite
import repro.ml.{CatEquals, NumRange}

class IRSpec extends AnyFunSuite {

  private val scan = IRScan("t", Seq("a", "b", "c"))

  test("ScalarExpr renders portable SQL") {
    assert(Cmp("<", ColRef("a"), NumLit(3.5)).toSql == "(a < 3.5)")
    assert(Cmp("=", ColRef("a"), NumLit(3.0)).toSql == "(a = 3)")
    assert(Cmp("=", ColRef("c"), StrLit("x'y")).toSql == "(c = 'x''y')")
    assert(And(Cmp(">", ColRef("a"), NumLit(1)), Not(Cmp("=", ColRef("b"), NumLit(2)))).toSql ==
      "((a > 1) AND (NOT (b = 2)))")
    assert(Or(RawSql("1=1"), Cmp("<>", ColRef("a"), NumLit(0))).toSql == "(1=1 OR (a <> 0))")
  }

  test("references collects column names") {
    val e = And(Cmp("<", ColRef("a"), NumLit(1)), Or(Cmp("=", ColRef("b"), ColRef("c")), Not(ColRef("a"))))
    assert(e.references == Set("a", "b", "c"))
    assert(RawSql("a + b").references.isEmpty) // raw SQL inputs tracked by callers
  }

  test("conjuncts splits nested ANDs only") {
    val e = And(And(Cmp("=", ColRef("a"), NumLit(1)), Cmp("=", ColRef("b"), NumLit(2))),
      Or(Cmp("=", ColRef("c"), NumLit(3)), Cmp("=", ColRef("c"), NumLit(4))))
    val cs = ScalarExpr.conjuncts(e)
    assert(cs.size == 3)
    assert(ScalarExpr.conjunction(cs).get.toSql == e.toSql)
    assert(ScalarExpr.conjunction(Nil).isEmpty)
  }

  test("toColPredicates extracts comparisons with literals, both orders") {
    val e = And(
      And(Cmp(">", ColRef("a"), NumLit(5)), Cmp(">=", NumLit(2), ColRef("b"))),
      And(Cmp("=", ColRef("c"), StrLit("v")), Cmp("=", ColRef("a"), ColRef("b"))))
    val ps = ScalarExpr.toColPredicates(e)
    assert(ps.size == 3) // col-col comparison ignored
    val a = ps.collectFirst { case NumRange("a", c) => c }.get
    assert(a.lo == 5.0 && a.loStrict)
    val b = ps.collectFirst { case NumRange("b", c) => c }.get
    assert(b.hi == 2.0 && !b.hiStrict) // 2 >= b → b <= 2
    assert(ps.contains(CatEquals("c", "v")))
  }

  test("IR output columns propagate through operators") {
    val f = IRFilter(Cmp(">", ColRef("a"), NumLit(1)), scan)
    assert(f.outputCols == Seq("a", "b", "c"))
    val p = IRProject(Seq(NamedExpr("x", ColRef("a"))), f)
    assert(p.outputCols == Seq("x"))
    val j = IRJoin(scan, IRScan("u", Seq("k", "d")), "a", "k")
    assert(j.outputCols == Seq("a", "b", "c", "d")) // right key always dropped (equals left key)
    val j2 = IRJoin(scan, IRScan("u", Seq("a", "d")), "a", "a")
    assert(j2.outputCols == Seq("a", "b", "c", "d"))
  }

  test("categories match the paper's operator classes") {
    assert(scan.category == OpCategory.RA)
    val udf = IRUdf("f", "out", Seq("a"), _ => 1.0, scan)
    assert(udf.category == OpCategory.UDF)
    assert(udf.outputCols.last == "out")
  }

  test("treeString and describe render the plan") {
    val plan = IRProject(Seq(NamedExpr("a", ColRef("a"))),
      IRFilter(Cmp(">", ColRef("a"), NumLit(1)), scan))
    val s = plan.treeString
    assert(s.contains("Project") && s.contains("Filter((a > 1))") && s.contains("Scan(t"))
    assert(plan.collectNodes.size == 3)
  }

  test("SchemaCatalog registration, lookup, and FK integrity") {
    val cat = new SchemaCatalog()
      .register(TableDef("x", Seq("id", "v"), Some("id")))
      .register(TableDef("y", Seq("id", "w"), Some("id")))
      .registerFk(ForeignKey("x", "id", "y", "id"))
    assert(cat.contains("x") && !cat.contains("z"))
    assert(cat.table("x").primaryKey.contains("id"))
    assertThrows[IllegalArgumentException](cat.table("z"))
    assert(cat.isRowPreserving("x", "id", "y", "id"))
    assert(!cat.isRowPreserving("y", "id", "x", "id")) // FK not declared that way
    assert(!cat.isRowPreserving("x", "id", "y", "w"))  // not the PK
  }
}

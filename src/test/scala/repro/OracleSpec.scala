package repro

import org.scalatest.funsuite.AnyFunSuite

class OracleSpec extends AnyFunSuite with SparkSpec {

  test("oracle passes on an equivalent aggregate") {
    import spark.implicits._
    val df = Seq((1, "a", 2.0), (2, "a", 3.0), (3, "b", 4.0)).toDF("id", "k", "v")
    val out = df.groupBy($"k").count().withColumnRenamed("count", "n")
    Oracle.assertEquivalent(out, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> df)
  }

  test("oracle catches a wrong result") {
    import spark.implicits._
    val df = Seq((1, 2.0), (2, 3.0)).toDF("id", "v")
    val wrong = df.selectExpr("id", "v + 1 AS v")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT id, v FROM t", "t" -> df)
    }
  }

  test("oracle catches a column-name mismatch") {
    import spark.implicits._
    val df = Seq((1, 2.0)).toDF("id", "v")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT id AS x, v FROM t", "t" -> df)
    }
  }
}

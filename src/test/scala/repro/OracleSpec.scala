package repro

/** Self-test of the DuckDB oracle plumbing. */
class OracleSpec extends SparkSpec {

  test("oracle accepts an equivalent query") {
    import spark.implicits._
    val df = Seq(("a", 1.0), ("a", 2.0), ("b", 3.0)).toDF("g", "x")
    val got = spark.sql("SELECT g, sum(x) AS s FROM VALUES ('a', 1.0), ('a', 2.0), " +
      "('b', 3.0) AS t(g, x) GROUP BY g")
    Oracle.assertEquivalent(got, "SELECT g, sum(x::DOUBLE) AS s FROM t GROUP BY g",
      "t" -> df)
  }

  test("oracle rejects a wrong result") {
    import spark.implicits._
    val df = Seq(("a", 1.0), ("b", 3.0)).toDF("g", "x")
    val wrong = spark.sql("SELECT 'a' AS g, 99.0 AS s")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT g, sum(x::DOUBLE) AS s FROM t GROUP BY g",
        "t" -> df)
    }
  }

  test("oracle rejects mismatched column sets") {
    import spark.implicits._
    val df = Seq(("a", 1.0)).toDF("g", "x")
    val got = spark.sql("SELECT 'a' AS wrongname")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT g FROM t", "t" -> df)
    }
  }

  test("oracle handles NULLs canonically") {
    import spark.implicits._
    val df = Seq(("a", Some(1.0)), ("b", None)).toDF("g", "x")
    val got = spark.sql(
      "SELECT g, x FROM VALUES ('a', 1.0), ('b', CAST(NULL AS DOUBLE)) AS t(g, x)")
    Oracle.assertEquivalent(got, "SELECT g, x::DOUBLE AS x FROM t", "t" -> df)
  }
}

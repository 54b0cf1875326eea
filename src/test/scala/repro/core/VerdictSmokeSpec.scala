package repro.core

import repro.{Oracle, SparkSpec, SynthData}

/** End-to-end smoke tests for the middleware pipeline.
  *
  * Uses the tau=1 trick: with a sampling ratio of 1 every HT weight is 1,
  * so the AQP point estimates must equal the exact answers bit-for-bit
  * (up to float formatting), which the DuckDB oracle verifies.
  */
class VerdictSmokeSpec extends SparkSpec {

  lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()
  lazy val od = SynthData.orders(spark, sf = 0.002).cache()

  lazy val verdict: Verdict = {
    val v = new Verdict(spark, VerdictConfig(budgetFraction = 1.1, tau = 1.0))
    v.registerTable("lineitem", li)
    v.registerTable("orders", od)
    v.createSample("lineitem", SampleType.Uniform, tau = 1.0)
    v.createSample("orders", SampleType.Uniform, tau = 1.0)
    v
  }

  test("flat group-by count/sum/avg at tau=1 equals exact") {
    val q = "SELECT l_returnflag, count(*) AS cnt, sum(l_quantity) AS sq, " +
      "avg(l_extendedprice) AS ae FROM lineitem GROUP BY l_returnflag"
    val r = verdict.sql(q)
    assert(r.approximate, s"expected AQP, got: ${r.notes}")
    Oracle.assertEquivalent(
      r.df.select("l_returnflag", "cnt", "sq", "ae"),
      q.replace("count(*)", "count(*)::DOUBLE").replace("sum(l_quantity)", "sum(l_quantity::DOUBLE)")
        .replace("avg(l_extendedprice)", "avg(l_extendedprice::DOUBLE)"),
      "lineitem" -> li)
  }

  test("global aggregate with filter at tau=1 equals exact") {
    val q = "SELECT sum(l_extendedprice * (1 - l_discount)) AS revenue " +
      "FROM lineitem WHERE l_quantity < 25"
    val r = verdict.sql(q)
    assert(r.approximate, r.notes)
    Oracle.assertEquivalent(
      r.df.select("revenue"),
      "SELECT sum(l_extendedprice::DOUBLE * (1 - l_discount::DOUBLE)) AS revenue " +
        "FROM lineitem WHERE l_quantity::DOUBLE < 25",
      "lineitem" -> li)
  }

  test("join query at tau=1 equals exact") {
    val q = "SELECT o_orderstatus, count(*) AS cnt, sum(l_quantity) AS sq " +
      "FROM lineitem, orders WHERE l_orderkey = o_orderkey " +
      "GROUP BY o_orderstatus"
    val r = verdict.sql(q)
    assert(r.approximate, r.notes)
    Oracle.assertEquivalent(
      r.df.select("o_orderstatus", "cnt", "sq"),
      "SELECT o_orderstatus, count(*)::DOUBLE AS cnt, sum(l_quantity::DOUBLE) AS sq " +
        "FROM lineitem, orders WHERE l_orderkey = o_orderkey GROUP BY o_orderstatus",
      "lineitem" -> li, "orders" -> od)
  }

  test("unsupported query passes through exactly") {
    val q = "SELECT l_returnflag FROM lineitem WHERE l_quantity > 49 " +
      "GROUP BY l_returnflag"
    val r = verdict.sql(q)
    assert(!r.approximate)
    assert(r.df.count() >= 1)
  }
}

package repro.core

import repro.{Oracle, SparkSpec}

/** The AQP rewriter (Sections 4–5, Appendix G).
  *
  * Exactness: at tau=1 every Horvitz–Thompson weight is 1, so point
  * estimates must equal exact answers (checked against DuckDB).
  * Statistics: at tau=0.1 estimates must be close and error columns must be
  * sane (positive, of the right magnitude).
  */
class RewriterSpec extends SparkSpec {

  private lazy val vExact   = TestData.verdictExact
  private lazy val vSampled = TestData.verdictSampled

  private def approx(v: Verdict, sql: String): VerdictResult = {
    val r = v.sql(sql)
    assert(r.approximate, s"expected AQP for: $sql — ${r.notes}")
    r
  }

  // ------------------------------------------------------- tau=1 exactness --

  test("count(*) per group is exact at tau=1") {
    val r = approx(vExact,
      "SELECT l_returnflag, count(*) AS c FROM lineitem GROUP BY l_returnflag")
    Oracle.assertEquivalent(r.df.select("l_returnflag", "c"),
      "SELECT l_returnflag, count(*)::DOUBLE AS c FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> TestData.li)
  }

  test("count(column) counts non-nulls at tau=1") {
    val r = approx(vExact, "SELECT count(l_partkey) AS c FROM lineitem")
    Oracle.assertEquivalent(r.df.select("c"),
      "SELECT count(l_partkey)::DOUBLE AS c FROM lineitem",
      "lineitem" -> TestData.li)
  }

  test("sum over an expression is exact at tau=1 (relative tolerance)") {
    // large sums differ in the last few ulps across addition orders, so the
    // comparison is relative rather than the oracle's fixed-decimal diff
    val q = "SELECT l_linestatus, sum(l_extendedprice * (1 - l_discount)) AS s " +
      "FROM lineitem GROUP BY l_linestatus"
    val r = approx(vExact, q)
    val exact = spark.sql(q).collect().map(x => x.getString(0) -> x.getDouble(1)).toMap
    r.df.collect().foreach { row =>
      val e = exact(row.getString(0))
      assert(math.abs(row.getAs[Double]("s") - e) / e < 1e-9)
    }
  }

  test("avg is exact at tau=1") {
    val r = approx(vExact,
      "SELECT l_returnflag, avg(l_quantity) AS a FROM lineitem GROUP BY l_returnflag")
    Oracle.assertEquivalent(r.df.select("l_returnflag", "a"),
      "SELECT l_returnflag, avg(l_quantity::DOUBLE) AS a FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> TestData.li)
  }

  test("variance and stddev match the population moments at tau=1") {
    val r = approx(vExact,
      "SELECT variance(l_quantity) AS v, stddev(l_quantity) AS s FROM lineitem")
    val row = r.df.head()
    val exact = spark.sql(
      "SELECT var_pop(l_quantity) AS v, stddev_pop(l_quantity) AS s FROM lineitem").head()
    // the HT moment estimator is the population variance
    assert(math.abs(row.getAs[Double]("v") - exact.getAs[Double]("v")) < 1e-6)
    assert(math.abs(row.getAs[Double]("s") - exact.getAs[Double]("s")) < 1e-6)
  }

  test("count-distinct via hashed sample is exact at tau=1") {
    val r = approx(vExact, "SELECT count(distinct l_orderkey) AS cd FROM lineitem")
    val exact = spark.sql("SELECT count(distinct l_orderkey) AS cd FROM lineitem")
      .head().getLong(0)
    assert(math.abs(r.df.head().getAs[Double]("cd") - exact) < 1e-6)
  }

  test("arithmetic over aggregates (tq14 shape) is exact at tau=1") {
    val q = "SELECT (100.0 * sum(l_discount) / sum(l_tax)) AS ratio FROM lineitem " +
      "WHERE l_tax > 0"
    val r = approx(vExact, q)
    val exact = spark.sql(q).head().getDouble(0)
    assert(math.abs(r.df.head().getAs[Double]("ratio") - exact) < 1e-9)
  }

  test("join of two hashed samples is exact at tau=1") {
    val q = "SELECT o_orderstatus, sum(l_extendedprice) AS s, count(*) AS c " +
      "FROM lineitem, orders WHERE l_orderkey = o_orderkey GROUP BY o_orderstatus"
    val r = approx(vExact, q)
    Oracle.assertEquivalent(r.df.select("o_orderstatus", "s", "c"),
      "SELECT o_orderstatus, sum(l_extendedprice::DOUBLE) AS s, count(*)::DOUBLE AS c " +
        "FROM lineitem, orders WHERE l_orderkey = o_orderkey GROUP BY o_orderstatus",
      "lineitem" -> TestData.li, "orders" -> TestData.od)
  }

  test("three-table join with a dimension base table is exact at tau=1") {
    val q = "SELECT c_mktsegment, sum(l_quantity) AS s FROM lineitem, orders, customer " +
      "WHERE l_orderkey = o_orderkey AND o_custkey = c_custkey GROUP BY c_mktsegment"
    val r = approx(vExact, q)
    Oracle.assertEquivalent(r.df.select("c_mktsegment", "s"),
      "SELECT c_mktsegment, sum(l_quantity::DOUBLE) AS s FROM lineitem, orders, customer " +
        "WHERE l_orderkey = o_orderkey AND o_custkey = c_custkey GROUP BY c_mktsegment",
      "lineitem" -> TestData.li, "orders" -> TestData.od, "customer" -> TestData.cu)
  }

  test("HAVING filters on the point estimates at tau=1") {
    val q = "SELECT l_returnflag, count(*) AS c FROM lineitem " +
      "GROUP BY l_returnflag HAVING sum(l_quantity) > 100"
    val r = approx(vExact, q)
    Oracle.assertEquivalent(r.df.select("l_returnflag", "c"),
      "SELECT l_returnflag, count(*)::DOUBLE AS c FROM lineitem " +
        "GROUP BY l_returnflag HAVING sum(l_quantity::DOUBLE) > 100",
      "lineitem" -> TestData.li)
  }

  test("ORDER BY and LIMIT apply to the rewritten output") {
    val q = "SELECT l_returnflag, count(*) AS c FROM lineitem " +
      "GROUP BY l_returnflag ORDER BY c DESC LIMIT 2"
    val r = approx(vExact, q)
    val got = r.df.select("c").collect().map(_.getDouble(0))
    assert(got.length == 2)
    assert(got(0) >= got(1))
  }

  test("nested aggregate-in-FROM is exact at tau=1") {
    val q = """SELECT avg(daily) AS a FROM
              |(SELECT l_linenumber, sum(l_extendedprice) AS daily
              | FROM lineitem GROUP BY l_linenumber) t""".stripMargin
    val r = approx(vExact, q)
    val exact = spark.sql(q).head().getDouble(0)
    assert(math.abs(r.df.head().getAs[Double]("a") - exact) / exact < 1e-9)
  }

  test("nested query with outer filter is exact at tau=1") {
    val q = """SELECT count(*) AS c FROM
              |(SELECT l_linenumber, sum(l_quantity) AS tot
              | FROM lineitem GROUP BY l_linenumber) t
              |WHERE tot > 0""".stripMargin
    val r = approx(vExact, q)
    val exact = spark.sql(q).head().getLong(0)
    val est = r.df.head().getAs[Any]("c").toString.toDouble
    assert(math.abs(est - exact) < 1e-6)
  }

  test("rewritten SQL is pure standard SQL over the sample views") {
    val r = approx(vExact,
      "SELECT l_returnflag, count(*) AS c FROM lineitem GROUP BY l_returnflag")
    val sql = r.rewrittenSql.get
    assert(sql.contains("lineitem_uniform"), "must read the sample, not the base")
    assert(!sql.contains("lineitem ") || !sql.contains("FROM lineitem "),
      "must not scan the base table")
    assert(sql.contains("stddev_samp"), "must carry the subsampling error term")
    assert(sql.contains("vsid"), "must carry the subsample-id column")
  }

  // ----------------------------------------------- tau=0.1 statistical sanity --

  test("sampled estimates are close and carry positive error columns") {
    val r = approx(vSampled,
      "SELECT l_returnflag, sum(l_extendedprice) AS s FROM lineitem_s " +
        "GROUP BY l_returnflag")
    assert(r.errColumns == Map("s" -> "s_err"))
    val exact = spark.sql(
      "SELECT l_returnflag, sum(l_extendedprice) AS s FROM lineitem_s " +
        "GROUP BY l_returnflag").collect()
      .map(x => x.getString(0) -> x.getDouble(1)).toMap
    r.df.collect().foreach { row =>
      val est = row.getAs[Double]("s")
      val err = row.getAs[Double]("s_err")
      val ex  = exact(row.getString(0))
      assert(math.abs(est - ex) / ex < 0.2, s"estimate too far: $est vs $ex")
      assert(err > 0, "error estimate must be positive")
      assert(err < ex, "error estimate must be smaller than the value itself")
      // |est - exact| should usually be within ~4 estimated standard errors
      assert(math.abs(est - ex) < 6 * err, s"|${est - ex}| vs err=$err")
    }
  }

  test("sampled avg is within a few percent (variance-reduced by ratio form)") {
    val r = approx(vSampled, "SELECT avg(l_quantity) AS a FROM lineitem_s")
    val exact = spark.sql("SELECT avg(l_quantity) AS a FROM lineitem_s")
      .head().getDouble(0)
    val est = r.df.head().getAs[Double]("a")
    assert(math.abs(est - exact) / exact < 0.05, s"$est vs $exact")
  }

  test("sampled count-distinct via hashed sample is within 20%") {
    val r = approx(vSampled, "SELECT count(distinct l_orderkey) AS cd FROM lineitem_s")
    val exact = spark.sql("SELECT count(distinct l_orderkey) AS cd FROM lineitem_s")
      .head().getLong(0).toDouble
    val est = r.df.head().getAs[Double]("cd")
    assert(math.abs(est - exact) / exact < 0.2, s"$est vs $exact")
  }

  test("sampled median is within a few percent of the exact median") {
    val r = approx(vSampled,
      "SELECT percentile(l_extendedprice, 0.5) AS med FROM lineitem_s")
    val exact = spark.sql(
      "SELECT percentile(l_extendedprice, 0.5) AS med FROM lineitem_s")
      .head().getDouble(0)
    val est = r.df.head().getAs[Double]("med")
    assert(math.abs(est - exact) / exact < 0.05, s"$est vs $exact")
  }

  test("stratified sample keeps every group present (vs uniform may not)") {
    val r = approx(vSampled,
      "SELECT l_returnflag, count(*) AS c FROM lineitem_s GROUP BY l_returnflag")
    assert(r.df.count() == 3, "all three return flags must be present")
  }

  test("joined samples: estimates within 30% at tau=0.1 (hashed x hashed)") {
    val q = "SELECT sum(l_extendedprice) AS s FROM lineitem_s, orders_s " +
      "WHERE l_orderkey = o_orderkey"
    val r = approx(vSampled, q)
    val exact = spark.sql(q).head().getDouble(0)
    val est = r.df.head().getAs[Double]("s")
    assert(math.abs(est - exact) / exact < 0.3, s"$est vs $exact")
  }
}

package repro.core

import repro.{SparkSpec, SynthData}

/** The middleware facade: pass-through behaviour, extreme-statistic
  * decomposition (Section 2.2), HAC (Section 2.4), transparent mode, and
  * the Appendix F default sampling policy.
  */
class VerdictSpec extends SparkSpec {

  private lazy val vExact = TestData.verdictExact

  test("non-aggregate queries pass through with exact results") {
    val r = vExact.sql("SELECT l_returnflag FROM lineitem WHERE l_quantity > 49 " +
      "GROUP BY l_returnflag")
    assert(!r.approximate)
    assert(r.notes.contains("unsupported") || r.notes.contains("no aggregates"))
  }

  test("extreme-only aggregate queries pass through") {
    val r = vExact.sql("SELECT max(l_extendedprice) AS m FROM lineitem")
    assert(!r.approximate)
    assert(r.notes.contains("extreme-only"))
    val exact = spark.sql("SELECT max(l_extendedprice) AS m FROM lineitem").head()
    assert(r.df.head().getDouble(0) == exact.getDouble(0))
  }

  test("mixed extreme + mean-like queries are decomposed (Section 2.2)") {
    val q = "SELECT l_returnflag, max(l_extendedprice) AS mx, avg(l_quantity) AS aq " +
      "FROM lineitem GROUP BY l_returnflag"
    val r = vExact.sql(q)
    assert(r.approximate)
    assert(r.notes.contains("decomposed"))
    assert(r.df.columns.toSeq.take(3) == Seq("l_returnflag", "mx", "aq"))
    val exact = spark.sql(q).collect()
      .map(x => x.getString(0) -> (x.getDouble(1), x.getDouble(2))).toMap
    r.df.collect().foreach { row =>
      val (mx, aq) = exact(row.getString(0))
      assert(row.getAs[Double]("mx") == mx, "extreme part must be exact")
      assert(math.abs(row.getAs[Double]("aq") - aq) < 1e-9,
        "mean-like part is exact at tau=1")
    }
  }

  test("queries against tables without samples pass through") {
    TestData.pa.createOrReplaceTempView("part_nosample")
    val r = vExact.sql("SELECT count(*) AS c FROM part_nosample")
    assert(!r.approximate)
  }

  test("unparseable SQL is not swallowed") {
    intercept[Exception](spark.sql("SELECT FROM WHERE"))
    val r = vExact.sql("SELECT count(*) AS c FROM lineitem WHERE l_quantity > 0 " +
      "AND exists (SELECT 1 FROM orders)")
    assert(!r.approximate) // EXISTS is unsupported -> passthrough, still answers
  }

  test("HAC: a violated accuracy requirement triggers an exact rerun") {
    import spark.implicits._
    val tiny = (1 to 400).map(i => (i % 5, i.toDouble)).toDF("g", "x")
    val v = new Verdict(spark,
      VerdictConfig(budgetFraction = 1.0, tau = 0.2,
        accuracyRequirement = Some(1e-9))) // impossible to satisfy
    v.registerTable("hac_t", tiny)
    v.createSample("hac_t", SampleType.Uniform, tau = 0.2)
    val r = v.sql("SELECT sum(x) AS s FROM hac_t")
    assert(!r.approximate, "HAC must fall back to the exact answer")
    assert(r.notes.contains("HAC"))
    assert(r.df.head().getDouble(0) == 400.0 * 401 / 2)
  }

  test("HAC: a satisfied accuracy requirement keeps the approximate answer") {
    import spark.implicits._
    val tiny = (1 to 400).map(i => (i % 5, i.toDouble)).toDF("g", "x")
    val v = new Verdict(spark,
      VerdictConfig(budgetFraction = 1.0, tau = 1.0,
        accuracyRequirement = Some(0.5)))
    v.registerTable("hac_u", tiny)
    v.createSample("hac_u", SampleType.Uniform, tau = 1.0)
    val r = v.sql("SELECT sum(x) AS s FROM hac_u")
    assert(r.approximate)
  }

  test("transparent mode: errorColumns=false hides the *_err columns") {
    import spark.implicits._
    val tiny = (1 to 400).map(i => (i % 5, i.toDouble)).toDF("g", "x")
    val v = new Verdict(spark,
      VerdictConfig(budgetFraction = 1.0, tau = 1.0, errorColumns = false))
    v.registerTable("tm_t", tiny)
    v.createSample("tm_t", SampleType.Uniform, tau = 1.0)
    val r = v.sql("SELECT g, sum(x) AS s FROM tm_t GROUP BY g")
    assert(r.approximate)
    assert(r.df.columns.toSeq == Seq("g", "s"))
    assert(r.errColumns.isEmpty)
  }

  test("error columns are present by default and named <alias>_err") {
    val r = vExact.sql("SELECT l_returnflag, count(*) AS c FROM lineitem " +
      "GROUP BY l_returnflag")
    assert(r.df.columns.toSeq == Seq("l_returnflag", "c", "c_err"))
    assert(r.errColumns == Map("c" -> "c_err"))
  }

  test("registerTable gathers row counts and cardinalities") {
    val st = vExact.tableStats("lineitem").get
    assert(st.rows == TestData.li.count())
    assert(st.cardinalities("l_returnflag") <= 4) // approx; 3 values
    assert(st.cardinalities("l_orderkey") > 100)
  }

  test("default sampling policy (Appendix F): uniform + hashed high-card + stratified low-card") {
    val df = SynthData.lineitem(spark, 0.001)
    val v  = new Verdict(spark, VerdictConfig(tau = 0.1))
    v.registerTable("policy_t", df)
    val infos = v.createDefaultSamples("policy_t", maxHashed = 1, maxStratified = 1,
      rowTarget = 600)
    assert(infos.exists(_.sampleType == SampleType.Uniform))
    val hashed = infos.filter(_.sampleType == SampleType.Hashed)
    assert(hashed.size == 1 && hashed.head.columns.size == 1)
    val strat = infos.filter(_.sampleType == SampleType.Stratified)
    assert(strat.size == 1 && strat.head.columns.size == 1)
    // hashed goes to a higher-cardinality column than stratified
    val st = v.tableStats("policy_t").get
    assert(st.cardinalities(hashed.head.columns.head.toLowerCase) >
      st.cardinalities(strat.head.columns.head.toLowerCase))
    assert(v.catalog.samplesFor("policy_t").size == infos.size)
  }

  test("confidence-interval multiplier matches the normal quantile") {
    val r = vExact.sql("SELECT count(*) AS c FROM lineitem")
    assert(math.abs(r.confidenceInterval(0.05) - 1.959964) < 1e-4)
  }

  test("count(1) is treated as count(*)") {
    val r = vExact.sql("SELECT count(1) AS c FROM lineitem")
    assert(r.approximate)
    val exact = spark.sql("SELECT count(1) AS c FROM lineitem").head().getLong(0)
    assert(math.abs(r.df.head().getAs[Double]("c") - exact) < 1e-6)
  }
}

package repro.bench

import repro.SparkSpec
import repro.exp.{Experiments, Workloads}

/** Figures 4/9/10: per-query speedup of Verdict over exact execution, and
  * the actual relative errors of the approximate answers.
  *
  * Paper (clusters, 124–500 GB): average speedups 24.0x (Redshift),
  * 12.0x (Spark SQL), 18.6x (Impala); 3 of 18 TPC-H queries declined
  * (high-cardinality groups); all errors <= 2.57%.
  *
  * Here (local Spark, Parquet, ~100 MB): the *shape* must hold — AQP
  * queries get speedup > 1 on average, declined queries get none, errors
  * stay small (they depend only on sample size, not cluster size).
  */
class Fig4SpeedupBench extends SparkSpec {

  test("Fig 4/9/10: speedups and errors across the 23-query suite") {
    val rows = Experiments.speedupTable(BenchEnv.freshEnv)
    BenchEnv.printRows("query exactMs verdictMs speedup relErr% approx", rows)

    val expect = Workloads.all.map(q => q.name -> q.expectAqp).toMap
    // planner must decline exactly the high-cardinality-group queries
    rows.foreach { r =>
      assert(r.approximate == expect(r.query),
        s"${r.query}: approximate=${r.approximate}, expected ${expect(r.query)}")
    }
    val aqp = rows.filter(_.approximate)
    val geoSpeedup = math.exp(aqp.map(r => math.log(r.speedup)).sum / aqp.size)
    println(f"geometric-mean speedup over AQP queries: $geoSpeedup%.2fx " +
      f"(paper: 12.0x Spark SQL at 500 GB)")
    assert(geoSpeedup > 1.2, f"expected overall AQP speedup, got $geoSpeedup%.2fx")
    // errors: paper reports 0.03%..2.57%; at our (smaller) sample sizes we
    // allow up to 10% per query
    aqp.filter(r => !r.relErrPct.isNaN).foreach { r =>
      assert(r.relErrPct < 10.0, s"${r.query}: relErr ${r.relErrPct}%")
    }
    // declined queries return exact answers: zero error
    rows.filterNot(_.approximate).foreach(r => assert(r.relErrPct == 0.0))
  }
}

package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Figure 5: with a fixed sample size, speedup grows with the base data
  * size. Paper: 1.4x at 50 GB -> 7.0x at 200 GB -> >22.6x at 500 GB for
  * tq-6/tq-14 with a fixed 5 GB sample.
  */
class Fig5DataSizeBench extends SparkSpec {

  test("Fig 5: speedup grows with data size at fixed sample size") {
    // local Spark scans Parquet so fast that the paper's 50->500 GB sweep
    // maps to sf 0.25 -> 2.0 here before scan time dominates fixed overheads
    val sfs  = Seq(0.25, 0.5, 1.0, 2.0)
    val rows = Experiments.dataSizeSweep(spark, sfs)
    BenchEnv.printRows("query sf baseRows exactMs verdictMs speedup", rows)

    for (q <- Seq("tq6", "tq14")) {
      val byQ = rows.filter(_.query == q).sortBy(_.sf)
      println(f"$q: speedup ${byQ.head.speedup}%.2fx at sf=${byQ.head.sf} -> " +
        f"${byQ.last.speedup}%.2fx at sf=${byQ.last.sf} " +
        "(paper: 1.4x@50GB -> 22.6x@500GB)")
      // assert the mechanism rather than the noisy ratio itself: the exact
      // side scales with the data while the fixed-size-sample side does not
      assert(byQ.last.exactMs > byQ.head.exactMs * 1.5,
        s"$q: exact latency should grow with data size " +
          s"(${byQ.head.exactMs} -> ${byQ.last.exactMs} ms)")
      assert(byQ.last.verdictMs < byQ.last.exactMs,
        s"$q: at the largest size the fixed sample must win " +
          s"(${byQ.last.verdictMs} vs ${byQ.last.exactMs} ms)")
      assert(byQ.last.speedup > byQ.head.speedup,
        s"$q: speedup should grow with data size")
    }
    // the join query must show a clear win once the data dwarfs the sample
    val tq14 = rows.filter(_.query == "tq14").maxBy(_.sf)
    assert(tq14.speedup > 1.5,
      f"tq14 at sf=${tq14.sf}: expected a clear speedup, got ${tq14.speedup}%.2fx")
  }
}

package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Figures 12/13 (Appendix B.3): time-error tradeoff of the three
  * resampling methods across sample size n and resample count b.
  *
  * Paper: bootstrap is the most accurate for a given n but orders of
  * magnitude slower; for the same *time budget* variational subsampling is
  * far more accurate, and the accuracy gap closes as n grows.
  */
class Fig12TradeoffBench extends SparkSpec {

  test("Fig 12: accuracy/latency across n (b=1000 for O(b*n) methods)") {
    val rows = Experiments.tradeoff(Seq(10000, 31600, 100000), Seq(1000), trials = 20)
    BenchEnv.printRows("n b method boundRelErr% latencyMs", rows)
    for (n <- Seq(10000, 31600, 100000)) {
      val m = rows.filter(_.n == n).map(r => r.method -> r).toMap
      assert(m("variational").latencyMs < m("bootstrap").latencyMs,
        s"n=$n: variational must be faster than bootstrap")
      assert(m("variational").latencyMs < m("traditional").latencyMs,
        s"n=$n: variational must be faster than traditional subsampling")
      // bound estimates of all methods are in the right ballpark
      m.values.foreach(r => assert(r.boundRelErrPct < 5.0,
        s"n=$n ${r.method}: bound error ${r.boundRelErrPct}%"))
    }
    val v = rows.filter(_.method == "variational").sortBy(_.n)
    assert(v.last.boundRelErrPct <= v.head.boundRelErrPct * 1.2,
      "variational bound error should shrink (or hold) as n grows")
  }

  test("Fig 13: accuracy saturates and cost grows with b for O(b*n) methods") {
    val rows = Experiments.tradeoff(Seq(100000), Seq(10, 100, 1000), trials = 15)
    BenchEnv.printRows("n b method boundRelErr% latencyMs", rows)
    val boot = rows.filter(_.method == "bootstrap").sortBy(_.b)
    assert(boot.last.latencyMs > boot.head.latencyMs * 5,
      "bootstrap cost must grow ~linearly with b")
    val vari = rows.filter(_.method == "variational")
    assert(vari.map(_.latencyMs).max < boot.last.latencyMs,
      "variational (b fixed at sqrt(n)) must undercut bootstrap at large b")
  }
}

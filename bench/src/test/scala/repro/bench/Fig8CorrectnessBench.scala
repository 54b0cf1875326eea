package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Figure 8: statistical correctness of variational subsampling's error
  * estimates.
  *
  * (a) count query, n=10K, selectivity sweep: estimated relative errors
  * track the ground truth (paper: within 7%), and shrink as selectivity
  * grows. (b) avg query, sample-size sweep: with b limited to ~100,
  * resampling methods trail CLT at small n but the gap closes as n grows;
  * variational converges to traditional subsampling (paper: 6.5% less
  * accurate at 100K -> 0% at 10M).
  */
class Fig8CorrectnessBench extends SparkSpec {

  test("Fig 8a: estimated error tracks ground truth across selectivities") {
    val rows = Experiments.correctnessSelectivity(Seq(0.001, 0.01, 0.1, 0.5))
    BenchEnv.printRows("selectivity truth% mean% p5% p95%", rows)
    rows.sliding(2).foreach { case Seq(a, b) =>
      assert(b.meanPct < a.meanPct, "relative error should fall as selectivity rises")
    }
    rows.filter(_.selectivity >= 0.01).foreach { r =>
      val dev = math.abs(r.meanPct - r.groundTruthPct) / r.groundTruthPct
      assert(dev < 0.25,
        f"sel=${r.selectivity}: mean estimate ${r.meanPct}%.2f%% vs truth " +
          f"${r.groundTruthPct}%.2f%% (dev ${dev * 100}%.0f%%, paper: within 7%%)")
    }
  }

  test("Fig 8b: method comparison across sample sizes") {
    val rows = Experiments.correctnessMethods(Seq(10000, 100000, 1000000), trials = 40)
    BenchEnv.printRows("n method mean% p5% p95% truth%", rows)
    // every method's mean estimated error must track the ground truth
    rows.foreach { r =>
      val dev = math.abs(r.meanPct - r.groundTruthPct) / r.groundTruthPct
      assert(dev < 0.35, s"${r.method}@${r.n}: dev ${(dev * 100).round}%")
    }
    // variational converges toward traditional subsampling as n grows
    val gap = (n: Int) => {
      val v = rows.find(r => r.n == n && r.method == "variational").get
      val t = rows.find(r => r.n == n && r.method == "traditional").get
      math.abs(v.meanPct - t.meanPct) / t.meanPct
    }
    println(f"variational-vs-traditional gap: ${gap(10000) * 100}%.1f%% @10K -> " +
      f"${gap(1000000) * 100}%.1f%% @1M (paper: 6.5%% @100K -> 0%% @10M)")
  }
}

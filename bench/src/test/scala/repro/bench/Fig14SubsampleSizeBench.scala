package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Figure 14 (Appendix B.3): effect of the subsample size n_s on the
  * accuracy of variational subsampling's error bounds.
  *
  * Paper: with n fixed (50K in the text), n_s = n^(1/2) — the default —
  * yields the lowest relative error among n^(1/4), n^(1/3), n^(1/2),
  * n^(2/3), n^(3/4).
  */
class Fig14SubsampleSizeBench extends SparkSpec {

  test("Fig 14: n_s = sqrt(n) minimizes the error of the error bound") {
    val rows = Experiments.subsampleSizeSweep(n = 50000, trials = 150)
    BenchEnv.printRows("exponent ns b boundRelErr%", rows)
    val best = rows.minBy(_.boundRelErrPct)
    println(f"best exponent: ${best.exponent}%.3f (paper: 0.5)")
    // n^(1/2) must be at the optimum, or within noise of it (15%)
    val half = rows.find(r => math.abs(r.exponent - 0.5) < 1e-9).get
    assert(half.boundRelErrPct <= best.boundRelErrPct * 1.15,
      f"n_s=sqrt(n) (${half.boundRelErrPct}%.3f%%) should be (near-)optimal; " +
        f"best was ${best.exponent} at ${best.boundRelErrPct}%.3f%%")
    // the extremes must be worse than the middle
    val extremes = rows.filter(r => r.exponent < 0.3 || r.exponent > 0.7)
    assert(extremes.forall(_.boundRelErrPct >= half.boundRelErrPct),
      "extreme n_s choices should not beat sqrt(n)")
  }
}

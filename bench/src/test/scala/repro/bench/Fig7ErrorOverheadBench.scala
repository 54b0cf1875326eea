package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Figure 7: runtime of flat/join/nested AQP queries under different error
  * estimation methods, all expressed in SQL.
  *
  * Paper: consolidated bootstrap and traditional subsampling (O(b n)) add
  * large overheads; variational subsampling adds only 0.38–0.87 s. Counting
  * total latency, variational was 99x/42x/63x faster than consolidated
  * bootstrap for flat/join/nested. Here the factors shrink with the data
  * (b n is smaller), but the ordering variational << {traditional,
  * bootstrap} must hold for every query shape.
  */
class Fig7ErrorOverheadBench extends SparkSpec {

  test("Fig 7: variational subsampling is far cheaper than O(b*n) methods") {
    val rows = Experiments.errorEstimationOverhead(BenchEnv.freshEnv)
    BenchEnv.printRows("shape method ms", rows)

    for (shape <- Seq("flat", "join", "nested")) {
      val byM = rows.filter(_.shape == shape).map(r => r.method -> r.ms).toMap
      println(f"$shape: none=${byM("none")}%.0f variational=${byM("variational")}%.0f " +
        f"traditional=${byM("traditional")}%.0f bootstrap=${byM("bootstrap")}%.0f ms")
      assert(byM("variational") < byM("traditional"),
        s"$shape: variational should beat traditional subsampling")
      assert(byM("variational") < byM("bootstrap"),
        s"$shape: variational should beat consolidated bootstrap")
    }
    val speedups = Seq("flat", "join", "nested").map { shape =>
      val byM = rows.filter(_.shape == shape).map(r => r.method -> r.ms).toMap
      byM("bootstrap") / byM("variational")
    }
    println(f"variational vs bootstrap total-latency speedups: " +
      speedups.map(s => f"$s%.1fx").mkString(", ") + " (paper: 99x, 42x, 63x)")
  }
}

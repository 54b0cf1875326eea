package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Figure 11 (Appendix B.2): sample preparation time versus the default
  * data preparation overheads. Paper: Verdict's sampling time is much
  * smaller than data transfer/load (mostly-read workload); the integrated
  * engine's (SnappyData) sampling is faster still.
  */
class Fig11SamplePrepBench extends SparkSpec {

  test("Fig 11: sampling cost is small next to data load; integrated is cheapest") {
    val rows = Experiments.samplePrepTime(BenchEnv.freshEnv)
    BenchEnv.printRows("task ms", rows)
    val byTask = rows.map(r => r.task -> r.ms).toMap
    val etl = byTask("data load (parquet ETL)")
    for (t <- Seq("verdict uniform sample", "verdict hashed sample"))
      assert(byTask(t) < etl,
        s"$t (${byTask(t)} ms) should cost less than the data load ($etl ms)")
    assert(byTask("integrated (snappydata-like) sample") <=
      byTask("verdict stratified sample"),
      "the integrated single-pass sampler should not cost more than the " +
        "two-pass stratified construction")
  }
}

package repro.bench

import repro.SparkSpec
import repro.exp.{Experiments, Workloads}

/** Figure 6: VerdictDB versus a tightly-integrated AQP engine (SnappyData
  * stand-in). Paper: comparable latencies on most queries; VerdictDB
  * significantly faster on queries joining two samples (tq-5, tq-7, tq-12,
  * iq-14, iq-15), because the integrated engine falls back to the base
  * table for the second relation.
  */
class Fig6IntegratedBench extends SparkSpec {

  test("Fig 6: comparable overall; Verdict wins on sample-join queries") {
    val queries = Workloads.all.filter(_.expectAqp)
    val rows = Experiments.integratedCompare(BenchEnv.freshEnv, queries)
    BenchEnv.printRows("query verdictMs integratedMs sampleJoin", rows)

    val joins = rows.filter(_.sampleJoin)
    assert(joins.nonEmpty)
    val wonJoins = joins.count(r => r.verdictMs < r.integratedMs)
    println(s"sample-join queries where Verdict is faster: $wonJoins/${joins.size} " +
      "(paper: all such queries)")
    assert(wonJoins >= (joins.size + 1) / 2,
      "Verdict should win on most sample-join queries")

    // on non-join queries the integrated engine may be at most modestly
    // faster (middleware overhead), not orders of magnitude
    val flat = rows.filterNot(_.sampleJoin)
    val ratio = flat.map(r => r.verdictMs / r.integratedMs)
    val geo   = math.exp(ratio.map(math.log).sum / ratio.size)
    println(f"geometric-mean verdict/integrated latency on non-sample-join: $geo%.2f " +
      "(paper: comparable, i.e. around 1)")
    assert(geo < 5.0, f"middleware should cost at most a small factor, got $geo%.2f")
  }
}

package repro.baselines

import org.apache.spark.sql.SparkSession

import repro.util.Stats

/** Consolidated bootstrap expressed in SQL (the state-of-the-art error
  * estimation baseline of Section 6.4, after Agarwal et al. [10]).
  *
  * Bootstrap resamples the n-row sample with replacement, b times, and
  * recomputes the aggregate on each resample: O(b*n). The standard
  * single-pass consolidation replaces explicit resampling with per-tuple
  * Poisson(1) multiplicities — each (tuple, resample) pair receives a
  * multiplicity drawn from Poisson(1), and the aggregate is computed with
  * those multiplicities as weights. We draw the Poisson variate with an
  * inverse-CDF CASE expression over rand(), keeping everything in standard
  * SQL as a middleware must.
  */
object ConsolidatedBootstrap {

  final case class Result(estimate: Double, stderr: Double,
                          ciLo: Double, ciHi: Double, b: Int)

  /** Poisson(1) via inverse CDF on a uniform variate (truncated at 6). */
  def poissonCase(uniformSql: String): String = {
    // CDF of Poisson(1): 0.3679, 0.7358, 0.9197, 0.9810, 0.9963, 0.9994, 1
    s"""(CASE WHEN $uniformSql < 0.367879 THEN 0
       | WHEN $uniformSql < 0.735759 THEN 1
       | WHEN $uniformSql < 0.919699 THEN 2
       | WHEN $uniformSql < 0.981012 THEN 3
       | WHEN $uniformSql < 0.996340 THEN 4
       | WHEN $uniformSql < 0.999406 THEN 5
       | ELSE 6 END)""".stripMargin.replaceAll("\n", " ")
  }

  /** Estimate a sum/avg/count-like aggregate with bootstrap error bounds.
    *
    * @param kind      "sum" | "avg" | "count"
    * @param valueExpr SQL expression of the aggregated value (ignored for count)
    * @param scale     multiplier mapping the sample aggregate to full-table
    *                  magnitude (1/ratio for sum/count; 1 for avg)
    */
  def estimate(spark: SparkSession, sampleView: String, kind: String,
               valueExpr: String, where: Option[String], b: Int,
               scale: Double = 1.0, confidence: Double = 0.95,
               seed: Long = 23): Result = {
    val w = where.map(x => s" WHERE $x").getOrElse("")
    val aggOf = (weight: String) => kind match {
      case "sum"   => s"sum(($valueExpr) * $weight)"
      case "count" => s"sum($weight)"
      case "avg"   => s"(sum(($valueExpr) * $weight) / sum($weight))"
      case other   => throw new IllegalArgumentException(s"unsupported kind: $other")
    }
    // O(b*n): every tuple drawn once per resample with a Poisson(1)
    // multiplicity. The uniform draw is materialized FIRST (engines refuse
    // nondeterministic expressions inside aggregates, and a CASE directly
    // over rand() would re-draw per branch), then the CASE inverse-CDF maps
    // it to the multiplicity.
    val perResample = spark.sql(
      s"""SELECT rid, ${aggOf("bs_mult")} AS est FROM (
         |  SELECT u.*, ${poissonCase("bs_u")} AS bs_mult FROM (
         |    SELECT ids.id AS rid, t.*, rand($seed) AS bs_u
         |    FROM $sampleView t CROSS JOIN range(1, ${b + 1}) ids) u) x
         |${if (w.isEmpty) "" else w}
         |GROUP BY rid""".stripMargin).collect()
    val full = spark.sql(
      s"SELECT ${aggOf("1")} AS est FROM $sampleView t$w")
      .head().getAs[Any]("est").toString.toDouble * scale

    val ests  = perResample.map(_.getAs[Any]("est").toString.toDouble * scale).toSeq
    val alpha = 1 - confidence
    // percentile CI: t_q = q-quantile of (g_0 - g_j); CI = [g0 - t_{1-a/2}, g0 - t_{a/2}]
    val devs = ests.map(full - _)
    Result(full, Stats.stddev(ests),
      full - Stats.quantile(devs, 1 - alpha / 2),
      full - Stats.quantile(devs, alpha / 2),
      ests.size)
  }
}

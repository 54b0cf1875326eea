package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.util.Stats

/** Closed-form central-limit-theorem error estimation (the "CLT" baseline of
  * Section 6.5 / Figure 8b, and the approach of Aqua discussed in Section 7).
  *
  * Only valid for flat avg/sum/count over a uniform sample: the standard
  * error is s/sqrt(n) (avg), N*s/sqrt(n) (sum), or sqrt(N^2 p(1-p)/n)
  * (count of a predicate), with no support for UDAs or sample joins —
  * exactly the generality gap the paper's variational subsampling closes.
  */
object CltEstimator {

  final case class Estimate(value: Double, stderr: Double) {
    def ci(confidence: Double = 0.95): (Double, Double) = {
      val z = Stats.normalQuantile(1 - (1 - confidence) / 2)
      (value - z * stderr, value + z * stderr)
    }
  }

  /** avg(valueCol) over a uniform sample. */
  def avg(spark: SparkSession, sample: DataFrame, valueCol: String): Estimate = {
    val row = sample.selectExpr(
      s"avg($valueCol) AS m", s"stddev_samp($valueCol) AS s", "count(*) AS n").head()
    val n = row.getAs[Long]("n")
    Estimate(row.getAs[Double]("m"), row.getAs[Double]("s") / math.sqrt(n.toDouble))
  }

  /** sum(valueCol) over the base table, estimated from a uniform sample of
    * known ratio: N_hat = n / ratio.
    */
  def sum(spark: SparkSession, sample: DataFrame, valueCol: String,
          ratio: Double): Estimate = {
    val row = sample.selectExpr(
      s"avg($valueCol) AS m", s"stddev_samp($valueCol) AS s", "count(*) AS n").head()
    val n    = row.getAs[Long]("n")
    val nHat = n / ratio
    Estimate(nHat * row.getAs[Double]("m"),
      nHat * row.getAs[Double]("s") / math.sqrt(n.toDouble))
  }

  /** count(*) where predicate, estimated from a uniform sample: binomial. */
  def count(spark: SparkSession, sample: DataFrame, predicate: String,
            ratio: Double): Estimate = {
    val row = sample.selectExpr(
      s"sum(CASE WHEN $predicate THEN 1.0 ELSE 0.0 END) AS k", "count(*) AS n").head()
    val k = row.getAs[java.math.BigDecimal]("k").doubleValue
    val n = row.getAs[Long]("n").toDouble
    val p = if (n == 0) 0.0 else k / n
    val nHat = n / ratio
    Estimate(nHat * p, nHat * math.sqrt(p * (1 - p) / math.max(1.0, n)))
  }
}

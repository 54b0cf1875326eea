package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Offline sample preparation (Section 3).
  *
  * All three creators are expressible as standard SQL over the base table —
  * the property the paper's middleware depends on: `rand()`, a hash function,
  * and `create table ... as select ...` are the only engine features used.
  * Each creator returns the sample DataFrame (with the extra
  * `verdict_sampling_prob` column) plus its catalog metadata.
  */
object SampleCreator {
  import SampleCatalog.ProbCol

  /** Denominator for mapping Spark's integer murmur3 hash onto [0,1). */
  private val HashBuckets = 1000000L

  /** SQL fragment mapping a column set to a uniform value in [0,1) via the
    * engine's hash function (the paper's h(t.C)).
    */
  def hashUnitExpr(cols: Seq[String]): String =
    s"(pmod(hash(${cols.mkString(", ")}), $HashBuckets) / $HashBuckets.0)"

  /** Uniform (Bernoulli) sample: each tuple kept independently w.p. tau. */
  def uniform(df: DataFrame, baseTable: String, tau: Double,
              seed: Long = 7): (DataFrame, SampleInfo) = {
    require(tau > 0 && tau <= 1, s"tau out of (0,1]: $tau")
    val s = df.where(rand(seed) < tau).withColumn(ProbCol, lit(tau))
    val info = SampleInfo(baseTable, s"${baseTable}_uniform", SampleType.Uniform,
      Seq.empty, tau, df.count(), s.count())
    (s, info)
  }

  /** Hashed (universe) sample on a column set: kept iff h(t.C) < tau. All
    * inclusion probabilities are recorded as the realized ratio |T_s|/|T|,
    * as in Section 3.1.
    */
  def hashed(df: DataFrame, baseTable: String, cols: Seq[String],
             tau: Double): (DataFrame, SampleInfo) = {
    require(cols.nonEmpty, "hashed sample needs a column set")
    require(tau > 0 && tau <= 1, s"tau out of (0,1]: $tau")
    val kept     = df.where(expr(s"${hashUnitExpr(cols)} < $tau"))
    val baseRows = df.count()
    val n        = kept.count()
    val ratio    = if (baseRows == 0) 1.0 else n.toDouble / baseRows
    val s        = kept.withColumn(ProbCol, lit(ratio))
    val info = SampleInfo(baseTable,
      s"${baseTable}_hashed_${cols.mkString("_")}", SampleType.Hashed,
      cols, tau, baseRows, n)
    (s, info)
  }

  /** Stratified sample on a column set (Section 3.2): two passes.
    *
    * Pass 1 computes per-stratum sizes; pass 2 Bernoulli-samples with the
    * staircase probability of Lemma 1, guaranteeing (w.p. 1-delta per
    * stratum) at least  m = ceil(|T| * tau / d_C)  tuples per stratum
    * (Equation 1), where d_C is the number of strata.
    */
  def stratified(df: DataFrame, baseTable: String, cols: Seq[String], tau: Double,
                 delta: Double = Staircase.DefaultDelta,
                 seed: Long = 11): (DataFrame, SampleInfo) = {
    require(cols.nonEmpty, "stratified sample needs a column set")
    require(tau > 0 && tau <= 1, s"tau out of (0,1]: $tau")
    val sizes = df.groupBy(cols.map(col): _*)
      .agg(count(lit(1)).as("verdict_strata_size"))
    val baseRows = df.count()
    val d        = sizes.count()
    val m        = math.max(1L, math.ceil(baseRows * tau / d.toDouble).toLong)
    val maxSize  = sizes.agg(max("verdict_strata_size")).head().getLong(0)
    val probSql  = Staircase.caseExpression("verdict_strata_size", m, maxSize, delta)
    val s = df.join(sizes, cols)
      .withColumn(ProbCol, expr(probSql))
      .where(rand(seed) < col(ProbCol))
      .drop("verdict_strata_size")
    val info = SampleInfo(baseTable,
      s"${baseTable}_stratified_${cols.mkString("_")}", SampleType.Stratified,
      cols, tau, baseRows, s.count())
    (s, info)
  }

  /** Materialize a sample as a temp view and register its metadata. Returns
    * the (possibly cached) sample DataFrame.
    */
  def registerSample(spark: SparkSession, catalog: SampleCatalog,
                     sample: DataFrame, info: SampleInfo,
                     cache: Boolean = false): DataFrame = {
    val s = if (cache) sample.cache() else sample
    s.createOrReplaceTempView(info.sampleTable)
    catalog.register(info)
    s
  }
}

package repro.core

/** Variational subsampling (Sections 4.2 and 5.1).
  *
  * A variational table is a sample table with an extra `sid` column: each
  * tuple belongs to at most one subsample. With the paper's defaults
  * (n_s = sqrt(n), hence b = n/n_s = sqrt(n) and b*n_s = n) every tuple is
  * assigned a sid in [1, b] and none is discarded. For joins, Theorem 4
  * reassigns sid = h(i, j) so that a single join of the two variational
  * tables is a variational table of the join.
  */
object VariationalSubsampling {

  /** Column holding the subsample id in rewritten queries. */
  val SidCol = "verdict_vsid"

  /** Number of subsamples for a sample of n rows: b = round(sqrt(n)),
    * rounded *down* to a perfect square so that Theorem 4's sqrt(b)-block
    * grid partitions exactly. Always >= 4.
    */
  def numSubsamples(n: Long): Int = {
    val raw  = math.max(4.0, math.sqrt(math.max(1L, n).toDouble))
    val root = math.max(2, math.floor(math.sqrt(raw)).toInt)
    root * root
  }

  /** Subsample-count for an explicit n_s choice: b = n / n_s (perfect square,
    * >= 4). Used by the Fig 14 sweep where n_s != sqrt(n).
    */
  def numSubsamplesFor(n: Long, ns: Double): Int = {
    val raw  = math.max(4.0, n / math.max(1.0, ns))
    val root = math.max(2, math.floor(math.sqrt(raw)).toInt)
    root * root
  }

  /** SQL expression assigning a uniform random sid in [1, b]. With the
    * default b*n_s = n no tuple is discarded (Definition 1's weight for
    * sid 0 is zero). Seeded for reproducibility; a fresh seed must be used
    * per query (footnote 7: never reuse subsample assignments).
    */
  def sidExpr(b: Int, seed: Long): String =
    s"(1 + CAST(floor(rand($seed) * $b) AS INT))"

  /** Theorem 4's h(i, j): maps the (i, j) sid pair of a joined tuple to the
    * sid of the joined subsample, using the sqrt(b) x sqrt(b) block grid.
    * i, j in [1, b]; result in [1, b]. b must be a perfect square.
    */
  def h(i: Int, j: Int, b: Int): Int = {
    val r = math.round(math.sqrt(b.toDouble)).toInt
    require(r * r == b, s"b must be a perfect square: $b")
    (((i - 1) / r) * r) + ((j - 1) / r) + 1
  }

  /** SQL rendering of h(i, j) over two sid-valued SQL fragments. */
  def hExpr(iSql: String, jSql: String, b: Int): String = {
    val r = math.round(math.sqrt(b.toDouble)).toInt
    require(r * r == b, s"b must be a perfect square: $b")
    s"(CAST(floor(($iSql - 1) / $r) AS INT) * $r + CAST(floor(($jSql - 1) / $r) AS INT) + 1)"
  }

  /** Error scale factor of Equation 2 / Query 9: the subsample-size
    * correction sqrt(n_s / n) applied to the stddev of subsample estimates.
    * Rendered over aggregated per-(group, sid) rows: `avg(sub_size)` is the
    * mean subsample size within the group, `sum(sub_size)` the group's
    * sample size.
    */
  def errScaleSql(subSizeCol: String): String =
    s"sqrt(avg($subSizeCol) / sum($subSizeCol))"
}

package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic stand-in for the paper's `insta` dataset (a 100x-scaled
  * Instacart sales database; Section 6.1). We reproduce its *topology* —
  * a large order-items fact table joined to orders and products dimensions,
  * with low-cardinality grouping attributes (day-of-week, hour, department)
  * — at a configurable scale factor. Deterministic in (sf, seed).
  */
object InstaData {
  private val NItemsPerSf    = 4_000_000L
  private val NOrdersPerSf   = 1_000_000L
  private val NProductsPerSf =    50_000L

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  /** Fact table: one row per (order, product) purchase. */
  def orderItems(spark: SparkSession, sf: Double = 0.01, seed: Long = 101): DataFrame = {
    val nOrders = n(NOrdersPerSf, sf); val nProducts = n(NProductsPerSf, sf)
    spark.range(n(NItemsPerSf, sf)).select(
      (rand(seed)     * nOrders + 1).cast(LongType)   as "oi_order_id",
      (rand(seed + 1) * nProducts + 1).cast(LongType) as "oi_product_id",
      (rand(seed + 2) * 5 + 1).cast(IntegerType)      as "oi_quantity",
      round(rand(seed + 3) * 20 + 0.5, 2)             as "oi_price",
      (rand(seed + 4) * 2).cast(IntegerType)          as "oi_reordered",
    )
  }

  /** Orders dimension: user, day-of-week, hour-of-day. */
  def instaOrders(spark: SparkSession, sf: Double = 0.01, seed: Long = 103): DataFrame = {
    spark.range(1, n(NOrdersPerSf, sf) + 1).toDF("io_order_id").select(
      col("io_order_id"),
      (rand(seed)     * n(NOrdersPerSf, sf) / 10 + 1).cast(LongType) as "io_user_id",
      (rand(seed + 1) * 7).cast(IntegerType)                         as "io_dow",
      (rand(seed + 2) * 24).cast(IntegerType)                        as "io_hour",
    )
  }

  /** Products dimension: department and aisle hierarchy. */
  def instaProducts(spark: SparkSession, sf: Double = 0.01, seed: Long = 107): DataFrame = {
    spark.range(1, n(NProductsPerSf, sf) + 1).toDF("ip_product_id").select(
      col("ip_product_id"),
      (rand(seed)     * 21 + 1).cast(IntegerType)  as "ip_department_id",
      (rand(seed + 1) * 134 + 1).cast(IntegerType) as "ip_aisle_id",
      round(rand(seed + 2) * 15 + 1, 2)            as "ip_price",
    )
  }
}

package repro.core

import org.apache.spark.sql.DataFrame

import repro.{SparkSpec, SynthData}
import repro.data.InstaData

/** Shared tiny datasets and Verdict contexts, built once per test JVM
  * (suites run sequentially in one forked JVM; see build.sbt).
  *
  * - `verdictExact`: tau = 1 samples, so AQP answers equal exact answers —
  *   used to oracle-check the rewrite pipeline.
  * - `verdictSampled`: tau = 0.1 samples — used for statistical assertions.
  */
object TestData {
  private def spark = SparkSpec.shared

  val SF = 0.002

  lazy val li: DataFrame = SynthData.lineitem(spark, SF).cache()
  lazy val od: DataFrame = SynthData.orders(spark, SF).cache()
  lazy val cu: DataFrame = SynthData.customer(spark, SF).cache()
  lazy val pa: DataFrame = SynthData.part(spark, SF).cache()
  lazy val oi: DataFrame = InstaData.orderItems(spark, SF).cache()

  /** Registers the four TPC-H-lite tables and returns a tau=1 Verdict. */
  lazy val verdictExact: Verdict = {
    val v = new Verdict(spark, VerdictConfig(budgetFraction = 2.0, tau = 1.0))
    v.registerTable("lineitem", li)
    v.registerTable("orders", od)
    v.registerTable("customer", cu)
    v.registerTable("part", pa)
    v.createSample("lineitem", SampleType.Uniform, tau = 1.0)
    v.createSample("lineitem", SampleType.Hashed, Seq("l_orderkey"), tau = 1.0)
    v.createSample("orders", SampleType.Uniform, tau = 1.0)
    v.createSample("orders", SampleType.Hashed, Seq("o_orderkey"), tau = 1.0)
    v
  }

  /** tau=0.1 Verdict over the same tables (separate sample-view names would
    * collide, so this context uses *_s suffixed base tables).
    */
  lazy val verdictSampled: Verdict = {
    val v = new Verdict(spark, VerdictConfig(budgetFraction = 0.5, tau = 0.1))
    v.registerTable("lineitem_s", li)
    v.registerTable("orders_s", od)
    v.registerTable("customer_s", cu)
    v.registerTable("part_s", pa)
    v.createSample("lineitem_s", SampleType.Uniform, tau = 0.1)
    v.createSample("lineitem_s", SampleType.Hashed, Seq("l_orderkey"), tau = 0.1)
    v.createSample("lineitem_s", SampleType.Stratified, Seq("l_returnflag"), tau = 0.1)
    v.createSample("orders_s", SampleType.Uniform, tau = 0.1)
    v.createSample("orders_s", SampleType.Hashed, Seq("o_orderkey"), tau = 0.1)
    v
  }
}

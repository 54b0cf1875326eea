package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.exp._

/** Shared bootstrap for the spark-submit entrypoints: one object per paper
  * table/figure (see DESIGN.md section 5 for the mapping). Each prints the
  * reproduced rows to stdout; EXPERIMENTS.md records paper-vs-measured.
  *
  * Usage: spark-submit --class repro.jobs.<Name> repro.jar [sf]
  */
object JobUtil {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def sfArg(args: Array[String], default: Double = 0.2): Double =
    args.headOption.map(_.toDouble).getOrElse(default)

  def table(header: String, rows: Seq[Product]): Unit = {
    println(s"\n== $header ==")
    rows.foreach(r => println(r.productIterator.map {
      case d: Double => f"$d%.3f"
      case x         => x.toString
    }.mkString("  ")))
  }
}

/** Figures 4/9/10: per-query speedups and actual relative errors. */
object SpeedupJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("speedup")
    val env   = BenchData.standardEnv(spark, JobUtil.sfArg(args))
    JobUtil.table("query exactMs verdictMs speedup relErr% approx",
      Experiments.speedupTable(env))
  }
}

/** Figure 5: speedup versus data size at fixed sample size. */
object DataSizeSweepJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("datasize")
    JobUtil.table("query sf baseRows exactMs verdictMs speedup",
      Experiments.dataSizeSweep(spark, Seq(0.05, 0.1, 0.2, 0.4)))
  }
}

/** Figure 6: VerdictDB versus a tightly-integrated AQP engine. */
object IntegratedCompareJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("integrated")
    val env   = BenchData.standardEnv(spark, JobUtil.sfArg(args))
    JobUtil.table("query verdictMs integratedMs sampleJoin",
      Experiments.integratedCompare(env, Workloads.all.filter(_.expectAqp)))
  }
}

/** Table 2: sampling-based AQP versus native sketch aggregates. */
object NativeApproxJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("native-approx")
    val env   = BenchData.standardEnv(spark, JobUtil.sfArg(args))
    JobUtil.table("aggregate engine ms relErr%", Experiments.nativeApproxTable(env))
  }
}

/** Figure 7: error-estimation overhead per method and query shape. */
object ErrorOverheadJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("error-overhead")
    val env   = BenchData.standardEnv(spark, JobUtil.sfArg(args))
    JobUtil.table("shape method ms", Experiments.errorEstimationOverhead(env))
  }
}

/** Figure 8: statistical correctness of the error estimates. */
object CorrectnessJob {
  def main(args: Array[String]): Unit = {
    JobUtil.table("selectivity truth% mean% p5% p95%",
      Experiments.correctnessSelectivity(Seq(0.001, 0.01, 0.1, 0.5)))
    JobUtil.table("n method mean% p5% p95% truth%",
      Experiments.correctnessMethods(Seq(10000, 100000, 1000000)))
  }
}

/** Figures 12/13: time-error tradeoff across n and b. */
object TradeoffJob {
  def main(args: Array[String]): Unit = {
    JobUtil.table("n b method boundRelErr% latencyMs",
      Experiments.tradeoff(Seq(10000, 31600, 100000), Seq(1000)))
    JobUtil.table("n b method boundRelErr% latencyMs",
      Experiments.tradeoff(Seq(100000), Seq(10, 31, 100, 316, 1000)))
  }
}

/** Figure 14: effect of the subsample size n_s. */
object SubsampleSizeJob {
  def main(args: Array[String]): Unit = {
    JobUtil.table("exponent ns b boundRelErr%", Experiments.subsampleSizeSweep())
  }
}

/** Figure 11: sample preparation time versus data preparation time. */
object SamplePrepJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("sample-prep")
    val env   = BenchData.standardEnv(spark, JobUtil.sfArg(args))
    JobUtil.table("task ms", Experiments.samplePrepTime(env))
  }
}

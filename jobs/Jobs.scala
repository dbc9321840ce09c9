package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.tables._

/** spark-submit entrypoints, one per reproduced table/figure.
  *
  * Usage: spark-submit --class repro.jobs.<Name> target/scala-2.13/repro_*.jar [args]
  * Each prints the paper-style table to stdout; the bench suites run the same
  * code with shape assertions.
  */
object JobUtil {
  /** Session for the distributed jobs (quality jobs are driver-only). */
  def session(app: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }

  def intArg(args: Array[String], i: Int, default: Int): Int =
    if (args.length > i) args(i).toInt else default
}

/** Table 1 (kNN accuracy/robustness). args: [runs=30] */
object Table1KnnJob {
  def main(args: Array[String]): Unit = {
    val runs = JobUtil.intArg(args, 0, 30)
    println(s"Table 1 — kNN accuracy & robustness ($runs runs)")
    println(Table1Knn.render(Table1Knn.compute(runs)))
  }
}

/** §6.2 varying batch sizes (kNN). args: [runs=30] */
object VaryingBatchKnnJob {
  def main(args: Array[String]): Unit = {
    val runs = JobUtil.intArg(args, 0, 30)
    println(s"Varying batch size — kNN, lambda=0.07, P(10,10) ($runs runs)")
    println(VaryingBatchKnn.render(VaryingBatchKnn.compute(runs)))
  }
}

/** §6.3 linear regression (Fig 12). args: [runs=30] */
object RegressionJob {
  def main(args: Array[String]): Unit = {
    val runs = JobUtil.intArg(args, 0, 30)
    println(s"Linear regression — MSE & 10% ES ($runs runs)")
    println(RegressionTables.render(RegressionTables.compute(runs)))
  }
}

/** §6.4 Naive Bayes on synthetic Usenet2 (Fig 13). args: [runs=30] */
object NaiveBayesJob {
  def main(args: Array[String]): Unit = {
    val runs = JobUtil.intArg(args, 0, 30)
    println(s"Naive Bayes — Miss% & 20% ES ($runs runs)")
    println(NaiveBayesTable.render(NaiveBayesTable.compute(runs)))
  }
}

/** Figure 1 (sample-size behaviour T-TBS vs R-TBS). args: [horizon=600] */
object SampleSizeJob {
  def main(args: Array[String]): Unit = {
    val horizon = JobUtil.intArg(args, 0, 600)
    println(s"Figure 1 — sample-size behaviour (horizon=$horizon)")
    println(SampleSizeTable.render(SampleSizeTable.compute(horizon)))
  }
}

/** Figure 7 (per-batch runtime of the five implementations). args: [batchSize=100000] [rounds=10] */
object RuntimeJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("runtime")
    val batchSize = JobUtil.intArg(args, 0, 100000)
    val rounds = JobUtil.intArg(args, 1, 10)
    println(s"Figure 7 — per-batch runtime (batch=$batchSize, reservoir=${2 * batchSize})")
    println(RuntimeTable.render(RuntimeTable.compute(spark, batchSize, rounds)))
    spark.stop()
  }
}

/** Figures 8/9 (scale-out proxy and scale-up). args: none */
object ScaleJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("scale")
    println(ScaleTable.render("Figure 9 — scale-up (Dist-CP)", ScaleTable.scaleUp(spark)))
    println()
    println(ScaleTable.render("Figure 8 — scale-out proxy (partitions)", ScaleTable.scaleOut(spark)))
    spark.stop()
  }
}

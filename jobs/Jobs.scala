package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench._

/** Shared SparkSession builder for the spark-submit entrypoints. */
object JobSession {
  def create(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** spark-submit entrypoint for paper Table 4 (add over wide relations). */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("rma-table4")
    val attrs = if (args.nonEmpty) args.map(_.toInt).toSeq else Table4.paperAttrs
    BenchUtil.report("table4", Table4.reportTable(Table4.run(spark, attrs)))
    spark.stop()
  }
}

/** spark-submit entrypoint for paper Table 5 (add over sparse relations). */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("rma-table5")
    val rows = if (args.nonEmpty) args(0).toLong else 500000L
    BenchUtil.report("table5", Table5.reportTable(Table5.run(spark, rows), rows))
    spark.stop()
  }
}

/** spark-submit entrypoint for paper Table 6 (qqr, R vs RMA+). */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("rma-table6")
    BenchUtil.report("table6", Table6.reportTable(Table6.run(spark)))
    spark.stop()
  }
}

/** spark-submit entrypoint for paper Table 7 (add + selection vs array DB). */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("rma-table7")
    BenchUtil.report("table7", Table7.reportTable(Table7.run(spark)))
    spark.stop()
  }
}

/** spark-submit entrypoint for paper Figure 14b (transformation share). */
object Fig14Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("rma-fig14")
    BenchUtil.report("fig14", Fig14.reportTable(Fig14.run(spark)))
    spark.stop()
  }
}

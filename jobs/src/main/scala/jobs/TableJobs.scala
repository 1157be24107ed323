package jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.{Table4, Table5, Table6, Table7}

/** spark-submit entrypoints, one per reproduced table. Each prints the
  * measured rows next to the paper's numbers (see EXPERIMENTS.md).
  *
  * Example:
  *   spark-submit --class jobs.Table4Job repro-jobs.jar [scaleFactor]
  */
private object JobSpark {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def sfArg(args: Array[String], default: Double): Double =
    args.headOption.map(_.toDouble).getOrElse(default)
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("fries-table4")
    try println(Table4.format(Table4.run(spark, JobSpark.sfArg(args, 0.02))))
    finally spark.stop()
  }
}

object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("fries-table5")
    try println(Table5.format(Table5.run(spark, JobSpark.sfArg(args, 0.02))))
    finally spark.stop()
  }
}

object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("fries-table6")
    try println(Table6.format(Table6.run(spark, JobSpark.sfArg(args, 0.02))))
    finally spark.stop()
  }
}

object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("fries-table7")
    try println(Table7.format(Table7.run(spark, JobSpark.sfArg(args, 0.001))))
    finally spark.stop()
  }
}

package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.Tables

/** spark-submit entrypoints, one per evaluation table.
  *
  * Usage: spark-submit --class repro.jobs.Table2Job repro.jar [--bench]
  * `--bench` selects the SF≈0.1 inputs; default is the SF≈0.01 test scale.
  */
private object JobSession {
  def create(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def isBench(args: Array[String]): Boolean = args.contains("--bench")
}

object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table1")
    val scales = if (JobSession.isBench(args)) Seq(10, 11, 12, 13, 14) else Seq(8, 9, 10)
    println(Tables.table1(spark, scales))
    spark.stop()
  }
}

object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table2")
    println(Tables.table2(spark, JobSession.isBench(args)))
    spark.stop()
  }
}

object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table3")
    println(Tables.table3(spark, JobSession.isBench(args)))
    spark.stop()
  }
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table4")
    println(Tables.table4(spark, JobSession.isBench(args)))
    spark.stop()
  }
}

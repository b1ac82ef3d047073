package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.Experiments

/** spark-submit entrypoint reproducing Table 6 (dataset statistics).
  * Usage: spark-submit --class repro.jobs.Table6Job repro.jar
  */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("t-crowd-table6")
    try {
      val (_, rendered) = Experiments.table6(spark)
      println(rendered)
    } finally spark.stop()
  }
}

/** Shared session builder for the job entrypoints. */
object JobSession {
  def build(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "8"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}

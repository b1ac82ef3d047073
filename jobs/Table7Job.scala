package repro.jobs

import repro.experiments.Experiments

/** spark-submit entrypoint reproducing Table 7 (truth-inference
  * effectiveness of all 11 methods on the three surrogate datasets).
  * Usage: spark-submit --class repro.jobs.Table7Job repro.jar
  */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("t-crowd-table7")
    try {
      val (_, rendered) = Experiments.table7(spark)
      println(rendered)
    } finally spark.stop()
  }
}

package repro.jobs

import repro.experiments.Experiments

/** spark-submit entrypoint for the online-assignment experiments:
  * Figure 5 (assignment heuristics) and Figure 2 (end-to-end systems),
  * rendered as tables.
  * Usage: spark-submit --class repro.jobs.AssignmentJob repro.jar [rows] [maxAvg]
  */
object AssignmentJob {
  def main(args: Array[String]): Unit = {
    val rows = args.headOption.map(_.toInt).getOrElse(48)
    val maxAvg = args.lift(1).map(_.toDouble).getOrElse(3.0)
    val spark = JobSession.build("t-crowd-assignment")
    try {
      val (_, fig5) = Experiments.assignmentHeuristics(spark, rows, maxAvg)
      println(fig5)
      val (_, fig2) = Experiments.endToEnd(spark, rows, maxAvg)
      println(fig2)
    } finally spark.stop()
  }
}

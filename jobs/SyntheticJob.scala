package repro.jobs

import repro.experiments.Experiments

/** spark-submit entrypoint for the synthetic experiments of §6.5/§6.6:
  * the Fig. 7/8/9 parameter sweeps, the Fig. 10 noise study, and the
  * Fig. 12b throughput measurement, rendered as tables.
  * Usage: spark-submit --class repro.jobs.SyntheticJob repro.jar
  */
object SyntheticJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("t-crowd-synthetic")
    try {
      val mSweep = Seq(5, 10, 20).map { m =>
        s"M=$m" -> Experiments.sweepPoint(spark, Experiments.sweepConfig(m, 0.5, 1.0))
      }
      println(Experiments.renderSweep("Figure 7 (as table): effect of #columns", mSweep))

      val rSweep = Seq(0.0, 0.5, 1.0).map { r =>
        s"R=$r" -> Experiments.sweepPoint(spark, Experiments.sweepConfig(10, r, 1.0))
      }
      println(Experiments.renderSweep("Figure 8 (as table): effect of categorical ratio", rSweep))

      val dSweep = Seq(0.5, 1.0, 3.0).map { d =>
        s"mu=$d" -> Experiments.sweepPoint(spark, Experiments.sweepConfig(10, 0.5, d))
      }
      println(Experiments.renderSweep("Figure 9 (as table): effect of average difficulty", dSweep))

      val (_, noiseTable) = Experiments.noise(spark)
      println(noiseTable)

      val (_, tpTable) = Experiments.throughput(spark)
      println(tpTable)
    } finally spark.stop()
  }
}

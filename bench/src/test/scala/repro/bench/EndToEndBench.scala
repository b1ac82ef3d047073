package repro.bench

import repro.CrowdSpec
import repro.core.SimPoint
import repro.experiments.Experiments

/** Reproduces Figure 2 (as a table): end-to-end systems on a
  * Restaurant-shaped surrogate — T-Crowd (structure-aware IG + T-Crowd
  * inference) vs CDAS, AskIt! (both MV/median-based), and CRH/CATD with
  * random assignment. The paper's claims: every system improves with more
  * answers; T-Crowd ends best on both measures; CRH/CATD beat CDAS/AskIt
  * because their inference is stronger.
  */
class EndToEndBench extends CrowdSpec {

  private lazy val (traces, rendered) = Experiments.endToEnd(spark)

  private def last(name: String): SimPoint = traces(name).last

  test("Figure 2 table renders and is archived") {
    println(rendered)
    Experiments.writeReport("fig2_end_to_end.txt", rendered)
    assert(traces.keySet == Set("T-Crowd", "CDAS", "AskIt", "CRH", "CATD"))
  }

  test("every system reaches the answer budget") {
    traces.values.foreach(pts => assert(pts.last.avgAnswersPerTask >= 2.5))
  }

  test("T-Crowd ends with the best error rate (within slack)") {
    val best = traces.values.map(_.last.errorRate).min
    assert(last("T-Crowd").errorRate <= best + 0.03)
  }

  test("T-Crowd ends with the best MNAD (within slack)") {
    val best = traces.values.map(_.last.mnad).min
    assert(last("T-Crowd").mnad <= best + 0.05)
  }

  test("T-Crowd beats the MV/median systems (CDAS, AskIt) on final error rate") {
    for (sys <- Seq("CDAS", "AskIt"))
      assert(last("T-Crowd").errorRate <= last(sys).errorRate + 1e-9, sys)
  }

  test("quality-aware inference (CRH/CATD) ends ahead of CDAS on MNAD") {
    for (sys <- Seq("CRH", "CATD"))
      assert(last(sys).mnad <= last("CDAS").mnad + 0.1, sys)
  }

  test("all systems improve over their seeding-round metrics") {
    traces.foreach { case (name, pts) =>
      assert(pts.last.mnad <= pts.head.mnad + 0.1, name)
      assert(pts.last.errorRate <= pts.head.errorRate + 0.1, name)
    }
  }
}

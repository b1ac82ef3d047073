package repro.bench

import repro.CrowdSpec
import repro.core.SimPoint
import repro.experiments.Experiments

/** Reproduces Figure 5 (as a table): the five assignment heuristics —
  * Random, Looping, Entropy, Inherent IG, Structure-aware IG — all backed by
  * T-Crowd inference, on a Restaurant-shaped surrogate. The paper's claims:
  * informed strategies converge faster than Random/Looping; Entropy is
  * datatype-biased (fast MNAD, slow error rate); Struct IG converges at
  * least as fast as Inherent IG on MNAD.
  */
class AssignmentHeuristicsBench extends CrowdSpec {

  private lazy val (traces, rendered) = Experiments.assignmentHeuristics(spark)

  private def auc(pts: Seq[SimPoint], f: SimPoint => Double): Double =
    pts.map(f).sum / pts.size

  test("Figure 5 table renders and is archived") {
    println(rendered)
    Experiments.writeReport("fig5_heuristics.txt", rendered)
    assert(traces.keySet == Set("Random", "Looping", "Entropy", "Inherent IG", "Struct IG"))
  }

  test("every heuristic reaches the answer budget") {
    traces.values.foreach(pts => assert(pts.last.avgAnswersPerTask >= 2.5))
  }

  test("metrics improve from the seeding round for every heuristic") {
    traces.foreach { case (name, pts) =>
      assert(pts.last.mnad <= pts.head.mnad + 0.1, name)
      assert(pts.last.errorRate <= pts.head.errorRate + 0.1, name)
    }
  }

  test("Struct IG converges at least as fast as Random (mean error across checkpoints)") {
    assert(auc(traces("Struct IG"), _.errorRate) <= auc(traces("Random"), _.errorRate) + 0.02)
  }

  test("Struct IG converges at least as fast as Random on MNAD") {
    assert(auc(traces("Struct IG"), _.mnad) <= auc(traces("Random"), _.mnad) + 0.05)
  }

  test("information-gain strategies beat Looping on mean MNAD") {
    for (ig <- Seq("Inherent IG", "Struct IG"))
      assert(auc(traces(ig), _.mnad) <= auc(traces("Looping"), _.mnad) + 0.05, ig)
  }

  test("Entropy reduces MNAD fast (its continuous bias)") {
    // by the second checkpoint Entropy's MNAD is already near Random's final
    val entropySecond = traces("Entropy").take(3).map(_.mnad).min
    assert(entropySecond <= traces("Random").last.mnad + 0.15)
  }

  test("final estimates of all heuristics are usable (error < 0.5, mnad < 1.5)") {
    traces.foreach { case (name, pts) =>
      assert(pts.last.errorRate < 0.5, name)
      assert(pts.last.mnad < 1.5, name)
    }
  }
}

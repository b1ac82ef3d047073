package repro.baselines

import org.apache.spark.sql.functions._
import repro.core._

/** CRH [18]: heterogeneous truth discovery by loss minimization. Alternates
  * (a) truth update — weighted vote for categorical cells, weighted mean for
  * continuous cells — and (b) source-weight update
  * `w_u = ln(sum_u' d_u' / d_u)` where `d_u` is u's total loss (0/1 loss on
  * categorical, squared loss on z-normalized continuous values — the z-step
  * realizes CRH's per-column loss normalization).
  */
final case class Crh(iters: Int = 10) extends InferenceMethod {
  val name = "CRH"

  def infer(ds: CrowdDataset): Seq[TruthCell] = {
    val (norm, stats) = BaselineUtil.normalized(ds)
    val ans = norm.cache()
    ans.count()
    val workers = ans.select("worker").distinct().collect().map(_.getInt(0))
    var weights: Map[Int, Double] = workers.map(_ -> 1.0).toMap

    var catEst: Map[(Int, Int), Int] = Map.empty
    var contEst: Map[(Int, Int), Double] = Map.empty

    var it = 0
    while (it < iters) {
      val w = weights
      val wUdf = udf { (u: Int) => w(u) }
      val withW = ans.withColumn("w", wUdf(col("worker")))
      catEst = BaselineUtil.weightedVote(withW.filter(col("isCat")))
      contEst = BaselineUtil.weightedMean(withW.filter(!col("isCat")))

      val ce = catEst; val qe = contEst
      val lossUdf = udf { (i: Int, j: Int, v: Double, isCat: Boolean) =>
        if (isCat) { if (ce((i, j)) == v.toInt) 0.0 else 1.0 }
        else { val d = v - qe((i, j)); d * d }
      }
      val d = ans
        .withColumn("loss", lossUdf(col("row"), col("col"), col("value"), col("isCat")))
        .groupBy("worker").agg(sum("loss").as("d"))
        .collect()
        .map(r => r.getInt(0) -> math.max(r.getDouble(1), 1e-6))
        .toMap
      val total = d.values.sum
      weights = d.map { case (u, du) => u -> math.log(total / du) }
      it += 1
    }
    ans.unpersist()
    BaselineUtil.assemble(ds, catEst, contEst, stats)
  }
}

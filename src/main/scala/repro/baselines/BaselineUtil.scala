package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._

/** Shared plumbing for the baseline truth-inference methods.
  *
  * Like T-Crowd (DESIGN.md §6), every baseline works on z-normalized
  * continuous values so that a single per-worker weight/variance is
  * meaningful across columns of different scales, and denormalizes its point
  * estimates on output.
  */
object BaselineUtil {

  /** Answers with continuous values z-normalized and an `isCat` flag. */
  def normalized(ds: CrowdDataset): (DataFrame, Map[Int, (Double, Double)]) = {
    val stats  = Model.continuousStats(ds)
    val catSet = ds.labelCount.filter(_._2 > 0).keySet
    val normUdf = udf { (c: Int, v: Double) =>
      stats.get(c) match {
        case Some((mu, sd)) => (v - mu) / sd
        case None           => v
      }
    }
    val df = ds.answers.select(
      col("worker"), col("row"), col("col"),
      normUdf(col("col"), col("value")).as("value"),
      col("col").isin(catSet.toSeq: _*).as("isCat"))
    (df, stats)
  }

  /** Map normalized continuous estimates back to raw scale. */
  def denormalize(cells: Seq[TruthCell], stats: Map[Int, (Double, Double)]): Seq[TruthCell] =
    cells.map { c =>
      stats.get(c.col) match {
        case Some((mu, sd)) => c.copy(value = c.value * sd + mu)
        case None           => c
      }
    }

  /** Weighted label vote: per categorical cell, the label with the largest
    * total weight (ties to the smallest label, deterministically). Input must
    * be pre-filtered to categorical answers and carry a `w` column.
    */
  def weightedVote(catAnswers: DataFrame): Map[(Int, Int), Int] =
    catAnswers
      .groupBy("row", "col", "value")
      .agg(sum("w").as("sw"))
      .collect()
      .groupBy(r => (r.getInt(0), r.getInt(1)))
      .map { case (cell, rs) =>
        cell -> rs.map(r => (r.getDouble(2).toInt, r.getDouble(3)))
          .minBy { case (lbl, sw) => (-sw, lbl) }._1
      }

  /** Weighted mean per continuous cell. Input must be pre-filtered to
    * continuous answers and carry a `w` column.
    */
  def weightedMean(contAnswers: DataFrame): Map[(Int, Int), Double] =
    contAnswers
      .groupBy("row", "col")
      .agg(sum(expr("w * value")).as("swv"), sum("w").as("sw"))
      .collect()
      .map(r => (r.getInt(0), r.getInt(1)) -> r.getDouble(2) / math.max(r.getDouble(3), 1e-12))
      .toMap

  /** Assemble denormalized point estimates from per-cell maps. */
  def assemble(ds: CrowdDataset,
               catEst: Map[(Int, Int), Int],
               contEst: Map[(Int, Int), Double],
               stats: Map[Int, (Double, Double)]): Seq[TruthCell] = {
    val cat  = catEst.map { case ((i, j), z) => TruthCell(i, j, z.toDouble) }.toSeq
    val cont = denormalize(
      contEst.map { case ((i, j), v) => TruthCell(i, j, v) }.toSeq, stats)
    cat ++ cont
  }
}

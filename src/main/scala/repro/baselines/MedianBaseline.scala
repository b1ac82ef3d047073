package repro.baselines

import org.apache.spark.sql.functions._
import repro.core._

/** Median (Table 7 "Median"): per continuous cell, the exact median of the
  * workers' answers. Robust to spammers but worker-quality-blind.
  */
object MedianBaseline extends InferenceMethod {
  val name = "Median"

  def infer(ds: CrowdDataset): Seq[TruthCell] = {
    val contCols = ds.continuousCols.map(_.col)
    if (contCols.isEmpty) return Seq.empty
    ds.answers
      .filter(col("col").isin(contCols: _*))
      .groupBy("row", "col")
      .agg(expr("percentile(value, 0.5)").as("med"))
      .collect()
      .map(r => TruthCell(r.getInt(0), r.getInt(1), r.getDouble(2)))
      .toSeq
  }
}

package repro.metrics

import repro.CrowdSpec
import repro.Oracle
import repro.core._
import org.apache.spark.sql.functions._

class MetricsSpec extends CrowdSpec {

  private def ds: CrowdDataset = {
    val cols = Seq(ColumnSpec(0, "cat", 3), ColumnSpec(1, "x", 0), ColumnSpec(2, "y", 0))
    val answers = Seq(
      Answer(0, 0, 0, 0.0), Answer(1, 0, 0, 1.0),
      Answer(0, 1, 0, 2.0), Answer(1, 1, 0, 2.0),
      Answer(0, 0, 1, 10.0), Answer(1, 0, 1, 14.0),
      Answer(0, 1, 1, 6.0), Answer(1, 1, 1, 8.0),
      Answer(0, 0, 2, 100.0), Answer(1, 0, 2, 120.0),
      Answer(0, 1, 2, 90.0), Answer(1, 1, 2, 95.0),
    )
    val truth = Seq(
      TruthCell(0, 0, 0.0), TruthCell(1, 0, 2.0),
      TruthCell(0, 1, 12.0), TruthCell(1, 1, 7.0),
      TruthCell(0, 2, 110.0), TruthCell(1, 2, 92.0),
    )
    CrowdDataset("m", Model.answersDf(spark, answers), cols, Model.truthDf(spark, truth))
  }

  test("errorRate: perfect estimates give 0") {
    val est = Seq(TruthCell(0, 0, 0.0), TruthCell(1, 0, 2.0))
    assert(Metrics.errorRate(ds, est) == 0.0)
  }

  test("errorRate: one of two wrong gives 0.5") {
    val est = Seq(TruthCell(0, 0, 1.0), TruthCell(1, 0, 2.0))
    assert(Metrics.errorRate(ds, est) == 0.5)
  }

  test("errorRate: all wrong gives 1.0") {
    val est = Seq(TruthCell(0, 0, 1.0), TruthCell(1, 0, 0.0))
    assert(Metrics.errorRate(ds, est) == 1.0)
  }

  test("errorRate ignores continuous cells in the estimate set") {
    val est = Seq(TruthCell(0, 0, 0.0), TruthCell(1, 0, 2.0),
                  TruthCell(0, 1, 999.0), TruthCell(1, 2, -1.0))
    assert(Metrics.errorRate(ds, est) == 0.0)
  }

  test("errorRate is NaN without categorical columns") {
    val d = ds
    val contOnly = d.restrictTo(d.continuousCols, "cont")
    assert(Metrics.errorRate(contOnly, Seq(TruthCell(0, 1, 1.0))).isNaN)
  }

  test("mnad: exact estimates give 0") {
    val est = Seq(TruthCell(0, 1, 12.0), TruthCell(1, 1, 7.0),
                  TruthCell(0, 2, 110.0), TruthCell(1, 2, 92.0))
    assert(Metrics.mnad(ds, est) == 0.0)
  }

  test("mnad matches hand computation (per-column RMSE / answer std, averaged)") {
    val d = ds
    // col 1: answers {10,14,6,8} mean 9.5, std_pop = sqrt(8.75)
    // estimates off by +1 on both cells -> RMSE 1
    // col 2: answers {100,120,90,95} mean 101.25, var_pop = 129.6875
    // estimates off by (2, -2) -> RMSE 2
    val est = Seq(TruthCell(0, 1, 13.0), TruthCell(1, 1, 8.0),
                  TruthCell(0, 2, 112.0), TruthCell(1, 2, 90.0))
    val sd1 = math.sqrt(8.75)
    val sd2 = math.sqrt(129.6875)
    val expected = (1.0 / sd1 + 2.0 / sd2) / 2
    assert(math.abs(Metrics.mnad(d, est) - expected) < 1e-9)
  }

  test("mnad is NaN without continuous columns") {
    val d = ds
    val catOnly = d.restrictTo(d.categoricalCols, "cat")
    assert(Metrics.mnad(catOnly, Seq(TruthCell(0, 0, 0.0))).isNaN)
  }

  test("evaluate returns both measures at once") {
    val est = Seq(TruthCell(0, 0, 0.0), TruthCell(1, 0, 0.0),
                  TruthCell(0, 1, 12.0), TruthCell(1, 1, 7.0),
                  TruthCell(0, 2, 110.0), TruthCell(1, 2, 92.0))
    val (er, mn) = Metrics.evaluate(ds, est)
    assert(er == 0.5)
    assert(mn == 0.0)
  }

  test("errorRate join agrees with DuckDB oracle") {
    val d = ds
    val est = Model.truthDf(spark, Seq(TruthCell(0, 0, 1.0), TruthCell(1, 0, 2.0)))
      .withColumnRenamed("value", "est")
    val joined = d.truth.filter(col("col") === 0)
      .join(est, Seq("row", "col"))
      .select(col("row"), col("col"),
        when(col("value") =!= col("est"), 1.0).otherwise(0.0).as("wrong"))
    Oracle.assertEquivalent(
      joined,
      """SELECT t.row, t.col,
        |       CASE WHEN CAST(t.value AS DOUBLE) <> CAST(e.est AS DOUBLE)
        |            THEN 1.0 ELSE 0.0 END AS wrong
        |FROM truth t JOIN est e ON t.row = e.row AND t.col = e.col
        |WHERE t.col = '0'""".stripMargin,
      "truth" -> d.truth, "est" -> est)
  }

  test("per-column RMSE aggregation agrees with DuckDB oracle") {
    val d = ds
    val est = Model.truthDf(spark, Seq(
      TruthCell(0, 1, 13.0), TruthCell(1, 1, 8.0),
      TruthCell(0, 2, 112.0), TruthCell(1, 2, 90.0))).withColumnRenamed("value", "est")
    val rmse = d.truth.filter(col("col").isin(1, 2))
      .join(est, Seq("row", "col"))
      .groupBy("col")
      .agg(sqrt(avg(pow(col("value") - col("est"), 2))).as("rmse"))
    Oracle.assertEquivalent(
      rmse,
      """SELECT t.col, sqrt(avg(pow(CAST(t.value AS DOUBLE) - CAST(e.est AS DOUBLE), 2))) AS rmse
        |FROM truth t JOIN est e ON t.row = e.row AND t.col = e.col
        |WHERE t.col IN ('1','2') GROUP BY t.col""".stripMargin,
      "truth" -> d.truth, "est" -> est)
  }
}

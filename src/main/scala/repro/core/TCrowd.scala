package repro.core

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.MathUtil._

/** Configuration of the T-Crowd EM truth-inference algorithm (paper §4).
  *
  * @param eps       half-width of the "close enough" band that maps a
  *                  variance to a quality `q_u = erf(eps/sqrt(2 phi))`;
  *                  interpreted in z-normalized answer space (DESIGN.md §6)
  * @param maxIters  cap on EM iterations (paper observes w < 20)
  * @param gdSteps   gradient-ascent steps per M-step (paper observes v < 20;
  *                  a handful suffice because the E-step re-centers targets)
  * @param lr        gradient-ascent learning rate on log-parameters
  * @param tol       EM convergence threshold on max log-parameter change
  * @param priorVar  variance `phi_j^0` of the per-column truth prior in
  *                  normalized space (mean is 0 by construction)
  * @param learnDifficulty when false, row/column difficulties are pinned at 1
  *                  (used by ablations and by unit tests isolating phi)
  */
final case class TCrowdConfig(
    eps: Double = 1.0,
    maxIters: Int = 15,
    gdSteps: Int = 5,
    lr: Double = 0.4,
    tol: Double = 5e-3,
    priorVar: Double = 4.0,
    learnDifficulty: Boolean = true,
)

/** Output of T-Crowd inference.
  *
  * Posteriors are kept as driver-side snapshots (the paper's tables are a
  * few thousand cells) because the assignment module (paper §5) needs
  * constant-time per-cell lookups when scoring candidate tasks; `estimates`
  * re-exposes the point estimates as a DataFrame for the metric aggregations.
  *
  * @param contPosterior (row,col) -> (mu, var) of the truth posterior in
  *                      normalized space
  * @param catPosterior  (row,col) -> label distribution (index = label)
  * @param phi           worker variance (normalized space)
  * @param alpha         row difficulty, geometric mean 1
  * @param beta          column difficulty, geometric mean 1
  * @param contStats     per-column (mean, std) used for normalization
  */
final case class TCrowdResult(
    estimatesLocal: Seq[TruthCell],
    contPosterior: Map[(Int, Int), (Double, Double)],
    catPosterior: Map[(Int, Int), Array[Double]],
    phi: Map[Int, Double],
    alpha: Map[Int, Double],
    beta: Map[Int, Double],
    contStats: Map[Int, (Double, Double)],
    eps: Double,
    iterations: Int,
    converged: Boolean,
) {
  /** Unified worker quality `q_u = erf(eps/sqrt(2 phi_u))` (paper Eq. 2). */
  def workerQuality: Map[Int, Double] = phi.map { case (u, p) => u -> quality(eps, p) }

  /** Per-cell quality `q_ij^u = erf(eps/sqrt(2 alpha_i beta_j phi_u))`. */
  def cellQuality(u: Int, row: Int, colIdx: Int): Double =
    quality(eps, cellVariance(u, row, colIdx))

  /** Answer variance `alpha_i * beta_j * phi_u` of worker u on a cell. */
  def cellVariance(u: Int, row: Int, colIdx: Int): Double =
    alpha.getOrElse(row, 1.0) * beta.getOrElse(colIdx, 1.0) * phi.getOrElse(u, 1.0)

  /** Point estimates as a DataFrame `(row, col, est)` for metric joins. */
  def estimates(spark: SparkSession): DataFrame =
    Model.truthDf(spark, estimatesLocal).withColumnRenamed("value", "est")
}

/** T-Crowd truth inference (paper §4): EM over a unified worker model.
  *
  * Spark layout (DESIGN.md §6): the normalized answer relation is a cached
  * DataFrame; each E-step is a `groupBy(row,col)` aggregation; each M-step
  * gradient step is one aggregation over per-answer gradient contributions
  * exploded to their (worker | row | col) parameter keys. The small
  * parameter vectors round-trip through the driver between steps, which
  * bounds lineage depth without checkpointing.
  */
object TCrowd {

  def infer(ds: CrowdDataset, cfg: TCrowdConfig = TCrowdConfig()): TCrowdResult = {
    val spark = ds.answers.sparkSession
    val labelCount = ds.labelCount.filter(_._2 > 0)
    val catColSet  = labelCount.keySet
    val stats      = Model.continuousStats(ds)

    // --- normalized, typed answer relation (cached once) ------------------
    val normUdf = udf { (c: Int, v: Double) =>
      stats.get(c) match {
        case Some((mu, sd)) => (v - mu) / sd
        case None           => v
      }
    }
    val ans = ds.answers
      .select(col("worker"), col("row"), col("col"),
              normUdf(col("col"), col("value")).as("value"),
              col("col").isin(catColSet.toSeq.map(_.asInstanceOf[Any]): _*).as("isCat"))
      .cache()
    ans.count() // materialize

    val workers = ans.select("worker").distinct().collect().map(_.getInt(0))
    val rows    = ans.select("row").distinct().collect().map(_.getInt(0))
    val cols    = ds.columns.map(_.col)

    var lnPhi   = workers.map(_ -> 0.0).toMap
    var lnAlpha = rows.map(_ -> 0.0).toMap
    var lnBeta  = cols.map(_ -> 0.0).toMap

    def lnS(u: Int, i: Int, j: Int): Double =
      lnAlpha.getOrElse(i, 0.0) + lnBeta.getOrElse(j, 0.0) + lnPhi.getOrElse(u, 0.0)

    // --- E-step -----------------------------------------------------------
    // Continuous: Gaussian posterior with precision weights 1/(alpha beta phi)
    // plus the N(0, priorVar) column prior. Categorical: per-label log-score
    // sum of ln q - ln((1-q)/(L-1)) over supporting answers, softmax over the
    // full label set (unvoted labels score 0 relative — see paper Eq. 4).
    def eStep(): (Map[(Int, Int), (Double, Double)], Map[(Int, Int), Array[Double]]) = {
      val la = lnAlpha; val lb = lnBeta; val lp = lnPhi; val pv = cfg.priorVar
      val wUdf = udf { (u: Int, i: Int, j: Int) =>
        math.exp(-(la.getOrElse(i, 0.0) + lb.getOrElse(j, 0.0) + lp.getOrElse(u, 0.0)))
      }
      val contPost = ans.filter(!col("isCat"))
        .withColumn("w", wUdf(col("worker"), col("row"), col("col")))
        .groupBy("row", "col")
        .agg(sum("w").as("sw"), sum(expr("w * value")).as("swv"))
        .collect()
        .map { r =>
          val sw = r.getDouble(2); val swv = r.getDouble(3)
          val tphi = 1.0 / (sw + 1.0 / pv)
          ((r.getInt(0), r.getInt(1)), (swv * tphi, tphi))
        }.toMap

      val lc = labelCount; val eps = cfg.eps
      val lamUdf = udf { (u: Int, i: Int, j: Int) =>
        val s = math.exp(la.getOrElse(i, 0.0) + lb.getOrElse(j, 0.0) + lp.getOrElse(u, 0.0))
        val q = quality(eps, s)
        val l = lc(j)
        math.log(q) - math.log((1.0 - q) / (l - 1))
      }
      val scored = ans.filter(col("isCat"))
        .withColumn("lam", lamUdf(col("worker"), col("row"), col("col")))
        .groupBy("row", "col", "value")
        .agg(sum("lam").as("score"))
        .collect()
        .groupBy(r => (r.getInt(0), r.getInt(1)))
        .map { case (cell, rs) =>
          cell -> rs.map(r => r.getDouble(2).toInt -> r.getDouble(3)).toMap
        }
      val catPost = scored.map { case (cell @ (_, j), byLabel) =>
        val l = labelCount(j)
        val probs = softmax((0 until l).map(z => byLabel.getOrElse(z, 0.0))).toArray
        cell -> probs
      }
      (contPost, catPost)
    }

    var (contPost, catPost) = eStep()

    // --- EM loop ----------------------------------------------------------
    var iter = 0
    var converged = false
    while (iter < cfg.maxIters && !converged) {
      // M-step sufficient statistics are fixed given the posteriors:
      //   continuous: s = (a - T_mu)^2 + T_phi       (paper Eq. 5 term)
      //   categorical: s = posterior prob of the answered label
      val cp = contPost; val kp = catPost
      val statUdf = udf { (i: Int, j: Int, v: Double, isCat: Boolean) =>
        if (isCat) kp.get((i, j)).map(_.apply(v.toInt)).getOrElse(0.5)
        else {
          val (mu, tphi) = cp((i, j))
          (v - mu) * (v - mu) + tphi
        }
      }
      val statDf = ans
        .withColumn("s", statUdf(col("row"), col("col"), col("value"), col("isCat")))
        .select("worker", "row", "col", "isCat", "s")
        .cache()
      statDf.count()

      var maxDelta = 0.0
      var step = 0
      while (step < cfg.gdSteps) {
        val la = lnAlpha; val lb = lnBeta; val lp = lnPhi; val eps = cfg.eps
        // d/d lnS of the expected log-likelihood of one answer; identical for
        // ln(phi_u), ln(alpha_i), ln(beta_j) since lnS is their sum.
        val gradUdf = udf { (u: Int, i: Int, j: Int, isCat: Boolean, s: Double) =>
          val lnSv = la.getOrElse(i, 0.0) + lb.getOrElse(j, 0.0) + lp.getOrElse(u, 0.0)
          val sVar = math.exp(lnSv)
          if (isCat) {
            val x  = eps / math.sqrt(2.0 * sVar)
            val q  = quality(eps, sVar)
            val dq = -x * math.exp(-x * x) / math.sqrt(math.Pi)
            (s / q - (1.0 - s) / (1.0 - q)) * dq
          } else {
            -0.5 + s / (2.0 * sVar)
          }
        }
        val grads = statDf
          .withColumn("g", gradUdf(col("worker"), col("row"), col("col"), col("isCat"), col("s")))
          .select(explode(array(
            struct(lit("w").as("dim"), col("worker").as("key"), col("g")),
            struct(lit("r").as("dim"), col("row").as("key"), col("g")),
            struct(lit("c").as("dim"), col("col").as("key"), col("g")),
          )).as("x"))
          .select(col("x.dim"), col("x.key"), col("x.g"))
          .groupBy("dim", "key")
          .agg(sum("g").as("sg"), count(lit(1)).as("n"))
          .collect()
          .map(r => (r.getString(0), r.getInt(1)) -> (r.getDouble(2) / r.getLong(3)))
          .toMap

        def upd(m: Map[Int, Double], dim: String, lo: Double, hi: Double): Map[Int, Double] =
          m.map { case (k, v) =>
            val g = grads.getOrElse((dim, k), 0.0)
            val nv = math.min(hi, math.max(lo, v + cfg.lr * g))
            maxDelta = math.max(maxDelta, math.abs(nv - v))
            k -> nv
          }
        lnPhi = upd(lnPhi, "w", -8.0, 3.0)
        if (cfg.learnDifficulty) {
          lnAlpha = upd(lnAlpha, "r", -2.5, 2.5)
          lnBeta  = upd(lnBeta, "c", -2.5, 2.5)
        }
        step += 1
      }
      statDf.unpersist()

      // Identifiability: alpha*beta*phi is scale-degenerate; re-center row and
      // column difficulties to geometric mean 1 and fold the shift into phi
      // (leaves every alpha_i*beta_j*phi_u product unchanged).
      if (cfg.learnDifficulty && lnAlpha.nonEmpty && lnBeta.nonEmpty) {
        val ma = lnAlpha.values.sum / lnAlpha.size
        val mb = lnBeta.values.sum / lnBeta.size
        lnAlpha = lnAlpha.map { case (k, v) => k -> (v - ma) }
        lnBeta  = lnBeta.map { case (k, v) => k -> (v - mb) }
        lnPhi   = lnPhi.map { case (k, v) => k -> math.min(3.0, math.max(-8.0, v + ma + mb)) }
      }

      val (ncp, nkp) = eStep()
      contPost = ncp; catPost = nkp
      iter += 1
      converged = maxDelta < cfg.tol
    }
    ans.unpersist()

    // --- point estimates (denormalized) -----------------------------------
    val est =
      contPost.map { case ((i, j), (mu, _)) =>
        val (m, sd) = stats((j))
        TruthCell(i, j, mu * sd + m)
      }.toSeq ++
      catPost.map { case ((i, j), probs) =>
        TruthCell(i, j, probs.indices.maxBy(probs.apply).toDouble)
      }.toSeq

    TCrowdResult(est, contPost, catPost,
      lnPhi.map { case (k, v) => k -> math.exp(v) },
      lnAlpha.map { case (k, v) => k -> math.exp(v) },
      lnBeta.map { case (k, v) => k -> math.exp(v) },
      stats, cfg.eps, iter, converged)
  }

  /** TC-onlyCate of Table 7: T-Crowd restricted to categorical columns. */
  def inferOnlyCategorical(ds: CrowdDataset, cfg: TCrowdConfig = TCrowdConfig()): TCrowdResult =
    infer(ds.restrictTo(ds.categoricalCols, "onlyCate"), cfg)

  /** TC-onlyCont of Table 7: T-Crowd restricted to continuous columns. */
  def inferOnlyContinuous(ds: CrowdDataset, cfg: TCrowdConfig = TCrowdConfig()): TCrowdResult =
    infer(ds.restrictTo(ds.continuousCols, "onlyCont"), cfg)
}

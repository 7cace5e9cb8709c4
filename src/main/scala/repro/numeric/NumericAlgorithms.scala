package repro.numeric

import repro.baselines.{LcaInference, VoteInference}
import repro.core.{NumericDataset, TdhHyper, TdhLocal}
import repro.data.AnswerLog

/** The numeric truth-discovery algorithms of Table 6. The candidate-choosing
  * algorithms (TDH, LCA, VOTE) run on the implicit rounding-hierarchy views;
  * the averaging algorithms (MEAN, CRH, CATD) operate on the raw numeric
  * claims and are exposed here directly.
  */
object NumericAlgorithms {

  /** TDH on the implicit rounding hierarchy (§3.2 extension). */
  def tdh(ds: NumericDataset, hyper: TdhHyper = TdhHyper()): Array[Double] = {
    val res = TdhLocal.run(ds.views, new AnswerLog(ds.numObjects), hyper)
    ds.estimates(res.truthIdx)
  }

  /** GuessLCA treating each distinct decimal string as a categorical value. */
  def lca(ds: NumericDataset): Array[Double] = {
    val st = new LcaInference().infer(ds.views, new AnswerLog(ds.numObjects))
    ds.estimates(st.truthIdx)
  }

  /** Majority vote over exact decimal strings. */
  def vote(ds: NumericDataset): Array[Double] = {
    val st = new VoteInference().infer(ds.views, new AnswerLog(ds.numObjects))
    ds.estimates(st.truthIdx)
  }

  /** Baseline MEAN: per-object average of the claimed numeric values. */
  def mean(ds: NumericDataset): Array[Double] =
    Array.tabulate(ds.numObjects) { o =>
      val vals = ds.claims(o).map { case (_, id) => ds.numeric(id) }
      vals.sum / vals.size
    }

  /** CRH (Li et al., SIGMOD 2014) for continuous data: source weights from
    * normalized squared loss, truths re-estimated as the weighted mean.
    */
  def crh(ds: NumericDataset, iterations: Int = 10): Array[Double] = {
    val w = Array.fill(ds.numSources)(1.0)
    var truth = mean(ds)
    // per-object scale for loss normalization (std of claims, floored)
    val scale = Array.tabulate(ds.numObjects) { o =>
      val vals = ds.claims(o).map { case (_, id) => ds.numeric(id) }
      val m = vals.sum / vals.size
      math.max(1e-6, math.sqrt(vals.map(v => (v - m) * (v - m)).sum / vals.size))
    }
    for (_ <- 1 to iterations) {
      // weights
      val loss = Array.fill(ds.numSources)(0.0)
      for (o <- 0 until ds.numObjects; (s, id) <- ds.claims(o)) {
        val d = (ds.numeric(id) - truth(o)) / scale(o)
        loss(s) += d * d
      }
      val total = math.max(1e-9, loss.sum)
      for (s <- 0 until ds.numSources)
        w(s) = -math.log(math.max(1e-9, (loss(s) + 1e-6) / (total + 1e-6 * ds.numSources)))
      // truths
      truth = Array.tabulate(ds.numObjects) { o =>
        var num = 0.0; var den = 0.0
        ds.claims(o).foreach { case (s, id) =>
          val wt = math.max(1e-9, w(s)); num += wt * ds.numeric(id); den += wt
        }
        num / den
      }
    }
    truth
  }

  /** CATD (Li et al., PVLDB 2014): confidence-aware weights
    * w_s = χ²(0.975, n_s) / Σ_o (v_s,o − t_o)², truths as weighted means.
    */
  def catd(ds: NumericDataset, iterations: Int = 5): Array[Double] = {
    var truth = mean(ds)
    val nClaims = Array.fill(ds.numSources)(0)
    for (o <- 0 until ds.numObjects; (s, _) <- ds.claims(o)) nClaims(s) += 1
    for (_ <- 1 to iterations) {
      val sqErr = Array.fill(ds.numSources)(1e-9)
      for (o <- 0 until ds.numObjects; (s, id) <- ds.claims(o)) {
        val d = ds.numeric(id) - truth(o)
        sqErr(s) += d * d
      }
      val w = Array.tabulate(ds.numSources)(s => chiSquareQuantile(0.975, math.max(1, nClaims(s))) / sqErr(s))
      truth = Array.tabulate(ds.numObjects) { o =>
        var num = 0.0; var den = 0.0
        ds.claims(o).foreach { case (s, id) => num += w(s) * ds.numeric(id); den += w(s) }
        num / den
      }
    }
    truth
  }

  /** Wilson–Hilferty approximation of the χ² quantile. */
  def chiSquareQuantile(p: Double, k: Int): Double = {
    val z = normalQuantile(p)
    val a = 2.0 / (9.0 * k)
    k * math.pow(1 - a + z * math.sqrt(a), 3)
  }

  /** Acklam-style rational approximation of the standard normal quantile. */
  def normalQuantile(p: Double): Double = {
    require(p > 0 && p < 1)
    // Beasley-Springer-Moro
    val a = Array(2.50662823884, -18.61500062529, 41.39119773534, -25.44106049637)
    val b = Array(-8.47351093090, 23.08336743743, -21.06224101826, 3.13082909833)
    val c = Array(0.3374754822726147, 0.9761690190917186, 0.1607979714918209,
      0.0276438810333863, 0.0038405729373609, 0.0003951896511919,
      0.0000321767881768, 0.0000002888167364, 0.0000003960315187)
    val y = p - 0.5
    if (math.abs(y) < 0.42) {
      val r = y * y
      y * (((a(3) * r + a(2)) * r + a(1)) * r + a(0)) /
        ((((b(3) * r + b(2)) * r + b(1)) * r + b(0)) * r + 1)
    } else {
      val r0 = if (y > 0) 1 - p else p
      val r = math.log(-math.log(r0))
      val x = c.zipWithIndex.map { case (ci, i) => ci * math.pow(r, i) }.sum
      if (y < 0) -x else x
    }
  }
}

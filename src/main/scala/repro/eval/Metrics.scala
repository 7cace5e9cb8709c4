package repro.eval

import repro.data.TdDataset
import repro.hier.Hierarchy

/** Quality measures from §5 of the paper. */
object Metrics {

  /** Accuracy = fraction of objects whose estimate equals the (mapped) gold. */
  def accuracy(ds: TdDataset, estimate: Array[Int]): Double = {
    val g = ds.mappedGold
    estimate.indices.count(o => estimate(o) == g(o)).toDouble / estimate.length
  }

  /** GenAccuracy = fraction whose estimate is the gold or one of its
    * (non-root) ancestors.
    */
  def genAccuracy(ds: TdDataset, estimate: Array[Int]): Double = {
    val h = ds.hierarchy
    val g = ds.mappedGold
    estimate.indices.count { o =>
      estimate(o) == g(o) || (estimate(o) != h.root && h.isAncestor(estimate(o), g(o)))
    }.toDouble / estimate.length
  }

  /** AvgDistance = mean number of tree edges between estimate and gold. */
  def avgDistance(ds: TdDataset, estimate: Array[Int]): Double = {
    val h = ds.hierarchy
    val g = ds.mappedGold
    estimate.indices.map(o => distanceOrDefault(h, estimate(o), g(o))).sum.toDouble / estimate.length
  }

  private def distanceOrDefault(h: Hierarchy, u: Int, v: Int): Int =
    if (u < 0 || v < 0 || u >= h.size || v >= h.size) h.height else h.distance(u, v)

  /** Expand a single value to its multi-truth set {v} ∪ ancestors(v) \ {root}
    * (§5.7: "we treat the ancestors of v and v itself as the multi-truths").
    */
  def multiTruthSet(h: Hierarchy, v: Int): Set[Int] =
    if (v < 0 || v >= h.size) Set(v) else (v :: h.ancestorsNoRoot(v)).toSet

  /** Per-object precision/recall averaged over objects; F1 of the averages.
    * `estimates(o)` is the set of values an algorithm reports as true for o.
    */
  def multiTruthPRF(ds: TdDataset, estimates: Array[Set[Int]]): (Double, Double, Double) = {
    val h = ds.hierarchy
    var pSum = 0.0; var rSum = 0.0
    for (o <- 0 until ds.numObjects) {
      val goldSet = multiTruthSet(h, ds.mappedGold(o))
      val est = estimates(o)
      val hit = est.count(goldSet.contains)
      pSum += (if (est.isEmpty) 0.0 else hit.toDouble / est.size)
      rSum += hit.toDouble / goldSet.size
    }
    val p = pSum / ds.numObjects
    val r = rSum / ds.numObjects
    val f1 = if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    (p, r, f1)
  }

  /** Mean absolute error for numeric truth discovery (Table 6). */
  def mae(gold: Array[Double], est: Array[Double]): Double =
    gold.indices.map(i => math.abs(gold(i) - est(i))).sum / gold.length

  /** Mean relative error |est-gold|/|gold| (Table 6's R/E). Objects with a
    * zero gold value are skipped to keep the ratio defined.
    */
  def relativeError(gold: Array[Double], est: Array[Double]): Double = {
    val terms = gold.indices.filter(i => gold(i) != 0.0)
      .map(i => math.abs(gold(i) - est(i)) / math.abs(gold(i)))
    if (terms.isEmpty) 0.0 else terms.sum / terms.size
  }
}

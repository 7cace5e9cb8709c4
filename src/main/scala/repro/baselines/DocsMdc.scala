package repro.baselines

import repro.core.TdhProb
import repro.data.{AnswerLog, ObjectView}
import repro.hier.Hierarchy

import scala.collection.mutable

/** Shared accuracy-EM machinery: sources/workers have an accuracy parameter
  * (optionally per domain); a correct claim hits the truth, an incorrect one
  * is uniform over the remaining candidates.
  *
  * DOCS (Zheng et al., PVLDB 2016) is the domain-sensitive instance: the
  * paper's knowledge-base domains are substituted with the top-level branches
  * of the hierarchy (children of the root), see DESIGN.md. MDC (Li et al.,
  * WSDM 2017) is instantiated as the single-domain two-coin model — its
  * medical-symptom machinery has no counterpart in this data.
  */
abstract class AccuracyEmInference(
    numDomains: Int => Int,
    domainOf: (Array[ObjectView], Int) => Int,
    maxIters: Int,
) extends TruthInference {

  def infer(views: Array[ObjectView], answers: AnswerLog): InferState = {
    val nObj = views.length
    val dom = Array.tabulate(nObj)(o => domainOf(views, o))

    type Actor = (Boolean, Int)
    val acc = mutable.HashMap.empty[(Actor, Int), Double] // (actor, domain) -> accuracy
    val cnt = mutable.HashMap.empty[(Actor, Int), Int].withDefaultValue(0)
    for (o <- 0 until nObj) {
      val v = views(o)
      v.srcIds.foreach { s => acc(((false, s), dom(o))) = 0.8; cnt(((false, s), dom(o))) += 1 }
      answers.answersFor(o).foreach { case (w, _) =>
        acc(((true, w), dom(o))) = 0.8; cnt(((true, w), dom(o))) += 1
      }
    }

    val mu = Array.tabulate(nObj)(o => Array.fill(views(o).nCands)(1.0 / views(o).nCands))
    var iter = 0
    var delta = Double.MaxValue
    while (iter < maxIters && delta > 1e-6) {
      val hit = mutable.HashMap.empty[(Actor, Int), Double].withDefaultValue(0.0)
      delta = 0.0
      for (o <- 0 until nObj) {
        val view = views(o)
        val n = view.nCands
        val claims: Seq[(Actor, Int)] =
          view.srcIds.indices.map(i => ((false, view.srcIds(i)): Actor, view.srcVals(i))) ++
            answers.answersFor(o).map { case (w, j) => ((true, w): Actor, j) }
        val logMu = new Array[Double](n)
        claims.foreach { case (a, u) =>
          val q = acc((a, dom(o)))
          var v = 0
          while (v < n) {
            val p = if (u == v) q else if (n <= 1) 1e-12 else (1 - q) / (n - 1)
            logMu(v) += math.log(math.max(p, 1e-12))
            v += 1
          }
        }
        val m = logMu.max
        val ex = logMu.map(x => math.exp(x - m))
        val z = ex.sum
        var v = 0
        while (v < n) {
          val next = ex(v) / z
          delta = math.max(delta, math.abs(next - mu(o)(v)))
          mu(o)(v) = next
          v += 1
        }
        claims.foreach { case (a, u) => hit((a, dom(o))) += mu(o)(u) }
      }
      acc.keys.foreach { k =>
        acc(k) = (hit(k) + 1.0) / (cnt(k) + 2.0)
      }
      iter += 1
    }

    val truth = Array.tabulate(nObj)(o => TdhProb.argmaxTruth(views(o), mu(o)))
    // Worker accuracy: claim-weighted mean over domains.
    val workerAcc: Map[Int, Double] = acc.keys.collect { case ((true, w), _) => w }.toSet
      .map { (w: Int) =>
        val ks = acc.keys.filter(_._1 == ((true, w))).toSeq
        val tot = ks.map(k => cnt(k)).sum
        w -> ks.map(k => acc(k) * cnt(k)).sum / math.max(1, tot)
      }.toMap
    InferState(views, mu, truth,
      TruthInference.uniformAnswerProb(views, w => workerAcc.getOrElse(w, 0.75)),
      workerAcc)
  }
}

object Domains {
  /** Domain of an object: the dominant top-level branch (child of root) among
    * its claimed values; 0 if none resolves.
    */
  def topLevelDomain(h: Hierarchy)(views: Array[ObjectView], o: Int): Int = {
    val view = views(o)
    val counts = mutable.HashMap.empty[Int, Int].withDefaultValue(0)
    view.srcVals.foreach { j =>
      val v = view.cands(j)
      val top = (v :: h.ancestors(v)).filter(n => n != h.root && h.depth(n) == 1)
      top.headOption.foreach(counts(_) += 1)
    }
    if (counts.isEmpty) 0 else counts.toSeq.minBy { case (d, c) => (-c, d) }._1
  }
}

/** DOCS with hierarchy-derived domains. */
final class DocsInference(h: Hierarchy, maxIters: Int = 50)
    extends AccuracyEmInference(_ => h.children(0).length, Domains.topLevelDomain(h), maxIters) {
  val name = "DOCS"
}

/** MDC as the single-domain accuracy EM (see DESIGN.md for the substitution). */
final class MdcInference(maxIters: Int = 50)
    extends AccuracyEmInference(_ => 1, (_, _) => 0, maxIters) {
  val name = "MDC"
}

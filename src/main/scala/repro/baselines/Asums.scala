package repro.baselines

import repro.core.TdhProb
import repro.data.{AnswerLog, ObjectView}

import scala.collection.mutable

/** ASUMS (Beretta et al., WIMS 2016): the fixed-point Sums/Hubs-Authorities
  * scheme of Pasternack & Roth adapted to hierarchies — a claim on value u
  * also supports every candidate that generalizes u (u itself and its
  * ancestors), and the estimated truth is controlled by a granularity
  * threshold: the most specific candidate whose support reaches `threshold` ×
  * the maximum support of the object.
  *
  * The paper (§5.2, Fig. 5) highlights that ASUMS keeps one reliability score
  * t(s) per source and therefore under-estimates sources that generalize.
  */
final class AsumsInference(
    iterations: Int = 20,
    threshold: Double = 0.55,
) extends TruthInference {
  val name = "ASUMS"

  def infer(views: Array[ObjectView], answers: AnswerLog): InferState = {
    val nObj = views.length
    // supporters(o)(v) = claim occurrences (by actor key) whose value is v or a descendant of v
    type Actor = (Boolean, Int)
    val claimsOf = mutable.HashMap.empty[Actor, mutable.ArrayBuffer[(Int, Int)]] // actor -> (obj, candIdx)
    def addClaim(a: Actor, o: Int, j: Int): Unit =
      claimsOf.getOrElseUpdate(a, mutable.ArrayBuffer.empty) += ((o, j))
    for (o <- 0 until nObj) {
      val v = views(o)
      v.srcIds.indices.foreach(i => addClaim((false, v.srcIds(i)), o, v.srcVals(i)))
      answers.answersFor(o).foreach { case (w, j) => addClaim((true, w), o, j) }
    }

    val trust = mutable.HashMap.empty[Actor, Double]
    claimsOf.keys.foreach(trust(_) = 1.0)
    val belief = Array.tabulate(nObj)(o => Array.fill(views(o).nCands)(1.0))

    for (_ <- 1 to iterations) {
      // B(v) = Σ_{claims u s.t. v generalizes u} T(actor)
      for (o <- 0 until nObj) java.util.Arrays.fill(belief(o), 0.0)
      for ((actor, claims) <- claimsOf; (o, j) <- claims) {
        val view = views(o)
        val t = trust(actor)
        belief(o)(j) += t
        view.anc(j).foreach(a => belief(o)(a) += t) // support propagates upward
      }
      val bMax = math.max(1e-12, belief.iterator.flatMap(_.iterator).max)
      belief.foreach { arr => var i = 0; while (i < arr.length) { arr(i) /= bMax; i += 1 } }
      // T(actor) = mean belief of its claims, normalized by the max trust
      for ((actor, claims) <- claimsOf)
        trust(actor) = claims.iterator.map { case (o, j) => belief(o)(j) }.sum / claims.size
      val tMax = math.max(1e-12, trust.values.max)
      trust.keys.foreach(a => trust(a) /= tMax)
    }

    // Truth: deepest candidate whose support >= threshold * max support.
    val truth = Array.tabulate(nObj) { o =>
      val view = views(o)
      val b = belief(o)
      val cut = threshold * b.max
      val eligible = (0 until view.nCands).filter(b(_) >= cut)
      eligible.maxBy(j => (view.candDepth(j), -j))
    }
    val mu = Array.tabulate(nObj) { o =>
      val b = belief(o)
      val z = math.max(1e-12, b.sum)
      b.map(_ / z)
    }
    val workerAcc = trust.collect { case ((true, w), t) => w -> math.min(0.99, t) }.toMap
    InferState(views, mu, truth,
      TruthInference.uniformAnswerProb(views, w => workerAcc.getOrElse(w, 0.75)),
      workerAcc)
  }
}

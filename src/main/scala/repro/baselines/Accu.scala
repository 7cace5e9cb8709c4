package repro.baselines

import repro.core.TdhProb
import repro.data.{AnswerLog, ObjectView}

import scala.collection.mutable

/** ACCU / POPACCU (Dong, Berti-Equille, Srivastava, PVLDB 2009/2012).
  *
  * Bayesian truth discovery with source accuracies and copy detection:
  *  - vote count of a source is σ(s) = ln(n·A_s/(1−A_s)); value confidence is
  *    the dependence-discounted sum of vote counts; μ is its softmax;
  *  - pairwise dependence P(s1~s2) is estimated from the shared objects of a
  *    pair, driven mainly by shared *false* values (kt/kf/kd counts);
  *  - ACCU assumes the n false values are equally likely; POPACCU replaces
  *    that with the observed popularity of the false values.
  *
  * Crowd answers participate as independent voters with their own accuracy.
  * As the paper observes (§5.2), dependence estimation needs many shared
  * objects per source pair — with Heritages-like long-tail sources the
  * estimates collapse, which is the behaviour reproduced here.
  */
final class AccuInference(
    popularityFalse: Boolean,
    outerIters: Int = 4,
    innerIters: Int = 8,
    copyRate: Double = 0.8,
    depPrior: Double = 0.2,
) extends TruthInference {
  val name: String = if (popularityFalse) "POPACCU" else "ACCU"

  private type Actor = (Boolean, Int) // (isWorker, id)

  def infer(views: Array[ObjectView], answers: AnswerLog): InferState = {
    val nObj = views.length
    // Per-object claim lists as (actor, candIdx).
    val claims: Array[Array[(Actor, Int)]] = Array.tabulate(nObj) { o =>
      val v = views(o)
      (v.srcIds.indices.map(i => ((false, v.srcIds(i)): Actor, v.srcVals(i))) ++
        answers.answersFor(o).map { case (w, j) => ((true, w): Actor, j) }).toArray
    }
    val accuracy = mutable.HashMap.empty[Actor, Double]
    val nClaims = mutable.HashMap.empty[Actor, Int].withDefaultValue(0)
    claims.foreach(_.foreach { case (a, _) => accuracy(a) = 0.8; nClaims(a) += 1 })

    val mu = Array.tabulate(nObj)(o => Array.fill(views(o).nCands)(1.0 / views(o).nCands))
    var truth = Array.tabulate(nObj)(o => TdhProb.argmaxTruth(views(o), mu(o)))
    // dependence probability per unordered source pair (workers stay independent)
    var dep = Map.empty[(Actor, Actor), Double]

    for (_ <- 1 to outerIters) {
      dep = estimateDependence(views, claims, accuracy, truth)
      var inner = 0
      while (inner < innerIters) {
        for (o <- 0 until nObj) {
          val view = views(o)
          val n = view.nCands
          val conf = new Array[Double](n)
          // process actors in decreasing accuracy; discount repeated votes on
          // the same value by the probability of independence from the
          // already-counted voters of that value
          val ordered = claims(o).sortBy { case (a, _) => (-accuracy(a), a) }
          val counted = Array.fill(n)(List.empty[Actor])
          ordered.foreach { case (a, u) =>
            val indep = counted(u).foldLeft(1.0) { (acc, prev) =>
              acc * (1 - dep.getOrElse(orderPair(a, prev), 0.0))
            }
            val aAcc = clampP(accuracy(a))
            // POPACCU: popularity of u among the *false* claims (a value that
            // matches the current truth has no false occurrences, only the
            // smoothing mass) — ACCU assumes the uniform distribution instead
            val falseP =
              if (popularityFalse) {
                val t = truth(o)
                val cntFalse = if (u == t) 0 else view.srcCount(u)
                val totalFalse = view.nRecords - view.srcCount(t)
                (cntFalse + 0.5) / (totalFalse + 0.5 * math.max(1, n - 1))
              } else 1.0 / math.max(1, n - 1)
            conf(u) += indep * math.log(aAcc / math.max(1e-9, (1 - aAcc) * falseP))
            counted(u) ::= a
          }
          val m = conf.max
          val ex = conf.map(c => math.exp(c - m))
          val z = ex.sum
          var v = 0
          while (v < n) { mu(o)(v) = ex(v) / z; v += 1 }
        }
        truth = Array.tabulate(nObj)(o => TdhProb.argmaxTruth(views(o), mu(o)))
        // accuracy update: expected fraction of correct claims
        val hit = mutable.HashMap.empty[Actor, Double].withDefaultValue(0.0)
        for (o <- 0 until nObj; (a, u) <- claims(o)) hit(a) += mu(o)(u)
        accuracy.keys.foreach(a => accuracy(a) = clampP((hit(a) + 0.8) / (nClaims(a) + 1.0)))
        inner += 1
      }
    }

    val workerAcc = accuracy.collect { case ((true, w), q) => w -> q }.toMap
    InferState(views, mu, truth,
      TruthInference.uniformAnswerProb(views, w => workerAcc.getOrElse(w, 0.75)),
      workerAcc)
  }

  /** Test hook: dependence probabilities for a fixed truth assignment and a
    * flat source-accuracy prior (exposes the copy-detection machinery).
    */
  private[baselines] def dependenceFor(
      views: Array[ObjectView],
      truth: Array[Int],
      accuracy: Double = 0.8,
  ): Map[((Boolean, Int), (Boolean, Int)), Double] = {
    val claims: Array[Array[(Actor, Int)]] = Array.tabulate(views.length) { o =>
      val v = views(o)
      v.srcIds.indices.map(i => ((false, v.srcIds(i)): Actor, v.srcVals(i))).toArray
    }
    val acc = mutable.HashMap.empty[Actor, Double]
    claims.foreach(_.foreach { case (a, _) => acc(a) = accuracy })
    estimateDependence(views, claims, acc, truth)
  }

  private def clampP(x: Double): Double = math.max(0.01, math.min(0.99, x))

  private def orderPair(a: Actor, b: Actor): (Actor, Actor) = if (actorLt(a, b)) (a, b) else (b, a)
  private def actorLt(a: Actor, b: Actor): Boolean =
    (a._1, a._2) match { case (w, i) => w < b._1 || (w == b._1 && i < b._2) }

  /** Bayesian copy detection over source pairs sharing objects (Dong'09 §3):
    * counts kt (agree on the truth), kf (agree on a false value), kd
    * (disagree) and compares the independent vs copying likelihoods.
    */
  private def estimateDependence(
      views: Array[ObjectView],
      claims: Array[Array[(Actor, Int)]],
      accuracy: mutable.Map[Actor, Double],
      truth: Array[Int],
  ): Map[(Actor, Actor), Double] = {
    val counts = mutable.HashMap.empty[(Actor, Actor), (Int, Int, Int, Double)] // kt, kf, kd, Σn
    for (o <- views.indices) {
      val cs = claims(o).filter(!_._1._1) // only web sources can copy each other
      val n = math.max(1, views(o).nCands - 1)
      var i = 0
      while (i < cs.length) {
        var j = i + 1
        while (j < cs.length) {
          val key = orderPair(cs(i)._1, cs(j)._1)
          val (kt, kf, kd, ns) = counts.getOrElse(key, (0, 0, 0, 0.0))
          val same = cs(i)._2 == cs(j)._2
          val isTrue = same && cs(i)._2 == truth(o)
          counts(key) =
            if (isTrue) (kt + 1, kf, kd, ns + n)
            else if (same) (kt, kf + 1, kd, ns + n)
            else (kt, kf, kd + 1, ns + n)
          j += 1
        }
        i += 1
      }
    }
    counts.iterator.map { case (key @ (a1, a2), (kt, kf, kd, nSum)) =>
      val tot = kt + kf + kd
      val n = math.max(1.0, nSum / tot)
      val q1 = clampP(accuracy(a1)); val q2 = clampP(accuracy(a2))
      val pT = q1 * q2
      val pF = (1 - q1) * (1 - q2) / n
      val pD = math.max(1e-9, 1 - pT - pF)
      val qAvg = (q1 + q2) / 2
      val li = kt * math.log(pT) + kf * math.log(math.max(1e-12, pF)) + kd * math.log(pD)
      val ld = kt * math.log(copyRate * qAvg + (1 - copyRate) * pT) +
        kf * math.log(math.max(1e-12, copyRate * (1 - qAvg) + (1 - copyRate) * pF)) +
        kd * math.log((1 - copyRate) * pD)
      val m = math.max(li, ld)
      val pDep = depPrior * math.exp(ld - m) /
        (depPrior * math.exp(ld - m) + (1 - depPrior) * math.exp(li - m))
      key -> pDep
    }.toMap
  }
}

package repro.core

import repro.data.{AnswerLog, ObjectView}

import scala.collection.mutable

/** Reference implementation of the TDH EM algorithm (§3.2, Figure 4).
  *
  * This is the exact math of the paper on the compiled [[ObjectView]]
  * substrate; [[TdhSpark]] expresses the same updates as DataFrame dataflow
  * and is tested for equivalence against this implementation. The
  * crowdsourcing round loops (Table 4) call this version because they re-run
  * inference hundreds of times.
  */
object TdhLocal {

  /** Run MAP-EM to convergence.
    *
    * @param views    compiled per-object candidate structures
    * @param answers  crowdsourcing answers accumulated so far (may be empty)
    */
  def run(views: Array[ObjectView], answers: AnswerLog, hyper: TdhHyper = TdhHyper()): TdhResult = {
    val nObj = views.length
    val gm1 = hyper.gamma - 1.0

    // --- initialization -----------------------------------------------------
    // μ⁰: smoothed vote share; φ⁰ = α/Σα; ψ⁰ = β/Σβ.
    val mu = Array.tabulate(nObj) { o =>
      val v = views(o)
      val ansCount = new Array[Int](v.nCands)
      answers.answersFor(o).foreach { case (_, j) => ansCount(j) += 1 }
      val den = v.nRecords + answers.count(o) + v.nCands * gm1
      Array.tabulate(v.nCands)(j => (v.srcCount(j) + ansCount(j) + gm1) / den)
    }
    val aSum = hyper.alphaArr.sum
    val bSum = hyper.betaArr.sum
    val phi = mutable.HashMap.empty[Int, Array[Double]]
    val psi = mutable.HashMap.empty[Int, Array[Double]]
    val claimsPerSource = mutable.HashMap.empty[Int, Int].withDefaultValue(0)
    val claimsPerWorker = mutable.HashMap.empty[Int, Int].withDefaultValue(0)
    views.foreach { v =>
      v.srcIds.foreach { s =>
        phi.getOrElseUpdate(s, hyper.alphaArr.map(_ / aSum))
        claimsPerSource(s) += 1
      }
    }
    for (o <- 0 until nObj; (w, _) <- answers.answersFor(o)) {
      psi.getOrElseUpdate(w, hyper.betaArr.map(_ / bSum))
      claimsPerWorker(w) += 1
    }

    val muNum = Array.tabulate(nObj)(o => new Array[Double](views(o).nCands))
    val muDen = new Array[Double](nObj)

    // --- EM loop ------------------------------------------------------------
    var iter = 0
    var delta = Double.MaxValue
    while (iter < hyper.maxIters && delta > hyper.tol) {
      val phiAcc = mutable.HashMap.empty[Int, Array[Double]]
      val psiAcc = mutable.HashMap.empty[Int, Array[Double]]
      phi.keys.foreach(s => phiAcc(s) = new Array[Double](3))
      psi.keys.foreach(w => psiAcc(w) = new Array[Double](3))
      val fSum = Array.tabulate(nObj)(o => new Array[Double](views(o).nCands))

      var o = 0
      while (o < nObj) {
        val view = views(o)
        val muO = mu(o)
        val n = view.nCands

        // E-step over source claims (f_{o,s}^v and g_{o,s}^t of Figure 4)
        var r = 0
        while (r < view.nRecords) {
          val s = view.srcIds(r)
          val u = view.srcVals(r)
          val ph = phi(s)
          accumulate(view, muO, u, fSum(o), phiAcc(s),
            (vIdx: Int) => TdhProb.pSrc(view, ph, u, vIdx), ph)
          r += 1
        }
        // E-step over worker answers (f_{o,w}^v and g_{o,w}^t)
        answers.answersFor(o).foreach { case (w, u) =>
          val ps = psi(w)
          accumulate(view, muO, u, fSum(o), psiAcc(w),
            (vIdx: Int) => TdhProb.pWkr(view, ps, u, vIdx), ps)
        }

        o += 1
      }

      // M-step: Eq. (9) for μ, Eq. (10) for φ, Eq. (11) for ψ.
      delta = 0.0
      o = 0
      while (o < nObj) {
        val view = views(o)
        val den = view.nRecords + answers.count(o) + view.nCands * gm1
        muDen(o) = den
        var j = 0
        while (j < view.nCands) {
          val num = fSum(o)(j) + gm1
          muNum(o)(j) = num
          val next = num / den
          delta = math.max(delta, math.abs(next - mu(o)(j)))
          mu(o)(j) = next
          j += 1
        }
        o += 1
      }
      phi.keys.foreach { s =>
        val acc = phiAcc(s)
        val den = claimsPerSource(s) + hyper.alphaDen
        phi(s) = Array.tabulate(3)(t => math.max(1e-9, (acc(t) + hyper.alphaArr(t) - 1) / den))
      }
      psi.keys.foreach { w =>
        val acc = psiAcc(w)
        val den = claimsPerWorker(w) + hyper.betaDen
        psi(w) = Array.tabulate(3)(t => math.max(1e-9, (acc(t) + hyper.betaArr(t) - 1) / den))
      }
      iter += 1
    }

    val truthIdx = Array.tabulate(nObj)(o => TdhProb.argmaxTruth(views(o), mu(o)))
    TdhResult(mu, muNum, muDen, phi.toMap, psi.toMap, truthIdx)
  }

  /** E-step contribution of one claim `u`:
    * adds f^v (the truth posterior given this claim) into `fAcc` and the
    * relationship-type posterior g^t into `gAcc`.
    *
    * For o ∉ O_H and u = v the type (exact vs generalized) is unobservable —
    * the responsibility splits proportionally to (trust(0), trust(1)), which
    * is the exact E-step for the Eq. (2)/(4) likelihood.
    */
  private def accumulate(
      view: ObjectView,
      muO: Array[Double],
      u: Int,
      fAcc: Array[Double],
      gAcc: Array[Double],
      pClaim: Int => Double,
      trust: Array[Double],
  ): Unit = {
    val n = view.nCands
    val p = new Array[Double](n)
    var z = 0.0
    var v = 0
    while (v < n) { p(v) = pClaim(v) * muO(v); z += p(v); v += 1 }
    if (z <= 0) return // claim impossible under current params; no responsibility
    v = 0
    while (v < n) {
      val f = p(v) / z
      fAcc(v) += f
      if (view.inOH) {
        gAcc(TdhProb.relType(view, u, v) - 1) += f
      } else if (u == v) {
        val t12 = trust(0) + trust(1)
        if (t12 > 0) { gAcc(0) += f * trust(0) / t12; gAcc(1) += f * trust(1) / t12 }
      } else gAcc(2) += f
      v += 1
    }
  }
}

package repro.baselines

import repro.core.{TdhHyper, TdhLocal, TdhProb}
import repro.data.{AnswerLog, ObjectView}

/** Result of one truth-inference run, in the shape the task-assignment
  * algorithms need.
  *
  * @param mu        per-object confidence distribution over candidates
  * @param truthIdx  chosen candidate index per object
  * @param answerProb answerProb(o, w, uIdx, vIdx) = P(worker w answers u |
  *                  truth is v) under this algorithm's worker model — used by
  *                  QASCA/EAI-style one-step Bayes updates
  * @param workerAcc estimated probability each known worker answers exactly
  *                  correctly (TDH's ψ_w,1; an accuracy estimate elsewhere)
  * @param muNum,muDen the N_{o,v} / D_o statistics of Eq. (9) when the
  *                  algorithm exposes them (TDH); EAI requires them
  */
final case class InferState(
    views: Array[ObjectView],
    mu: Array[Array[Double]],
    truthIdx: Array[Int],
    answerProb: (Int, Int, Int, Int) => Double,
    workerAcc: Map[Int, Double],
    muNum: Option[Array[Array[Double]]] = None,
    muDen: Option[Array[Double]] = None,
) {
  def truthValues: Array[Int] = Array.tabulate(truthIdx.length)(o => views(o).cands(truthIdx(o)))
}

/** A truth-inference algorithm over the shared [[ObjectView]] substrate. */
trait TruthInference {
  def name: String
  def infer(views: Array[ObjectView], answers: AnswerLog): InferState
}

object TruthInference {
  /** Default symmetric-error answer model for algorithms without an explicit
    * worker model: correct with probability `acc`, uniform otherwise.
    */
  def uniformAnswerProb(views: Array[ObjectView], acc: Int => Double)
      : (Int, Int, Int, Int) => Double =
    (o, w, u, v) => {
      val n = views(o).nCands
      if (u == v) acc(w)
      else if (n <= 1) 0.0
      else (1 - acc(w)) / (n - 1)
    }
}

/** The paper's TDH inference (§3) exposed through the common interface. */
final class TdhInference(hyper: TdhHyper = TdhHyper()) extends TruthInference {
  val name = "TDH"

  def infer(views: Array[ObjectView], answers: AnswerLog): InferState = {
    val res = TdhLocal.run(views, answers, hyper)
    val bSum = hyper.betaArr.sum
    val defaultPsi = hyper.betaArr.map(_ / bSum)
    val psiOf = (w: Int) => res.psi.getOrElse(w, defaultPsi)
    InferState(
      views,
      res.mu,
      res.truthIdx,
      (o, w, u, v) => TdhProb.pWkr(views(o), psiOf(w), u, v),
      res.psi.map { case (w, p) => w -> p(0) },
      Some(res.muNum),
      Some(res.muDen),
    )
  }
}

/** VOTE baseline: the value with the highest claim frequency (records and
  * answers both count one vote); μ is the smoothed vote share.
  */
final class VoteInference extends TruthInference {
  val name = "VOTE"

  def infer(views: Array[ObjectView], answers: AnswerLog): InferState = {
    val mu = Array.tabulate(views.length) { o =>
      val v = views(o)
      val cnt = v.srcCount.map(_.toDouble)
      answers.answersFor(o).foreach { case (_, j) => cnt(j) += 1 }
      val tot = cnt.sum
      cnt.map(_ / tot)
    }
    val truth = Array.tabulate(views.length)(o => TdhProb.argmaxTruth(views(o), mu(o)))
    InferState(views, mu, truth,
      TruthInference.uniformAnswerProb(views, _ => 0.75),
      Map.empty)
  }
}

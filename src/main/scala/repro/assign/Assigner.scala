package repro.assign

import repro.baselines.InferState
import repro.data.AnswerLog

/** A crowdsourcing task-assignment algorithm (§2.2, Def. 2.4): pick up to k
  * objects per worker for the next round. Constraints shared by every
  * implementation (per §4.3): an object goes to at most one worker per round,
  * and never to a worker who already answered it.
  */
trait Assigner {
  def name: String

  /** @return (worker, object) pairs for this round */
  def assign(state: InferState, answers: AnswerLog, workers: Seq[Int], k: Int): Seq[(Int, Int)]
}

object Assigner {
  /** Shannon entropy of a distribution. */
  def entropy(p: Array[Double]): Double =
    -p.iterator.filter(_ > 0).map(x => x * math.log(x)).sum

  /** Greedy per-worker top-k selection used by QASCA/MB/ME: workers in the
    * given order each take their best k unassigned, not-yet-answered objects
    * according to `quality(worker, obj)`.
    */
  def greedyPerWorker(
      state: InferState,
      answers: AnswerLog,
      workers: Seq[Int],
      k: Int,
      quality: (Int, Int) => Double,
  ): Seq[(Int, Int)] = {
    val taken = scala.collection.mutable.HashSet.empty[Int]
    val out = Seq.newBuilder[(Int, Int)]
    for (w <- workers) {
      val ranked = state.views.indices.iterator
        .filter(o => !taken.contains(o) && !answers.hasAnswered(w, o))
        .map(o => (quality(w, o), o))
        .toSeq
        .sortBy { case (q, o) => (-q, o) }
        .take(k)
      ranked.foreach { case (_, o) => taken += o; out += ((w, o)) }
    }
    out.result()
  }
}

/** ME baseline (§5.1): uncertainty sampling — objects whose confidence
  * distribution has maximum entropy.
  */
final class MaxEntropyAssigner extends Assigner {
  val name = "ME"

  def assign(state: InferState, answers: AnswerLog, workers: Seq[Int], k: Int): Seq[(Int, Int)] = {
    val h = state.mu.map(Assigner.entropy)
    Assigner.greedyPerWorker(state, answers, workers, k, (_, o) => h(o))
  }
}

/** MB — the task assignment used by DOCS (Zheng et al., PVLDB 2016): choose
  * the objects with the largest expected entropy reduction given the worker's
  * answer model.
  */
final class MbAssigner extends Assigner {
  val name = "MB"

  def assign(state: InferState, answers: AnswerLog, workers: Seq[Int], k: Int): Seq[(Int, Int)] = {
    def expectedEntropyDrop(w: Int, o: Int): Double = {
      val mu = state.mu(o)
      val n = mu.length
      val h0 = Assigner.entropy(mu)
      var drop = h0
      var u = 0
      while (u < n) {
        // marginal of answer u and the posterior entropy after observing it
        var pu = 0.0
        val post = new Array[Double](n)
        var v = 0
        while (v < n) {
          val p = state.answerProb(o, w, u, v) * mu(v)
          post(v) = p; pu += p
          v += 1
        }
        if (pu > 1e-12) {
          v = 0
          while (v < n) { post(v) /= pu; v += 1 }
          drop -= pu * Assigner.entropy(post)
        }
        u += 1
      }
      drop
    }
    Assigner.greedyPerWorker(state, answers, workers, k, expectedEntropyDrop)
  }
}

/** QASCA (Zheng et al., SIGMOD 2015): quality = accuracy improvement of the
  * max-confidence value after a *sampled* answer, via a plain Bayes update
  * (no damping by the number of already-collected claims — the drawback §4.1
  * discusses and EAI fixes).
  */
final class QascaAssigner(seed: Long = 0x9a5caL) extends Assigner {
  val name = "QASCA"
  private val rnd = new scala.util.Random(seed)

  def assign(state: InferState, answers: AnswerLog, workers: Seq[Int], k: Int): Seq[(Int, Int)] = {
    def quality(w: Int, o: Int): Double = {
      val mu = state.mu(o)
      val n = mu.length
      // sample an answer u from P(u | psi_w, mu_o)
      val marg = Array.tabulate(n) { u =>
        var s = 0.0; var v = 0
        while (v < n) { s += state.answerProb(o, w, u, v) * mu(v); v += 1 }
        s
      }
      val z = marg.sum
      val u = if (z <= 1e-12) rnd.nextInt(n) else {
        var x = rnd.nextDouble() * z; var i = 0
        while (i < n - 1 && x >= marg(i)) { x -= marg(i); i += 1 }
        i
      }
      // Bayes posterior given the sampled answer
      val post = Array.tabulate(n)(v => state.answerProb(o, w, u, v) * mu(v))
      val pz = post.sum
      if (pz <= 1e-12) 0.0
      else post.map(_ / pz).max - mu.max
    }
    Assigner.greedyPerWorker(state, answers, workers, k, quality)
  }
}

package repro.assign

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.TdhInference
import repro.core.TdhLocal
import repro.data.{AnswerLog, TruthDataGen}

/** Properties of the incremental one-step EM (§4.2): the conditional
  * confidence of Eq. (18) must approximate re-running the full EM with the
  * hypothetical answer added, and the EAI estimate must behave as the paper
  * argues against QASCA's.
  */
class IncrementalEmSpec extends AnyFunSuite {

  private lazy val ds = TruthDataGen.generate(
    TruthDataGen.birthPlacesConfig.copy(numObjects = 120, targetRecords = 420, hierNodes = 300, seed = 77))
  private lazy val answers = new AnswerLog(ds.numObjects)
  private lazy val state = new TdhInference().infer(ds.views, answers)

  /** Eq. (18) directly. */
  private def conditionalMu(o: Int, w: Int, uIdx: Int): Array[Double] = {
    val mu = state.mu(o)
    val n = mu.length
    val muNum = state.muNum.get; val muDen = state.muDen.get
    val marg = (0 until n).map(v => state.answerProb(o, w, uIdx, v) * mu(v))
    val z = marg.sum
    Array.tabulate(n)(v => (muNum(o)(v) + (if (z > 0) marg(v) / z else 0.0)) / (muDen(o) + 1.0))
  }

  test("conditional confidence (Eq. 18) is a probability distribution") {
    for (o <- 0 until 40; u <- 0 until ds.views(o).nCands) {
      val cond = conditionalMu(o, 0, u)
      assert(math.abs(cond.sum - 1.0) < 1e-6, s"obj=$o u=$u sum=${cond.sum}")
      cond.foreach(p => assert(p >= 0 && p <= 1 + 1e-9))
    }
  }

  test("conditional confidence approximates a full EM re-run with the answer added") {
    var checked = 0
    var totalErr = 0.0
    for (o <- 0 until 30) {
      val view = ds.views(o)
      val u = view.srcVals(0) // hypothetical answer: the first claimed value
      val cond = conditionalMu(o, 0, u)
      // full EM with the answer actually added
      val log2 = new AnswerLog(ds.numObjects)
      log2.add(o, 0, u)
      val full = TdhLocal.run(ds.views, log2)
      for (v <- 0 until view.nCands) {
        totalErr += math.abs(cond(v) - full.mu(o)(v))
        checked += 1
      }
    }
    val meanErr = totalErr / checked
    assert(meanErr < 0.05, s"mean |incremental - full| = $meanErr over $checked entries")
  }

  test("the incremental update moves confidence toward the answered value") {
    for (o <- 0 until 40) {
      val view = ds.views(o)
      if (view.nCands > 1) {
        val u = (0 until view.nCands).minBy(state.mu(o)(_)) // answer the least likely value
        val cond = conditionalMu(o, 0, u)
        assert(cond(u) >= state.mu(o)(u) - 1e-9,
          s"obj=$o: answering $u should not lower its confidence (${state.mu(o)(u)} -> ${cond(u)})")
      }
    }
  }

  test("objects with more collected claims move less under the same answer (the §4.1 argument)") {
    // two objects with identical 50/50 confidence: 2 claims vs 40 claims
    import repro.data.{Record, TdDataset}
    import repro.Fixtures
    val few = Seq(Record(0, 0, Fixtures.London), Record(0, 1, Fixtures.Manchester))
    val many = (0 until 20).flatMap(i =>
      Seq(Record(1, 2 + 2 * i, Fixtures.London), Record(1, 3 + 2 * i, Fixtures.Manchester)))
    val d = TdDataset(Fixtures.geo, 2, 43, (few ++ many).toVector,
      Array(Fixtures.London, Fixtures.London))
    val st = new TdhInference().infer(d.views, new AnswerLog(2))
    def shift(o: Int): Double = {
      val view = d.views(o)
      val u = view.candIndex(Fixtures.London)
      val muNum = st.muNum.get; val muDen = st.muDen.get
      val marg = (0 until view.nCands).map(v => st.answerProb(o, 0, u, v) * st.mu(o)(v))
      val z = marg.sum
      (0 until view.nCands).map { v =>
        math.abs((muNum(o)(v) + marg(v) / z) / (muDen(o) + 1.0) - st.mu(o)(v))
      }.max
    }
    assert(shift(0) > shift(1), s"sparse shift=${shift(0)} crowded shift=${shift(1)}")
  }

  test("QASCA's undamped estimate is at least as large as EAI's damped one on average (Fig. 7)") {
    val eaiA = new EaiAssigner()
    val muNum = state.muNum.get; val muDen = state.muDen.get
    var eaiSum = 0.0; var qascaSum = 0.0; var n = 0
    val rnd = new scala.util.Random(5)
    for (o <- 0 until 60 if ds.views(o).nCands > 1) {
      val mu = state.mu(o)
      val e = eaiA.eai(state, muNum, muDen, 0, o)
      // QASCA-style quality with a sampled answer and plain Bayes update
      val nC = mu.length
      val u = rnd.nextInt(nC)
      val post = Array.tabulate(nC)(v => state.answerProb(o, 0, u, v) * mu(v))
      val z = post.sum
      val q = if (z <= 0) 0.0 else post.map(_ / z).max - mu.max
      eaiSum += e * ds.numObjects // undo the 1/|O| for comparability
      qascaSum += q
      n += 1
    }
    assert(n > 10)
    assert(qascaSum / n >= eaiSum / n - 1e-6,
      s"QASCA mean=${qascaSum / n} should not be below EAI mean=${eaiSum / n}")
  }
}

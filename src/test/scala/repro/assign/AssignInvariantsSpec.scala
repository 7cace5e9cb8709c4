package repro.assign

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.TdhInference
import repro.data.{AnswerLog, TruthDataGen}

/** Seed-parametrized assignment invariants, centered on the pruning
  * correctness of Algorithm 1 (pruned output must equal unpruned output).
  */
class AssignInvariantsSpec extends AnyFunSuite {

  for (seed <- 0L until 6L) {
    lazy val ds = TruthDataGen.generate(
      TruthDataGen.birthPlacesConfig.copy(numObjects = 120, targetRecords = 420, hierNodes = 250, seed = seed + 50))
    lazy val answers = new AnswerLog(ds.numObjects)
    lazy val state = new TdhInference().infer(ds.views, answers)

    test(s"seed=$seed: EAI pruned == unpruned (k=5, 10 workers)") {
      val p = new EaiAssigner(pruned = true).assign(state, answers, 0 until 10, 5).toSet
      val b = new EaiAssigner(pruned = false).assign(state, answers, 0 until 10, 5).toSet
      assert(p == b)
    }

    test(s"seed=$seed: EAI never exceeds its upper bound on sampled pairs") {
      val e = new EaiAssigner()
      val muNum = state.muNum.get; val muDen = state.muDen.get
      for (o <- 0 until ds.numObjects by 7; w <- 0 until 3) {
        val v = e.eai(state, muNum, muDen, w, o)
        val ub = (1.0 - state.mu(o).max) / (ds.numObjects * (muDen(o) + 1.0))
        assert(v <= ub + 1e-12, s"o=$o w=$w eai=$v ub=$ub")
      }
    }

    test(s"seed=$seed: all four assigners respect the one-object-one-worker rule") {
      for (assigner <- Seq(new EaiAssigner(), new QascaAssigner(seed), new MbAssigner(), new MaxEntropyAssigner())) {
        val pairs = assigner.assign(state, answers, 0 until 6, 4)
        val objs = pairs.map(_._2)
        assert(objs.distinct.size == objs.size, assigner.name)
        pairs.groupBy(_._1).values.foreach(g => assert(g.size <= 4, assigner.name))
      }
    }
  }

  test("EAI with answered objects skips them for the answering worker only") {
    val ds = TruthDataGen.generate(
      TruthDataGen.birthPlacesConfig.copy(numObjects = 40, targetRecords = 140, hierNodes = 120, seed = 3))
    val answers = new AnswerLog(ds.numObjects)
    (0 until 40).foreach(o => answers.add(o, 0, 0)) // worker 0 answered everything
    val state = new TdhInference().infer(ds.views, answers)
    val pairs = new EaiAssigner().assign(state, answers, 0 until 3, 5)
    assert(pairs.forall(_._1 != 0), "worker 0 must get nothing")
    assert(pairs.nonEmpty, "other workers still get tasks")
  }

  test("EAI with a single worker returns its global top-k by EAI") {
    val ds = TruthDataGen.generate(
      TruthDataGen.birthPlacesConfig.copy(numObjects = 60, targetRecords = 200, hierNodes = 150, seed = 4))
    val answers = new AnswerLog(ds.numObjects)
    val state = new TdhInference().infer(ds.views, answers)
    val e = new EaiAssigner()
    val pairs = e.assign(state, answers, Seq(0), 5)
    assert(pairs.size == 5)
    val muNum = state.muNum.get; val muDen = state.muDen.get
    val chosen = pairs.map(p => e.eai(state, muNum, muDen, 0, p._2)).min
    val best5 = (0 until ds.numObjects).map(o => e.eai(state, muNum, muDen, 0, o)).sorted.takeRight(5).min
    assert(math.abs(chosen - best5) < 1e-12, s"chosen min=$chosen global 5th=$best5")
  }
}

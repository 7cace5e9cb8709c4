package repro.assign

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures
import repro.baselines.{InferState, TdhInference}
import repro.data.{AnswerLog, Record, TdDataset, TruthDataGen}

class AssignSpec extends AnyFunSuite {

  private lazy val ds = TruthDataGen.generate(
    TruthDataGen.birthPlacesConfig.copy(numObjects = 250, targetRecords = 800, hierNodes = 500, seed = 33))
  private lazy val answers: AnswerLog = {
    val log = new AnswerLog(ds.numObjects)
    // a few pre-existing answers so hasAnswered() paths are exercised
    log.add(0, 0, 0); log.add(1, 1, 0); log.add(2, 2, 0)
    log
  }
  private lazy val state: InferState = new TdhInference().infer(ds.views, answers)
  private val workers = 0 until 10
  private val k = 5

  private def checkConstraints(pairs: Seq[(Int, Int)], log: AnswerLog): Unit = {
    val perWorker = pairs.groupBy(_._1)
    perWorker.values.foreach(p => assert(p.size <= k, "worker got more than k objects"))
    val objs = pairs.map(_._2)
    assert(objs.distinct.size == objs.size, "object assigned to two workers in one round")
    pairs.foreach { case (w, o) => assert(!log.hasAnswered(w, o), s"worker $w re-assigned answered object $o") }
  }

  private def asSet(pairs: Seq[(Int, Int)]): Set[(Int, Int)] = pairs.toSet

  test("EAI assignment satisfies the round constraints") {
    checkConstraints(new EaiAssigner().assign(state, answers, workers, k), answers)
  }

  test("EAI pruned and unpruned assignments are identical (Lemma 4.1 + Algorithm 1)") {
    val pruned = asSet(new EaiAssigner(pruned = true).assign(state, answers, workers, k))
    val brute = asSet(new EaiAssigner(pruned = false).assign(state, answers, workers, k))
    assert(pruned == brute)
  }

  test("EAI pruned == unpruned on a second dataset and different k") {
    val ds2 = TruthDataGen.generate(
      TruthDataGen.heritagesConfig.copy(numObjects = 150, numSources = 120, targetRecords = 700, hierNodes = 300, seed = 4))
    val st2 = new TdhInference().infer(ds2.views, new AnswerLog(ds2.numObjects))
    for (kk <- Seq(1, 3, 7)) {
      val p = asSet(new EaiAssigner(pruned = true).assign(st2, new AnswerLog(ds2.numObjects), 0 until 5, kk))
      val b = asSet(new EaiAssigner(pruned = false).assign(st2, new AnswerLog(ds2.numObjects), 0 until 5, kk))
      assert(p == b, s"k=$kk")
    }
  }

  test("EAI(w,o) never exceeds the upper bound U_EAI(o) (Lemma 4.1)") {
    val e = new EaiAssigner()
    val muNum = state.muNum.get; val muDen = state.muDen.get
    val nObj = ds.numObjects
    for (o <- 0 until math.min(nObj, 120); w <- workers.take(4)) {
      val eai = e.eai(state, muNum, muDen, w, o)
      val ub = (1.0 - state.mu(o).max) / (nObj * (muDen(o) + 1.0))
      assert(eai <= ub + 1e-12, s"EAI($w,$o)=$eai > U=$ub")
    }
  }

  test("EAI prefers the object with fewer collected claims when confidences tie (the §4.1 motivation)") {
    // two objects with identical 2-candidate confidence, one backed by 2 claims, one by 40
    val h = Fixtures.geo
    val few = (0 until 1).flatMap(_ => Seq(Record(0, 0, Fixtures.London), Record(0, 1, Fixtures.Manchester)))
    val many = (0 until 20).flatMap(i => Seq(Record(1, 2 + 2 * i, Fixtures.London), Record(1, 3 + 2 * i, Fixtures.Manchester)))
    val d = TdDataset(h, 2, 43, (few ++ many).toVector, Array(Fixtures.London, Fixtures.London))
    val st = new TdhInference().infer(d.views, new AnswerLog(2))
    val e = new EaiAssigner()
    val eaiFew = e.eai(st, st.muNum.get, st.muDen.get, 0, 0)
    val eaiMany = e.eai(st, st.muNum.get, st.muDen.get, 0, 1)
    assert(eaiFew > eaiMany, s"few=$eaiFew many=$eaiMany")
  }

  test("EAI requires the N/D statistics") {
    val bare = state.copy(muNum = None, muDen = None)
    intercept[IllegalArgumentException] {
      new EaiAssigner().assign(bare, answers, workers, k)
    }
  }

  test("EAI gives reliable workers (higher psi1) priority on the best objects") {
    val pairs = new EaiAssigner().assign(state, answers, workers, k)
    assert(pairs.nonEmpty)
    // every worker with any assignment got at most k and all pairs valid
    checkConstraints(pairs, answers)
  }

  test("QASCA assignment satisfies the round constraints and is seed-deterministic") {
    val a = new QascaAssigner(seed = 7).assign(state, answers, workers, k)
    val b = new QascaAssigner(seed = 7).assign(state, answers, workers, k)
    checkConstraints(a, answers)
    assert(asSet(a) == asSet(b))
  }

  test("MB assignment satisfies the round constraints") {
    checkConstraints(new MbAssigner().assign(state, answers, workers, k), answers)
  }

  test("ME assigns the maximum-entropy objects first") {
    val pairs = new MaxEntropyAssigner().assign(state, answers, workers, k)
    checkConstraints(pairs, answers)
    val assigned = pairs.map(_._2).toSet
    val entropies = state.mu.map(Assigner.entropy)
    val maxUnassigned = (0 until ds.numObjects).filterNot(assigned).map(entropies).max
    // the smallest entropy among the first worker's objects beats every unassigned object
    val w0 = pairs.filter(_._1 == workers.head).map(p => entropies(p._2))
    assert(w0.nonEmpty && w0.min >= maxUnassigned - 1e-9)
  }

  test("all assigners handle k larger than the object count") {
    val d = Fixtures.table1World(extraObjects = 2)
    val st = new TdhInference().infer(d.views, new AnswerLog(d.numObjects))
    val log = new AnswerLog(d.numObjects)
    for (assigner <- Seq(new EaiAssigner(), new QascaAssigner(), new MbAssigner(), new MaxEntropyAssigner())) {
      val pairs = assigner.assign(st, log, 0 until 3, 100)
      val objs = pairs.map(_._2)
      assert(objs.distinct.size == objs.size, assigner.name)
      assert(objs.size <= d.numObjects, assigner.name)
    }
  }

  test("entropy helper: uniform distribution has maximal entropy") {
    val u = Assigner.entropy(Array(0.25, 0.25, 0.25, 0.25))
    assert(math.abs(u - math.log(4)) < 1e-12)
    assert(Assigner.entropy(Array(1.0, 0.0)) == 0.0)
    assert(Assigner.entropy(Array(0.9, 0.1)) < u)
  }
}

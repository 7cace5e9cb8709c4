package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures
import repro.Fixtures._
import repro.data.{AnswerLog, TdDataset, TruthDataGen}
import repro.eval.Metrics

class BaselinesSpec extends AnyFunSuite {

  private def empty(ds: TdDataset) = new AnswerLog(ds.numObjects)

  private lazy val small = TruthDataGen.generate(
    TruthDataGen.birthPlacesConfig.copy(numObjects = 400, targetRecords = 1200, hierNodes = 600, seed = 21))

  private def allInference(ds: TdDataset): Seq[TruthInference] = Seq(
    new TdhInference(),
    new VoteInference(),
    new LcaInference(),
    new AsumsInference(),
    new DocsInference(ds.hierarchy),
    new MdcInference(),
    new AccuInference(popularityFalse = false),
    new AccuInference(popularityFalse = true),
    new LfcInference(),
    new CrhInference(),
  )

  test("every inference algorithm returns valid candidate indices and normalized mu") {
    val ds = Fixtures.table1World()
    for (alg <- allInference(ds)) {
      val st = alg.infer(ds.views, empty(ds))
      assert(st.truthIdx.length == ds.numObjects, alg.name)
      for (o <- 0 until ds.numObjects) {
        assert(st.truthIdx(o) >= 0 && st.truthIdx(o) < ds.views(o).nCands, s"${alg.name} obj=$o")
        assert(math.abs(st.mu(o).sum - 1.0) < 1e-6, s"${alg.name} mu sum obj=$o = ${st.mu(o).sum}")
        st.mu(o).foreach(p => assert(p >= -1e-12 && p <= 1 + 1e-9, s"${alg.name} mu out of range"))
      }
    }
  }

  test("every inference algorithm is deterministic") {
    val ds = Fixtures.table1World()
    for (alg <- allInference(ds)) {
      val a = alg.infer(ds.views, empty(ds))
      val b = alg.infer(ds.views, empty(ds))
      assert(a.truthIdx.sameElements(b.truthIdx), alg.name)
    }
  }

  test("every inference algorithm clears a sanity accuracy floor on generated data") {
    for (alg <- allInference(small)) {
      val st = alg.infer(small.views, empty(small))
      val acc = Metrics.accuracy(small, st.truthValues)
      assert(acc > 0.45, s"${alg.name} accuracy=$acc")
    }
  }

  test("TDH has the best accuracy among all algorithms on generated data (Table 3 shape)") {
    val accs = allInference(small).map { alg =>
      alg.name -> Metrics.accuracy(small, alg.infer(small.views, empty(small)).truthValues)
    }
    val tdh = accs.find(_._1 == "TDH").get._2
    for ((name, acc) <- accs if name != "TDH")
      assert(tdh >= acc - 1e-9, s"TDH=$tdh should beat $name=$acc")
  }

  test("VOTE picks the majority value and breaks ties toward the deeper candidate") {
    val flat = Fixtures.flatWorld()
    val st = new VoteInference().infer(flat.views, empty(flat))
    assert(st.truthValues.toSeq == Seq(LibertyIsland, London, LA))
  }

  test("VOTE counts crowd answers as votes") {
    val flat = Fixtures.flatWorld()
    val log = empty(flat)
    val v1 = flat.views(1) // London vs Manchester: 2-1 London
    log.add(1, 0, v1.candIndex(Manchester))
    log.add(1, 1, v1.candIndex(Manchester))
    val st = new VoteInference().infer(flat.views, log)
    assert(st.truthValues(1) == Manchester) // now 3-2 Manchester
  }

  test("LCA resolves the easy fixture reasonably (it cannot credit generalized claims)") {
    val ds = Fixtures.table1World(extraObjects = 30)
    val st = new LcaInference().infer(ds.views, empty(ds))
    val acc = Metrics.accuracy(ds, st.truthValues)
    // the generalizing source looks 'dishonest' to LCA, so accuracy trails TDH
    assert(acc > 0.7, s"LCA accuracy on easy fixture=$acc")
    val tdhAcc = Metrics.accuracy(ds, new TdhInference().infer(ds.views, empty(ds)).truthValues)
    assert(tdhAcc >= acc, s"tdh=$tdhAcc lca=$acc")
  }

  test("ASUMS picks a generalized value when specific support is below the threshold") {
    // 1 specific claim vs 3 generalized claims: threshold keeps the general value
    val recs = Vector(
      repro.data.Record(0, 0, LibertyIsland),
      repro.data.Record(0, 1, NY), repro.data.Record(0, 2, NY), repro.data.Record(0, 3, NY),
    )
    val ds = TdDataset(Fixtures.geo, 1, 4, recs, Array(LibertyIsland))
    val st = new AsumsInference(threshold = 0.9).infer(ds.views, empty(ds))
    assert(st.truthValues(0) == NY)
  }

  test("ASUMS with a low threshold keeps the most specific supported value") {
    val recs = Vector(
      repro.data.Record(0, 0, LibertyIsland), repro.data.Record(0, 1, LibertyIsland),
      repro.data.Record(0, 2, NY),
    )
    val ds = TdDataset(Fixtures.geo, 1, 3, recs, Array(LibertyIsland))
    val st = new AsumsInference(threshold = 0.5).infer(ds.views, empty(ds))
    assert(st.truthValues(0) == LibertyIsland)
  }

  test("DOCS maps objects to top-level hierarchy domains") {
    val ds = Fixtures.table1World()
    val d0 = Domains.topLevelDomain(ds.hierarchy)(ds.views, 0) // Statue of Liberty: USA claims dominate
    val d1 = Domains.topLevelDomain(ds.hierarchy)(ds.views, 1) // Big Ben: UK claims dominate
    assert(d0 == USA)
    assert(d1 == UK)
  }

  test("ACCU copy detection flags sources that share false values, not truth-tellers") {
    // sources 0/1 independently claim the truth; 2/3 always copy the same wrong value
    val recs = (0 until 30).flatMap { o =>
      val t = if (o % 2 == 0) London else Manchester
      val wrong = if (o % 2 == 0) Manchester else London
      Vector(
        repro.data.Record(o, 0, t), repro.data.Record(o, 1, t),
        repro.data.Record(o, 2, wrong), repro.data.Record(o, 3, wrong),
      )
    }.toVector
    val ds = TdDataset(Fixtures.geo, 30, 4, recs, Array.tabulate(30)(o => if (o % 2 == 0) London else Manchester))
    // with the truth fixed at gold, kf is maximal for the copier pair
    val truthIdx = Array.tabulate(30)(o => ds.views(o).candIndex(ds.gold(o)))
    val dep = new AccuInference(popularityFalse = false).dependenceFor(ds.views, truthIdx)
    val copiers = dep(((false, 2), (false, 3)))
    val honest = dep(((false, 0), (false, 1)))
    assert(copiers > 0.9, s"copier dependence=$copiers")
    assert(copiers > honest, s"copiers=$copiers honest=$honest")
  }

  test("ACCU resolves contested objects when honest sources have corroborating history") {
    // 40 uncontested objects raise the honest sources' accuracy; on 20
    // contested objects 3 honest sources face 3 copiers sharing a wrong value
    val recs = Vector.newBuilder[repro.data.Record]
    for (o <- 0 until 40; s <- 0 until 3) recs += repro.data.Record(o, s, London)
    for (o <- 40 until 60) {
      for (s <- 0 until 3) recs += repro.data.Record(o, s, London)
      for (s <- 3 until 6) recs += repro.data.Record(o, s, Manchester)
    }
    val ds = TdDataset(Fixtures.geo, 60, 6, recs.result(), Array.fill(60)(London))
    val st = new AccuInference(popularityFalse = false).infer(ds.views, empty(ds))
    val acc = Metrics.accuracy(ds, st.truthValues)
    assert(acc > 0.9, s"accuracy=$acc")
  }

  test("LFC-MT and LTM produce non-empty truth sets containing a candidate value") {
    val ds = Fixtures.table1World(extraObjects = 10)
    for (alg <- Seq(LfcMt, Ltm)) {
      val sets = alg.inferSets(ds.views, empty(ds))
      assert(sets.length == ds.numObjects)
      sets.zipWithIndex.foreach { case (s, o) =>
        assert(s.nonEmpty, s"${alg.name} empty set for $o")
        assert(s.subsetOf(ds.views(o).cands.toSet), s"${alg.name} non-candidate value")
      }
    }
  }

  test("DART returns high-recall sets (supersets of single best value)") {
    val ds = Fixtures.table1World(extraObjects = 10)
    val dart = new DartInference(Domains.topLevelDomain(ds.hierarchy))
    val sets = dart.inferSets(ds.views, empty(ds))
    sets.zipWithIndex.foreach { case (s, o) => assert(s.nonEmpty, s"obj $o") }
    // DART with its low threshold should usually output more values than LTM
    val ltmSets = Ltm.inferSets(ds.views, empty(ds))
    assert(sets.map(_.size).sum >= ltmSets.map(_.size).sum)
  }

  test("multi-truth expansion of single-truth output scores high precision for TDH") {
    val sets = new TdhInference().infer(small.views, empty(small)).truthValues
      .map(v => Metrics.multiTruthSet(small.hierarchy, v))
    val (p, r, f1) = Metrics.multiTruthPRF(small, sets)
    assert(p > 0.7 && r > 0.6 && f1 > 0.65, s"p=$p r=$r f1=$f1")
  }

  test("answers influence all EM baselines") {
    val flat = Fixtures.flatWorld()
    val v1 = flat.views(1)
    val log = empty(flat)
    (0 until 6).foreach(w => log.add(1, w, v1.candIndex(Manchester)))
    for (alg <- Seq(new LcaInference(), new MdcInference(), new CrhInference(), new LfcInference())) {
      val st = alg.infer(flat.views, log)
      assert(st.truthValues(1) == Manchester, s"${alg.name} ignored crowd answers")
    }
  }
}

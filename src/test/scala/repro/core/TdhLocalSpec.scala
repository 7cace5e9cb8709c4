package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures
import repro.Fixtures._
import repro.data.{AnswerLog, TdDataset, TruthDataGen}
import repro.eval.Metrics

class TdhLocalSpec extends AnyFunSuite {

  private def empty(ds: TdDataset) = new AnswerLog(ds.numObjects)

  // ---- probability kernels -------------------------------------------------

  test("pSrc sums to 1 over claims when every case is feasible (o in O_H)") {
    val ds = Fixtures.table1World()
    val view = ds.views(0)
    val phi = Array(0.6, 0.25, 0.15)
    for (v <- 0 until view.nCands if view.anc(v).nonEmpty) {
      val s = (0 until view.nCands).map(u => TdhProb.pSrc(view, phi, u, v)).sum
      assert(math.abs(s - 1.0) < 1e-12, s"v=$v sum=$s")
    }
  }

  test("pSrc loses phi2 mass when the truth has no candidate ancestors (model as defined)") {
    val ds = Fixtures.table1World()
    val view = ds.views(0)
    val phi = Array(0.6, 0.25, 0.15)
    val nyIdx = view.candIndex(NY) // NY has no candidate ancestors
    val s = (0 until view.nCands).map(u => TdhProb.pSrc(view, phi, u, nyIdx)).sum
    assert(math.abs(s - (phi(0) + phi(2))) < 1e-12)
  }

  test("pSrc for o not in O_H merges phi1 and phi2 on the exact value (Eq. 2)") {
    val flat = Fixtures.flatWorld()
    val view = flat.views(0) // candidates LibertyIsland, LA
    val phi = Array(0.6, 0.25, 0.15)
    val v = 0
    assert(math.abs(TdhProb.pSrc(view, phi, v, v) - 0.85) < 1e-12)
    assert(math.abs(TdhProb.pSrc(view, phi, 1 - v, v) - 0.15) < 1e-12)
  }

  test("pWkr sums to 1 over answers for a hierarchical object") {
    val ds = Fixtures.table1World()
    val view = ds.views(0)
    val psi = Array(0.7, 0.2, 0.1)
    val liIdx = view.candIndex(LibertyIsland)
    val s = (0 until view.nCands).map(u => TdhProb.pWkr(view, psi, u, liIdx)).sum
    assert(math.abs(s - 1.0) < 1e-9)
  }

  test("Pop2/Pop3 are popularity-weighted and fall back to uniform") {
    val ds = Fixtures.table1World()
    val view = ds.views(0)
    val liIdx = view.candIndex(LibertyIsland)
    val nyIdx = view.candIndex(NY)
    val laIdx = view.candIndex(LA)
    assert(TdhProb.pop2(view, nyIdx, liIdx) == 1.0) // only generalized claim is NY
    assert(TdhProb.pop3(view, laIdx, liIdx) == 1.0) // only wrong claim is LA
    // truth = NY: pop2den is 0 -> uniform fallback over the (empty->1) set
    assert(TdhProb.pop2(view, liIdx, nyIdx) == 1.0)
  }

  test("relType classifies exact / generalized / wrong") {
    val ds = Fixtures.table1World()
    val view = ds.views(0)
    val li = view.candIndex(LibertyIsland); val ny = view.candIndex(NY); val la = view.candIndex(LA)
    assert(TdhProb.relType(view, li, li) == 1)
    assert(TdhProb.relType(view, ny, li) == 2) // NY generalizes LibertyIsland
    assert(TdhProb.relType(view, la, li) == 3)
    assert(TdhProb.relType(view, li, ny) == 3) // a descendant is NOT a generalized value
  }

  test("argmaxTruth breaks ties toward the deeper candidate") {
    val ds = Fixtures.table1World()
    val view = ds.views(0)
    val mu = Array.fill(view.nCands)(1.0 / view.nCands)
    assert(view.cands(TdhProb.argmaxTruth(view, mu)) == LibertyIsland)
  }

  // ---- EM end-to-end -------------------------------------------------------

  test("TDH resolves Table 1: Statue of Liberty on Liberty Island, Big Ben in London") {
    val ds = Fixtures.table1World()
    val res = TdhLocal.run(ds.views, empty(ds))
    val truths = res.truthValues(ds.views)
    assert(truths(0) == LibertyIsland)
    assert(truths(1) == London)
  }

  test("mu is a probability distribution for every object") {
    val ds = Fixtures.table1World()
    val res = TdhLocal.run(ds.views, empty(ds))
    res.mu.foreach { m =>
      assert(math.abs(m.sum - 1.0) < 1e-6)
      m.foreach(p => assert(p >= 0 && p <= 1 + 1e-9))
    }
  }

  test("phi and psi are probability distributions") {
    val ds = Fixtures.table1World()
    val log = empty(ds)
    log.add(0, 0, ds.views(0).candIndex(LibertyIsland))
    log.add(1, 0, ds.views(1).candIndex(London))
    val res = TdhLocal.run(ds.views, log)
    (res.phi.values ++ res.psi.values).foreach { p =>
      assert(p.length == 3 && math.abs(p.sum - 1.0) < 1e-6)
    }
    assert(res.psi.contains(0))
  }

  test("muNum/muDen are consistent with mu (N/D of Eq. 9)") {
    val ds = Fixtures.table1World()
    val res = TdhLocal.run(ds.views, empty(ds))
    for (o <- 0 until ds.numObjects; j <- 0 until ds.views(o).nCands)
      assert(math.abs(res.muNum(o)(j) / res.muDen(o) - res.mu(o)(j)) < 1e-9)
  }

  test("the generalizing source gets high phi2, the exact source high phi1, the bad one high phi3") {
    val ds = Fixtures.table1World(extraObjects = 40)
    val res = TdhLocal.run(ds.views, empty(ds))
    assert(res.phi(1)(0) > 0.6, s"exact source phi=${res.phi(1).toSeq}")
    assert(res.phi(0)(1) > 0.4, s"generalizing source phi=${res.phi(0).toSeq}")
    assert(res.phi(2)(2) > 0.5, s"wrong source phi=${res.phi(2).toSeq}")
  }

  test("worker answers shift the confidence toward the answered value") {
    val ds = Fixtures.flatWorld()
    val before = TdhLocal.run(ds.views, empty(ds))
    val log = empty(ds)
    // two confident workers vote London for object 1 (tied 'London' vs 'Manchester'?)
    val view = ds.views(1)
    log.add(1, 0, view.candIndex(London))
    log.add(1, 1, view.candIndex(London))
    val after = TdhLocal.run(ds.views, log)
    val lIdx = view.candIndex(London)
    assert(after.mu(1)(lIdx) > before.mu(1)(lIdx))
    assert(after.truthValues(ds.views)(1) == London)
  }

  test("EM is deterministic") {
    val ds = Fixtures.table1World()
    val a = TdhLocal.run(ds.views, empty(ds))
    val b = TdhLocal.run(ds.views, empty(ds))
    for (o <- 0 until ds.numObjects)
      assert(a.mu(o).toSeq == b.mu(o).toSeq)
  }

  test("TDH beats VOTE on a generated BirthPlaces-like dataset (the paper's headline)") {
    val ds = TruthDataGen.generate(TruthDataGen.birthPlacesConfig.copy(numObjects = 600, targetRecords = 1351, seed = 3))
    val tdh = TdhLocal.run(ds.views, empty(ds))
    val tdhAcc = Metrics.accuracy(ds, tdh.truthValues(ds.views))
    val vote = new repro.baselines.VoteInference().infer(ds.views, empty(ds))
    val voteAcc = Metrics.accuracy(ds, vote.truthValues)
    assert(tdhAcc > voteAcc, s"tdh=$tdhAcc vote=$voteAcc")
    assert(tdhAcc > 0.75, s"tdh=$tdhAcc")
  }

  test("TDH recovers planted source trustworthiness directionally") {
    val cfg = TruthDataGen.birthPlacesConfig.copy(numObjects = 800, targetRecords = 5000, seed = 11)
    val ds = TruthDataGen.generate(cfg)
    val planted = TruthDataGen.sourcePhis(cfg)
    val res = TdhLocal.run(ds.views, empty(ds))
    // correlation between planted and estimated phi1 should be clearly positive
    val pairs = res.phi.toSeq.map { case (s, p) => (planted(s)._1, p(0)) }
    val corr = pearson(pairs)
    assert(corr > 0.6, s"corr=$corr pairs=$pairs")
  }

  private def pearson(xs: Seq[(Double, Double)]): Double = {
    val n = xs.size
    val (mx, my) = (xs.map(_._1).sum / n, xs.map(_._2).sum / n)
    val cov = xs.map { case (a, b) => (a - mx) * (b - my) }.sum
    val sx = math.sqrt(xs.map(p => sq(p._1 - mx)).sum)
    val sy = math.sqrt(xs.map(p => sq(p._2 - my)).sum)
    cov / math.max(1e-12, sx * sy)
  }
  private def sq(x: Double) = x * x
}

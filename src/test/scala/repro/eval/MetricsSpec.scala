package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures
import repro.Fixtures._
import repro.data.{Record, TdDataset}

class MetricsSpec extends AnyFunSuite {

  private val ds = Fixtures.table1World(extraObjects = 0) // 2 objects

  test("accuracy counts exact matches of the mapped gold") {
    assert(Metrics.accuracy(ds, Array(LibertyIsland, London)) == 1.0)
    assert(Metrics.accuracy(ds, Array(NY, London)) == 0.5)
    assert(Metrics.accuracy(ds, Array(NY, Manchester)) == 0.0)
  }

  test("genAccuracy also accepts ancestors of the gold") {
    assert(Metrics.genAccuracy(ds, Array(NY, UK)) == 1.0) // NY and UK generalize the truths
    assert(Metrics.genAccuracy(ds, Array(LA, Manchester)) == 0.0)
    assert(Metrics.genAccuracy(ds, Array(USA, Manchester)) == 0.5)
  }

  test("genAccuracy does not accept descendants or the root") {
    val d = TdDataset(Fixtures.geo, 1, 1, Vector(Record(0, 0, NY)), Array(NY))
    assert(Metrics.genAccuracy(d, Array(LibertyIsland)) == 0.0)
    assert(Metrics.genAccuracy(d, Array(0)) == 0.0)
  }

  test("avgDistance averages hierarchy edge distances") {
    // d(NY, LibertyIsland)=1, d(London, London)=0 -> 0.5
    assert(Metrics.avgDistance(ds, Array(NY, London)) == 0.5)
    // d(LA, LibertyIsland)=5? LA->CA->USA + USA->NY->LI = 2+... LA depth3, LI depth3, lca USA depth1 -> 4
    assert(Metrics.avgDistance(ds, Array(LA, London)) == 2.0)
  }

  test("multiTruthSet expands to the value plus its non-root ancestors") {
    assert(Metrics.multiTruthSet(Fixtures.geo, LibertyIsland) == Set(LibertyIsland, NY, USA))
    assert(Metrics.multiTruthSet(Fixtures.geo, USA) == Set(USA))
  }

  test("multiTruthPRF on perfect estimates is (1, 1, 1)") {
    val est = Array(Metrics.multiTruthSet(Fixtures.geo, LibertyIsland), Metrics.multiTruthSet(Fixtures.geo, London))
    val (p, r, f1) = Metrics.multiTruthPRF(ds, est)
    assert(p == 1.0 && r == 1.0 && f1 == 1.0)
  }

  test("multiTruthPRF: generalized estimates have perfect precision, partial recall") {
    // object 0 gold LibertyIsland (set {LI, NY, USA}); estimate {NY, USA}
    val est = Array(Set(NY, USA), Metrics.multiTruthSet(Fixtures.geo, London))
    val (p, r, _) = Metrics.multiTruthPRF(ds, est)
    assert(p == 1.0)
    assert(math.abs(r - (2.0 / 3 + 1.0) / 2) < 1e-12)
  }

  test("multiTruthPRF: wrong values hurt precision") {
    val est = Array(Set(LibertyIsland, NY, USA, LA), Metrics.multiTruthSet(Fixtures.geo, London))
    val (p, r, f1) = Metrics.multiTruthPRF(ds, est)
    assert(math.abs(p - (3.0 / 4 + 1.0) / 2) < 1e-12)
    assert(r == 1.0)
    assert(f1 > 0.8 && f1 < 1.0)
  }

  test("empty estimate sets contribute zero precision and recall") {
    val est = Array(Set.empty[Int], Metrics.multiTruthSet(Fixtures.geo, London))
    val (p, r, _) = Metrics.multiTruthPRF(ds, est)
    assert(p == 0.5 && math.abs(r - 0.5) < 1e-12)
  }

  test("mae computes the mean absolute error") {
    assert(Metrics.mae(Array(1.0, 2.0), Array(1.5, 1.0)) == 0.75)
    assert(Metrics.mae(Array(3.0), Array(3.0)) == 0.0)
  }

  test("relativeError skips zero golds and averages |err|/|gold|") {
    assert(math.abs(Metrics.relativeError(Array(2.0, 0.0, -4.0), Array(1.0, 5.0, -2.0)) - 0.5) < 1e-12)
    assert(Metrics.relativeError(Array(0.0), Array(9.0)) == 0.0)
  }
}

package repro.data

import org.scalatest.funsuite.AnyFunSuite

class TruthDataGenSpec extends AnyFunSuite {

  private lazy val bp = TruthDataGen.birthPlaces()
  private lazy val hg = TruthDataGen.heritages()

  test("BirthPlaces-like: object/source counts match the paper's statistics") {
    assert(bp.numObjects == 6005)
    assert(bp.numSources == 7)
  }

  test("BirthPlaces-like: record count is close to 13,510") {
    assert(math.abs(bp.records.size - 13510) < 13510 * 0.1, s"records=${bp.records.size}")
  }

  test("BirthPlaces-like: hierarchy size and height match the paper (4,999 nodes, height 5)") {
    assert(math.abs(bp.hierarchy.size - 4999) <= 500, s"nodes=${bp.hierarchy.size}")
    assert(bp.hierarchy.height == 5)
  }

  test("BirthPlaces-like: average source accuracy is near the paper's 72.1%") {
    val acc = bp.records.count(r => r.value == bp.gold(r.obj)).toDouble / bp.records.size
    assert(math.abs(acc - 0.721) < 0.07, s"avg source accuracy=$acc")
  }

  test("Heritages-like: counts match the paper's statistics") {
    assert(hg.numObjects == 785)
    assert(hg.numSources == 1577)
    assert(math.abs(hg.records.size - 4424) < 4424 * 0.15, s"records=${hg.records.size}")
    assert(math.abs(hg.hierarchy.size - 1027) <= 120, s"nodes=${hg.hierarchy.size}")
    assert(hg.hierarchy.height == 6)
  }

  test("Heritages-like: average source accuracy is near the paper's 58%") {
    val acc = hg.records.count(r => r.value == hg.gold(r.obj)).toDouble / hg.records.size
    assert(math.abs(acc - 0.58) < 0.08, s"avg source accuracy=$acc")
  }

  test("Heritages-like: source participation is long-tailed (most sources claim few objects)") {
    val perSource = hg.records.groupBy(_.source).view.mapValues(_.size)
    val small = perSource.values.count(_ <= 10)
    assert(small.toDouble / perSource.size > 0.7, s"fraction of small sources=${small.toDouble / perSource.size}")
    assert(perSource.values.max > 20, "the head of the zipf should claim many objects")
  }

  test("every object has at least one record") {
    val covered = bp.records.map(_.obj).toSet
    assert(covered.size == bp.numObjects)
    assert(hg.records.map(_.obj).toSet.size == hg.numObjects)
  }

  test("claims never use the hierarchy root") {
    assert(bp.records.forall(_.value != 0))
    assert(hg.records.forall(_.value != 0))
  }

  test("generalized claims exist (sources do generalize, Fig. 1)") {
    val genClaims = bp.records.count { r =>
      r.value != bp.gold(r.obj) && bp.hierarchy.isAncestor(r.value, bp.gold(r.obj))
    }
    assert(genClaims > bp.records.size * 0.02, s"generalized=$genClaims")
  }

  test("generation is deterministic in the seed") {
    val a = TruthDataGen.birthPlaces(seed = 99)
    val b = TruthDataGen.birthPlaces(seed = 99)
    assert(a.records == b.records && a.gold.sameElements(b.gold))
  }

  test("different seeds give different datasets") {
    val a = TruthDataGen.heritages(seed = 1)
    val b = TruthDataGen.heritages(seed = 2)
    assert(a.records != b.records)
  }

  test("sourcePhis are valid distributions with the configured mean") {
    val phis = TruthDataGen.sourcePhis(TruthDataGen.heritagesConfig)
    phis.foreach { case (p1, p2, p3) =>
      assert(p1 > 0 && p2 >= 0 && p3 > 0)
      assert(math.abs(p1 + p2 + p3 - 1.0) < 0.01)
    }
    val mean1 = phis.map(_._1).sum / phis.length
    assert(math.abs(mean1 - 0.58) < 0.05, s"mean phi1=$mean1")
  }

  test("a fair share of objects are in O_H (candidate ancestor-descendant pairs exist)") {
    val frac = bp.views.count(_.inOH).toDouble / bp.numObjects
    assert(frac > 0.1, s"O_H fraction=$frac")
  }
}

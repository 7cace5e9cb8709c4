package repro.tables

import org.scalatest.funsuite.AnyFunSuite
import repro.data.{StockGen, TruthDataGen}

class TablesSpec extends AnyFunSuite {

  private lazy val small = TruthDataGen.generate(
    TruthDataGen.birthPlacesConfig.copy(numObjects = 150, targetRecords = 500, hierNodes = 300, seed = 12))

  test("datasets() provides the two paper datasets") {
    val names = Tables.datasets().map(_._1)
    assert(names == Seq("BirthPlaces", "Heritages"))
  }

  test("table3 produces one row per algorithm with metrics in range") {
    val rows = Tables.table3(small)
    assert(rows.map(_.algorithm) ==
      Seq("TDH", "VOTE", "LCA", "DOCS", "ASUMS", "MDC", "ACCU", "POPACCU", "LFC", "CRH"))
    rows.foreach { r =>
      assert(r.accuracy >= 0 && r.accuracy <= 1, r.algorithm)
      assert(r.genAccuracy >= r.accuracy - 1e-9, s"${r.algorithm}: genAcc below acc")
      assert(r.avgDistance >= 0, r.algorithm)
    }
  }

  test("combos() lists exactly the 17 feasible pairs of Table 4") {
    val pairs = Tables.combos(small).map { case (i, a) => (i.name, a.name) }
    assert(pairs.size == 17)
    assert(pairs.count(_._1 == "TDH") == 3)
    assert(pairs.contains(("TDH", "EAI")) && pairs.contains(("DOCS", "MB")))
    assert(!pairs.contains(("TDH", "MB")) && !pairs.contains(("VOTE", "QASCA")))
    assert(pairs.count(_._2 == "ME") == 10) // every inference algorithm works with ME
  }

  test("table4 runs a short crowdsourcing sweep with traces of the right length") {
    val tiny = TruthDataGen.generate(
      TruthDataGen.birthPlacesConfig.copy(numObjects = 80, targetRecords = 260, hierNodes = 200, seed = 9))
    val res = Tables.table4(tiny, rounds = 2)
    assert(res.size == 17)
    res.foreach { r =>
      assert(r.trace.length == 3, s"${r.inference}+${r.assignment}")
      assert(r.accuracyAt50 == r.trace.last.accuracy)
    }
  }

  test("table5 produces 13 rows (10 single-truth + 3 multi-truth)") {
    val rows = Tables.table5(small)
    assert(rows.size == 13)
    assert(rows.takeRight(3).map(_.algorithm) == Seq("LFC-MT", "DART", "LTM"))
  }

  test("table6 covers 6 algorithms x 3 attributes") {
    val rows = Tables.table6(StockGen.Config(numSymbols = 60))
    assert(rows.size == 18)
    assert(rows.map(_.attr).distinct == Seq("change rate", "open price", "EPS"))
    rows.foreach(r => assert(r.mae >= 0 && !r.mae.isNaN))
  }

  test("paper reference tables are complete") {
    assert(PaperNumbers.table3BirthPlaces.size == 10)
    assert(PaperNumbers.table3Heritages.size == 10)
    assert(PaperNumbers.table4BirthPlaces.size == 17)
    assert(PaperNumbers.table4Heritages.size == 17)
    assert(PaperNumbers.table5BirthPlaces.size == 13)
    assert(PaperNumbers.table5Heritages.size == 13)
    assert(PaperNumbers.table6.size == 18)
  }

  test("fmt renders 4 decimal places") {
    assert(Tables.fmt(0.89131) == "0.8913")
    assert(Tables.fmt(1.0) == "1.0000")
  }
}

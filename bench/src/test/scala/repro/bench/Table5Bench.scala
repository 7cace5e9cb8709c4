package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tables.{PaperNumbers, Tables}

/** Reproduces Table 5 (§5.7): multi-truth precision/recall/F1 of the
  * single-truth algorithms (estimates expanded with their ancestors) and the
  * multi-truth algorithms LFC-MT, DART and LTM.
  */
class Table5Bench extends AnyFunSuite {

  private lazy val results = Tables.datasets().map { case (name, ds) => (name, Tables.table5(ds)) }

  test("Table 5: print paper-vs-measured rows") {
    for ((name, rows) <- results) {
      val paper = if (name == "BirthPlaces") PaperNumbers.table5BirthPlaces else PaperNumbers.table5Heritages
      println(s"== Table 5 — $name ==")
      println(f"${"algorithm"}%-9s ${"P"}%7s ${"(ppr)"}%7s ${"R"}%7s ${"(ppr)"}%7s ${"F1"}%7s ${"(ppr)"}%7s")
      rows.foreach { r =>
        val p = paper.get(r.algorithm)
        def pp(f: ((Double, Double, Double)) => Double) = p.map(v => Tables.fmt(f(v))).getOrElse("-")
        println(f"${r.algorithm}%-9s ${Tables.fmt(r.precision)}%7s ${pp(_._1)}%7s ${Tables.fmt(r.recall)}%7s ${pp(_._2)}%7s ${Tables.fmt(r.f1)}%7s ${pp(_._3)}%7s")
      }
    }
  }

  test("Table 5 shape: TDH has the best F1 on both datasets") {
    for ((name, rows) <- results) {
      val tdh = rows.find(_.algorithm == "TDH").get
      for (r <- rows if r.algorithm != "TDH")
        assert(tdh.f1 >= r.f1 - 1e-9, s"$name: TDH=${tdh.f1} vs ${r.algorithm}=${r.f1}")
    }
  }

  test("Table 5 shape: DART is recall-heavy (recall > precision), as in the paper") {
    for ((name, rows) <- results) {
      val dart = rows.find(_.algorithm == "DART").get
      assert(dart.recall > dart.precision, s"$name: DART P=${dart.precision} R=${dart.recall}")
    }
  }

  test("Table 5 shape: every metric is a valid proportion") {
    for ((_, rows) <- results; r <- rows) {
      assert(r.precision >= 0 && r.precision <= 1)
      assert(r.recall >= 0 && r.recall <= 1)
      assert(r.f1 >= 0 && r.f1 <= 1)
    }
  }
}

package repro.numeric

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{NumericDataset, NumericHierarchy}
import repro.data.StockGen
import repro.eval.Metrics

class NumericSpec extends AnyFunSuite {

  test("precision counts significant digits") {
    assert(NumericHierarchy.precision("605.196") == 6)
    assert(NumericHierarchy.precision("605.2") == 4)
    assert(NumericHierarchy.precision("605") == 3)
    assert(NumericHierarchy.precision("0.0006") == 1)
    assert(NumericHierarchy.precision("605.20") == 5)
  }

  test("roundToSig matches the paper's example: 605.196 -> 605.2 -> 605") {
    import java.math.{BigDecimal => JBD}
    assert(NumericHierarchy.roundToSig(new JBD("605.196"), 4).compareTo(new JBD("605.2")) == 0)
    assert(NumericHierarchy.roundToSig(new JBD("605.196"), 3).compareTo(new JBD("605")) == 0)
  }

  test("isAncestor: a value is an ancestor of anything that rounds to it") {
    assert(NumericHierarchy.isAncestorStr("605.2", "605.196"))
    assert(NumericHierarchy.isAncestorStr("605", "605.196"))
    assert(NumericHierarchy.isAncestorStr("605", "605.2"))
    assert(!NumericHierarchy.isAncestorStr("605.196", "605.2")) // not upward
    assert(!NumericHierarchy.isAncestorStr("605.2", "605.2")) // strict
    assert(!NumericHierarchy.isAncestorStr("606", "605.196")) // rounds to 605, not 606
  }

  test("NumericDataset builds views with the rounding hierarchy") {
    val ds = NumericDataset.fromClaims(1, 3,
      Seq((0, 0, "605.196"), (0, 1, "605.2"), (0, 2, "605")), Array(605.196))
    val v = ds.views(0)
    assert(v.nCands == 3)
    assert(v.inOH)
    val fullIdx = v.cands.indices.find(j => ds.values(v.cands(j)) == "605.196").get
    assert(v.anc(fullIdx).length == 2) // both 605.2 and 605 generalize it
  }

  test("StockGen is deterministic and covers every symbol") {
    val a = StockGen.generate(StockGen.Eps)
    val b = StockGen.generate(StockGen.Eps)
    assert(a.values.sameElements(b.values))
    assert(a.numObjects == 1000)
    assert(a.claims.forall(_.nonEmpty))
  }

  test("StockGen attributes have the intended scales") {
    val cr = StockGen.generate(StockGen.ChangeRate)
    val op = StockGen.generate(StockGen.OpenPrice)
    assert(cr.gold.forall(g => math.abs(g) < 0.5))
    assert(op.gold.forall(g => g >= 5 && g <= 500))
  }

  test("rounding habits create ancestor chains in the stock data") {
    val ds = StockGen.generate(StockGen.OpenPrice)
    val withHier = ds.views.count(_.inOH)
    assert(withHier > ds.numObjects / 2, s"objects with hierarchy=$withHier")
  }

  test("all numeric algorithms return finite estimates") {
    val ds = StockGen.generate(StockGen.Eps, StockGen.Config(numSymbols = 120))
    val outs = Map(
      "TDH" -> NumericAlgorithms.tdh(ds),
      "LCA" -> NumericAlgorithms.lca(ds),
      "VOTE" -> NumericAlgorithms.vote(ds),
      "CRH" -> NumericAlgorithms.crh(ds),
      "CATD" -> NumericAlgorithms.catd(ds),
      "MEAN" -> NumericAlgorithms.mean(ds),
    )
    for ((name, est) <- outs) {
      assert(est.length == ds.numObjects, name)
      est.foreach(x => assert(!x.isNaN && !x.isInfinity, s"$name produced $x"))
    }
  }

  test("TDH beats MEAN on outlier-ridden numeric data (Table 6 shape)") {
    val ds = StockGen.generate(StockGen.Eps, StockGen.Config(numSymbols = 300))
    val maeTdh = Metrics.mae(ds.gold, NumericAlgorithms.tdh(ds))
    val maeMean = Metrics.mae(ds.gold, NumericAlgorithms.mean(ds))
    assert(maeTdh < maeMean, s"tdh=$maeTdh mean=$maeMean")
  }

  test("CRH weighting beats plain MEAN") {
    val ds = StockGen.generate(StockGen.OpenPrice, StockGen.Config(numSymbols = 300))
    val maeCrh = Metrics.mae(ds.gold, NumericAlgorithms.crh(ds))
    val maeMean = Metrics.mae(ds.gold, NumericAlgorithms.mean(ds))
    assert(maeCrh < maeMean, s"crh=$maeCrh mean=$maeMean")
  }

  test("chi-square quantile approximation is sane") {
    // chi2(0.975, 10) ~= 20.48
    assert(math.abs(NumericAlgorithms.chiSquareQuantile(0.975, 10) - 20.48) < 0.5)
    // chi2(0.975, 1) ~= 5.02
    assert(math.abs(NumericAlgorithms.chiSquareQuantile(0.975, 1) - 5.02) < 0.6)
  }

  test("normal quantile approximation is sane") {
    assert(math.abs(NumericAlgorithms.normalQuantile(0.975) - 1.96) < 0.01)
    assert(math.abs(NumericAlgorithms.normalQuantile(0.5)) < 1e-9)
    assert(NumericAlgorithms.normalQuantile(0.025) < -1.9)
  }

  test("estimates() maps chosen candidates to their numeric values") {
    val ds = NumericDataset.fromClaims(1, 2, Seq((0, 0, "2.5"), (0, 1, "3.0")), Array(2.5))
    val v = ds.views(0)
    val idx25 = v.cands.indices.find(j => ds.values(v.cands(j)) == "2.5").get
    assert(ds.estimates(Array(idx25))(0) == 2.5)
  }
}

package repro.numeric

import java.math.{BigDecimal => JBD}

import org.scalatest.funsuite.AnyFunSuite
import repro.core.NumericHierarchy
import repro.data.StockGen
import repro.eval.Metrics

import scala.util.Random

/** Property-style invariants of the implicit rounding hierarchy and the
  * numeric pipeline over many random values and seeds.
  */
class NumericInvariantsSpec extends AnyFunSuite {

  private val rnd = new Random(17)

  test("rounding to k significant digits yields a value of precision <= k (100 random values)") {
    for (_ <- 1 to 100) {
      val x = (rnd.nextDouble() - 0.3) * math.pow(10, rnd.nextInt(6) - 2)
      val bd = new JBD(x.toString)
      for (k <- 1 to 5) {
        assert(NumericHierarchy.roundToSig(bd, k).precision() <= k, s"x=$x k=$k")
      }
    }
  }

  test("rounding chains form ancestor chains (100 random values)") {
    for (_ <- 1 to 100) {
      val x = 1.0 + rnd.nextDouble() * 998.0
      val full = new JBD(x.toString).round(new java.math.MathContext(6))
      val mid = NumericHierarchy.roundToSig(full, 3)
      val top = NumericHierarchy.roundToSig(full, 1)
      if (mid.precision() < full.precision())
        assert(NumericHierarchy.isAncestor(mid, full), s"x=$x mid=$mid full=$full")
      if (top.precision() < mid.precision() && NumericHierarchy.roundToSig(mid, top.precision()).compareTo(top) == 0)
        assert(NumericHierarchy.isAncestor(top, mid), s"x=$x top=$top mid=$mid")
    }
  }

  test("isAncestor is antisymmetric and irreflexive over random pairs") {
    for (_ <- 1 to 200) {
      val a = new JBD((rnd.nextDouble() * 100).toString).round(new java.math.MathContext(1 + rnd.nextInt(5)))
      val b = new JBD((rnd.nextDouble() * 100).toString).round(new java.math.MathContext(1 + rnd.nextInt(5)))
      assert(!NumericHierarchy.isAncestor(a, a))
      if (NumericHierarchy.isAncestor(a, b)) assert(!NumericHierarchy.isAncestor(b, a))
    }
  }

  for (attr <- StockGen.attrs; seed <- Seq(1L, 2L)) {
    test(s"${attr.name} seed=$seed: TDH estimate error never exceeds MEAN by much") {
      val ds = StockGen.generate(attr, StockGen.Config(numSymbols = 150, seed = seed))
      val tdh = Metrics.mae(ds.gold, NumericAlgorithms.tdh(ds))
      val mean = Metrics.mae(ds.gold, NumericAlgorithms.mean(ds))
      assert(tdh <= mean * 1.05 + 1e-9, s"tdh=$tdh mean=$mean")
    }

    test(s"${attr.name} seed=$seed: every algorithm's estimate is a finite number per object") {
      val ds = StockGen.generate(attr, StockGen.Config(numSymbols = 80, seed = seed))
      Seq(
        NumericAlgorithms.tdh(ds), NumericAlgorithms.lca(ds), NumericAlgorithms.vote(ds),
        NumericAlgorithms.crh(ds), NumericAlgorithms.catd(ds), NumericAlgorithms.mean(ds),
      ).foreach(est => est.foreach(x => assert(java.lang.Double.isFinite(x))))
    }
  }

  test("views of a single-claim object are trivial but valid") {
    val ds = repro.core.NumericDataset.fromClaims(1, 1, Seq((0, 0, "42.5")), Array(42.5))
    assert(ds.views(0).nCands == 1 && !ds.views(0).inOH)
    assert(NumericAlgorithms.tdh(ds)(0) == 42.5)
    assert(NumericAlgorithms.mean(ds)(0) == 42.5)
  }
}

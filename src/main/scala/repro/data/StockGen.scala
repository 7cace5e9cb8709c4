package repro.data

import java.math.{BigDecimal => JBigDecimal}

import repro.core.{NumericDataset, NumericHierarchy}

import scala.util.Random

/** Synthetic stand-in for the deep-web stock dataset of Li et al. (PVLDB
  * 2012) used in Table 6: 1,000 symbols, 55 sources, three numeric
  * attributes with very different scales (change rate ~ ±0.05, open price ~
  * 5–500, EPS ~ 0.05–15).
  *
  * Each source has a significant-digit habit (it publishes the truth rounded
  * to d_s digits — this creates the implicit rounding hierarchy) and an error
  * rate; a few sources emit order-of-magnitude outliers, which is what makes
  * MEAN/CATD-style weighted averaging collapse in the paper's Table 6.
  */
object StockGen {

  sealed trait Attr { def name: String }
  case object ChangeRate extends Attr { val name = "change rate" }
  case object OpenPrice extends Attr { val name = "open price" }
  case object Eps extends Attr { val name = "EPS" }

  val attrs: Seq[Attr] = Seq(ChangeRate, OpenPrice, Eps)

  final case class Config(
      numSymbols: Int = 1000,
      numSources: Int = 55,
      coverage: Double = 0.6,
      numOutlierSources: Int = 4,
      seed: Long = 2011L,
  )

  def generate(attr: Attr, cfg: Config = Config()): NumericDataset = {
    val rnd = new Random(cfg.seed ^ attr.name.hashCode.toLong)

    def goldOf(): Double = attr match {
      case ChangeRate => math.rint(rnd.nextGaussian() * 0.02 * 10000) / 10000.0
      case OpenPrice  => math.rint((5 + rnd.nextDouble() * 495) * 100) / 100.0
      case Eps        => math.rint((0.05 + rnd.nextDouble() * 14.95) * 100) / 100.0
    }
    val gold = Array.fill(cfg.numSymbols)(goldOf())

    // per-source habits
    val digits = Array.fill(cfg.numSources)(2 + rnd.nextInt(5)) // 2..6 significant digits
    val errRate = Array.tabulate(cfg.numSources) { s =>
      if (s < cfg.numOutlierSources) 0.45 else 0.02 + rnd.nextDouble() * 0.23
    }

    def fmt(x: Double, sig: Int): String =
      NumericHierarchy.roundToSig(new JBigDecimal(x.toString), sig).toPlainString

    val raw = Seq.newBuilder[(Int, Int, String)]
    for (o <- 0 until cfg.numSymbols) {
      val g = gold(o)
      // a shared wrong-value pool so false claims collide across sources
      val wrongPool = Array(
        g * (1 + 0.15 + rnd.nextDouble() * 0.3), // plausible but wrong
        g * 10.0, // order-of-magnitude outlier
        -g * (1 + rnd.nextDouble()), // sign-flip outlier
      )
      var claimed = 0
      for (s <- 0 until cfg.numSources) {
        if (rnd.nextDouble() < cfg.coverage || (s == cfg.numSources - 1 && claimed == 0)) {
          claimed += 1
          val v =
            if (rnd.nextDouble() >= errRate(s)) g
            else if (s < cfg.numOutlierSources) wrongPool(1 + rnd.nextInt(2)) // big outliers
            else wrongPool(0)
          val str = fmt(v, digits(s))
          raw += ((o, s, if (new JBigDecimal(str).signum() == 0 && v != 0) fmt(v, 6) else str))
        }
      }
    }
    NumericDataset.fromClaims(cfg.numSymbols, cfg.numSources, raw.result(), gold)
  }
}

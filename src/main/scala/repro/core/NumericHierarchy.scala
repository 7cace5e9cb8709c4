package repro.core

import java.math.{BigDecimal => JBigDecimal, MathContext, RoundingMode}

import repro.data.ObjectView

import scala.collection.mutable

/** The implicit hierarchy over numeric claims (§3.2 extension): a value v_a is
  * an ancestor of v_d iff v_a can be obtained by rounding v_d to v_a's number
  * of significant digits. Claimed values are kept as decimal strings so the
  * significant digits survive (605, 605.2 and 605.196 are three different
  * nodes of one chain).
  */
object NumericHierarchy {

  /** Significant digits of a decimal string ("605.2" -> 4, "0.0006" -> 1). */
  def precision(value: String): Int = new JBigDecimal(value).precision()

  /** Round to n significant digits, HALF_UP like the paper's 605.196 -> 605.2
    * example.
    */
  def roundToSig(value: JBigDecimal, n: Int): JBigDecimal =
    value.round(new MathContext(n, RoundingMode.HALF_UP))

  /** v_a is a (strict) generalization of v_d. */
  def isAncestor(a: JBigDecimal, d: JBigDecimal): Boolean =
    a.precision() < d.precision() && roundToSig(d, a.precision()).compareTo(a) == 0

  def isAncestorStr(a: String, d: String): Boolean =
    isAncestor(new JBigDecimal(a), new JBigDecimal(d))
}

/** A single-attribute numeric truth-discovery dataset (Table 6 substrate).
  *
  * @param values  dictionary id -> decimal string (claims reference ids)
  * @param claims  per object: (source, valueId) pairs
  * @param gold    gold numeric value per object
  */
final case class NumericDataset(
    values: Array[String],
    claims: Array[IndexedSeq[(Int, Int)]],
    gold: Array[Double],
    numSources: Int,
) {
  val numObjects: Int = claims.length

  /** id -> parsed numeric value. */
  lazy val numeric: Array[Double] = values.map(_.toDouble)

  private lazy val big: Array[JBigDecimal] = values.map(new JBigDecimal(_))

  /** Per-object views under the implicit rounding hierarchy; TDH and the
    * categorical baselines run on these unchanged.
    */
  lazy val views: Array[ObjectView] = Array.tabulate(numObjects) { o =>
    ObjectView.build(
      o,
      claims(o),
      (a, d) => NumericHierarchy.isAncestor(big(a), big(d)),
      id => big(id).precision(),
    )
  }

  /** Numeric estimate from chosen candidate indices. */
  def estimates(truthIdx: Array[Int]): Array[Double] =
    Array.tabulate(numObjects)(o => numeric(views(o).cands(truthIdx(o))))
}

object NumericDataset {
  /** Build from raw string claims (obj, source, decimal string). */
  def fromClaims(numObjects: Int, numSources: Int, raw: Seq[(Int, Int, String)], gold: Array[Double]): NumericDataset = {
    val dict = mutable.LinkedHashMap.empty[String, Int]
    def idOf(s: String): Int = dict.getOrElseUpdate(s, dict.size)
    val byObj = Array.fill(numObjects)(mutable.ArrayBuffer.empty[(Int, Int)])
    raw.foreach { case (o, s, v) => byObj(o) += ((s, idOf(v))) }
    NumericDataset(dict.keys.toArray, byObj.map(_.toIndexedSeq), gold, numSources)
  }
}

package repro.data

import repro.hier.Hierarchy

import scala.collection.mutable
import scala.util.Random

/** Configuration for a synthetic truth-discovery dataset.
  *
  * The generator follows the paper's own generative story (§3.1): every source
  * has a trustworthiness distribution φ_s = (exact, generalized, wrong) and
  * claims accordingly; wrong values are drawn from a per-object confusion pool
  * with a dominant wrong value so that false claims collide across sources
  * (the popularity effect Pop2/Pop3 models).
  *
  * @param phi1Mean      target mean of φ_s,1 — the paper reports the average
  *                      source accuracy (0.721 BirthPlaces, 0.580 Heritages)
  * @param phi1Spread    half-width of the uniform spread of φ_s,1
  * @param phi2Max       max generalization tendency (Fig. 1 shows sources
  *                      spread from ~0 to ~0.4)
  * @param longTail      Heritages-style zipf source participation (many
  *                      sources with a handful of claims each)
  */
final case class GenConfig(
    numObjects: Int,
    numSources: Int,
    targetRecords: Int,
    hierNodes: Int,
    hierHeight: Int,
    phi1Mean: Double,
    phi1Spread: Double,
    phi2Max: Double,
    longTail: Boolean,
    seed: Long,
    /** Extraction noise: fraction of wrong claims drawn uniformly from all
      * deep nodes instead of the object's confusion pool (§1: up to 96% of
      * false claims come from extraction errors).
      */
    noiseRate: Double = 0.30,
    /** Fraction of "hard" objects whose exact truth is never claimed by any
      * source — sources that would claim it hit the confusion pool instead.
      * These bound the reachable accuracy like the paper's real crawls do.
      */
    hardFrac: Double = 0.06,
)

object TruthDataGen {

  /** BirthPlaces-like: 6,005 objects, 7 sources, ~13,510 records,
    * hierarchy ~4,999 nodes of height 5, avg source accuracy ~72%.
    */
  val birthPlacesConfig: GenConfig = GenConfig(
    numObjects = 6005, numSources = 7, targetRecords = 13510,
    hierNodes = 4999, hierHeight = 5,
    phi1Mean = 0.721, phi1Spread = 0.17, phi2Max = 0.30,
    longTail = false, seed = 42L,
  )

  /** Heritages-like: 785 objects, 1,577 sources, ~4,424 records,
    * hierarchy ~1,027 nodes of height 6, avg source accuracy ~58%,
    * long-tail source participation.
    */
  val heritagesConfig: GenConfig = GenConfig(
    numObjects = 785, numSources = 1577, targetRecords = 4424,
    hierNodes = 1027, hierHeight = 6,
    phi1Mean = 0.580, phi1Spread = 0.22, phi2Max = 0.38,
    longTail = true, seed = 7L,
  )

  def birthPlaces(seed: Long = birthPlacesConfig.seed): TdDataset =
    generate(birthPlacesConfig.copy(seed = seed))

  def heritages(seed: Long = heritagesConfig.seed): TdDataset =
    generate(heritagesConfig.copy(seed = seed))

  /** Per-source trustworthiness distributions used by the generator (returned
    * for tests that verify TDH recovers them).
    */
  def sourcePhis(cfg: GenConfig): Array[(Double, Double, Double)] = {
    val rnd = new Random(cfg.seed ^ 0x5eedabadL)
    Array.fill(cfg.numSources) {
      val p1 = clamp(cfg.phi1Mean + (rnd.nextDouble() * 2 - 1) * cfg.phi1Spread, 0.05, 0.97)
      val p2 = math.min(rnd.nextDouble() * cfg.phi2Max, (1 - p1) * 0.95)
      (p1, p2, math.max(1e-3, 1 - p1 - p2))
    }
  }

  def generate(cfg: GenConfig): TdDataset = {
    val rnd = new Random(cfg.seed)
    val h = Hierarchy.randomTree(cfg.hierNodes, cfg.hierHeight, cfg.seed ^ 0xf00dL)
    val phis = sourcePhis(cfg)

    // Gold truths: mostly deep nodes (cities), occasionally internal ones.
    val deepNodes = (1 until h.size).filter(h.depth(_) >= math.max(2, cfg.hierHeight - 2)).toArray
    val midNodes = (1 until h.size).filter(n => h.depth(n) >= 2 && h.depth(n) < cfg.hierHeight - 2).toArray
    val gold = Array.fill(cfg.numObjects) {
      if (midNodes.isEmpty || rnd.nextDouble() < 0.85) deepNodes(rnd.nextInt(deepNodes.length))
      else midNodes(rnd.nextInt(midNodes.length))
    }

    // Confusion pool per object: siblings/cousins of the truth plus random
    // nodes. The head value gets a modest extra weight (vote traps exist, as
    // on the real web) but most false claims disagree with each other — the
    // long-tail-of-errors property that keeps wrong objects *uncertain*
    // rather than confidently wrong.
    def confusionPool(truth: Int): (Array[Int], Array[Double]) = {
      val sibs = h.children(h.parent(truth)).filter(_ != truth)
      val pool = mutable.LinkedHashSet.empty[Int]
      if (sibs.nonEmpty) pool += sibs(rnd.nextInt(sibs.length))
      while (pool.size < 5) {
        val n = deepNodes(rnd.nextInt(deepNodes.length))
        // a confusable wrong value is a *different* place: neither an
        // ancestor nor a descendant (a refinement) of the truth
        if (n != truth && !h.isAncestor(n, truth) && !h.isAncestor(truth, n)) pool += n
      }
      val arr = pool.toArray
      val w = Array.tabulate(arr.length)(i => if (i == 0) 0.35 else 0.65 / (arr.length - 1))
      (arr, w)
    }

    // Source participation per object.
    val zipfW = Array.tabulate(cfg.numSources)(i => 1.0 / math.pow(i + 1, 0.85))
    val zipfCum = zipfW.scanLeft(0.0)(_ + _).tail
    val zipfTotal = zipfCum.last
    def drawZipfSources(k: Int): Seq[Int] = {
      val picked = mutable.LinkedHashSet.empty[Int]
      var guard = 0
      while (picked.size < k && guard < 50 * k) {
        val x = rnd.nextDouble() * zipfTotal
        var lo = 0; var hi = cfg.numSources - 1
        while (lo < hi) { val m = (lo + hi) / 2; if (zipfCum(m) < x) lo = m + 1 else hi = m }
        picked += lo
        guard += 1
      }
      picked.toSeq
    }

    val records = Vector.newBuilder[Record]
    val pClaim = cfg.targetRecords.toDouble / (cfg.numObjects.toLong * cfg.numSources)
    val meanPerObj = cfg.targetRecords.toDouble / cfg.numObjects

    def drawWrong(truth: Int, pool: (Array[Int], Array[Double])): Int =
      if (rnd.nextDouble() < cfg.noiseRate) {
        // extraction error: an arbitrary deep node, colliding with nothing
        var n = deepNodes(rnd.nextInt(deepNodes.length))
        while (n == truth || h.isAncestor(n, truth) || h.isAncestor(truth, n))
          n = deepNodes(rnd.nextInt(deepNodes.length))
        n
      } else {
        val (vals, w) = pool
        var y = rnd.nextDouble(); var i = 0
        while (i < vals.length - 1 && y >= w(i)) { y -= w(i); i += 1 }
        vals(i)
      }

    def draw(objId: Int, s: Int, truth: Int, hard: Boolean, pool: (Array[Int], Array[Double])): Record = {
      val (p1, p2, _) = phis(s)
      val x = rnd.nextDouble()
      val ancs = h.ancestorsNoRoot(truth)
      val v =
        if (x < p1 || (x < p1 + p2 && ancs.isEmpty)) {
          if (hard) drawWrong(truth, pool) else truth
        } else if (x < p1 + p2) ancs(rnd.nextInt(ancs.size))
        else drawWrong(truth, pool)
      Record(objId, s, v)
    }

    for (o <- 0 until cfg.numObjects) {
      val hard = rnd.nextDouble() < cfg.hardFrac
      val pool = confusionPool(gold(o))
      val srcs: Seq[Int] =
        if (cfg.longTail) {
          // 1 + Poisson(mean-1) claims, sources drawn by zipf popularity
          val k = 1 + poisson(rnd, math.max(0.0, meanPerObj - 1))
          drawZipfSources(math.min(k, cfg.numSources))
        } else {
          val picked = (0 until cfg.numSources).filter(_ => rnd.nextDouble() < pClaim)
          if (picked.nonEmpty) picked else Seq(rnd.nextInt(cfg.numSources))
        }
      srcs.foreach(s => records += draw(o, s, gold(o), hard, pool))
    }

    TdDataset(h, cfg.numObjects, cfg.numSources, records.result(), gold)
  }

  private def clamp(x: Double, lo: Double, hi: Double): Double = math.max(lo, math.min(hi, x))

  private def poisson(rnd: Random, lambda: Double): Int = {
    if (lambda <= 0) return 0
    val l = math.exp(-lambda)
    var k = 0; var p = 1.0
    while ({ p *= rnd.nextDouble(); p > l }) k += 1
    k
  }
}

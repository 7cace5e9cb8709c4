package repro.core

import org.apache.spark.sql.functions._
import repro.{Fixtures, Oracle, SparkSpec}
import repro.data.{AnswerLog, TruthDataGen}

/** Equivalence of the DataFrame dataflow ([[TdhSpark]]) with the reference
  * implementation ([[TdhLocal]]), plus DuckDB oracle checks of the static
  * relational computations.
  */
class TdhSparkSpec extends SparkSpec {

  private def fixedIterHyper(n: Int) = TdhHyper(maxIters = n, tol = 0.0)

  test("ancestorClosure matches a DuckDB recursive CTE") {
    val h = Fixtures.geo
    val nodes = TdhSpark.nodesDf(spark, h)
    val clo = TdhSpark.ancestorClosure(nodes, h.height)
      .select(col("desc").as("descn"), col("anc"))
    Oracle.assertEquivalent(
      clo,
      """WITH RECURSIVE clo AS (
        |  SELECT id AS descn, parent AS anc FROM nodes WHERE CAST(parent AS INT) >= 0
        |  UNION
        |  SELECT c.descn, n.parent FROM clo c JOIN nodes n ON c.anc = n.id
        |   WHERE CAST(n.parent AS INT) >= 0
        |)
        |SELECT CAST(descn AS INT) AS descn, CAST(anc AS INT) AS anc
        |  FROM clo WHERE CAST(anc AS INT) <> 0""".stripMargin,
      "nodes" -> nodes,
    )
  }

  test("ancestorClosure agrees with Hierarchy.isAncestor on a random tree") {
    val h = repro.hier.Hierarchy.randomTree(200, 5, 17)
    val clo = TdhSpark.ancestorClosure(TdhSpark.nodesDf(spark, h), h.height)
      .collect().map(r => (r.getInt(0), r.getInt(1))).toSet
    val expected = (for {
      d <- 1 until h.size
      a <- h.ancestorsNoRoot(d)
    } yield (d, a)).toSet
    assert(clo == expected)
  }

  test("static relation reproduces the ObjectView constants on the Table-1 world") {
    val ds = Fixtures.table1World()
    val nodes = TdhSpark.nodesDf(spark, ds.hierarchy)
    val closure = TdhSpark.ancestorClosure(nodes, ds.hierarchy.height)
    import spark.implicits._
    val static0 = TdhSpark.staticRelation(ds.records.toDF(), nodes, closure)
    val rows = static0.collect().map { r =>
      ((r.getAs[Int]("obj"), r.getAs[Int]("u"), r.getAs[Int]("v")),
        (r.getAs[Int]("rel"), r.getAs[Long]("gsize"), r.getAs[Long]("ncands"),
          r.getAs[Boolean]("inoh"), r.getAs[Long]("srccnt_u"),
          r.getAs[Long]("pop2den"), r.getAs[Long]("pop3den")))
    }.toMap
    for (o <- 0 until ds.numObjects) {
      val view = ds.views(o)
      for (ui <- 0 until view.nCands; vi <- 0 until view.nCands) {
        val key = (o, view.cands(ui), view.cands(vi))
        val (rel, gsize, ncands, inoh, srccntU, pop2den, pop3den) = rows(key)
        assert(rel == TdhProb.relType(view, ui, vi), s"rel mismatch at $key")
        assert(gsize == view.anc(vi).length, s"gsize mismatch at $key")
        assert(ncands == view.nCands)
        assert(inoh == view.inOH)
        assert(srccntU == view.srcCount(ui))
        assert(pop2den == view.pop2den(vi), s"pop2den mismatch at $key")
        assert(pop3den == view.pop3den(vi), s"pop3den mismatch at $key")
      }
    }
  }

  test("vote-count aggregation matches DuckDB (oracle)") {
    val ds = Fixtures.table1World()
    import spark.implicits._
    val records = ds.records.toDF()
    val counts = records.groupBy("obj", "value").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      counts,
      "SELECT CAST(obj AS INT) AS obj, CAST(value AS INT) AS value, COUNT(*) AS cnt " +
        "FROM records GROUP BY obj, value",
      "records" -> records,
    )
  }

  test("TdhSpark mu equals TdhLocal mu after the same fixed iteration count (Table-1 world)") {
    val ds = Fixtures.table1World()
    val answers = new AnswerLog(ds.numObjects)
    answers.add(0, 0, ds.views(0).candIndex(Fixtures.LibertyIsland))
    answers.add(1, 1, ds.views(1).candIndex(Fixtures.Manchester))
    val hyper = fixedIterHyper(8)
    val local = TdhLocal.run(ds.views, answers, hyper)
    val (run, _) = TdhSpark.runOnDataset(spark, ds, answers, hyper, maxIters = 8)
    val sparkMu = run.mu.collect().map(r => (r.getInt(0), r.getInt(1)) -> r.getDouble(2)).toMap
    for (o <- 0 until ds.numObjects; j <- 0 until ds.views(o).nCands) {
      val v = ds.views(o).cands(j)
      val got = sparkMu((o, v))
      assert(math.abs(got - local.mu(o)(j)) < 1e-9, s"mu mismatch obj=$o v=$v got=$got want=${local.mu(o)(j)}")
    }
  }

  test("TdhSpark phi/psi equal TdhLocal after the same fixed iteration count") {
    val ds = Fixtures.table1World()
    val answers = new AnswerLog(ds.numObjects)
    answers.add(0, 3, ds.views(0).candIndex(Fixtures.NY))
    val hyper = fixedIterHyper(6)
    val local = TdhLocal.run(ds.views, answers, hyper)
    val (run, _) = TdhSpark.runOnDataset(spark, ds, answers, hyper, maxIters = 6)
    val sparkPhi = run.phi.collect().map(r => r.getInt(0) -> Array(r.getDouble(1), r.getDouble(2), r.getDouble(3))).toMap
    val sparkPsi = run.psi.collect().map(r => r.getInt(0) -> Array(r.getDouble(1), r.getDouble(2), r.getDouble(3))).toMap
    for ((s, p) <- local.phi; t <- 0 until 3)
      assert(math.abs(sparkPhi(s)(t) - p(t)) < 1e-9, s"phi mismatch s=$s t=$t")
    for ((w, p) <- local.psi; t <- 0 until 3)
      assert(math.abs(sparkPsi(w)(t) - p(t)) < 1e-9, s"psi mismatch w=$w t=$t")
  }

  test("TdhSpark truth estimates equal TdhLocal on a generated dataset") {
    val ds = TruthDataGen.generate(
      TruthDataGen.birthPlacesConfig.copy(numObjects = 120, targetRecords = 420, hierNodes = 300, seed = 5))
    val answers = new AnswerLog(ds.numObjects)
    val hyper = fixedIterHyper(10)
    val local = TdhLocal.run(ds.views, answers, hyper)
    val (_, est) = TdhSpark.runOnDataset(spark, ds, answers, hyper, maxIters = 10)
    val localTruths = local.truthValues(ds.views)
    val mismatches = (0 until ds.numObjects).count(o => est(o) != localTruths(o))
    assert(mismatches == 0, s"$mismatches truth mismatches out of ${ds.numObjects}")
  }

  test("TdhSpark converges (iteration count below the cap) with default tolerance") {
    val ds = Fixtures.table1World()
    val (run, _) = TdhSpark.runOnDataset(spark, ds, new AnswerLog(ds.numObjects), TdhHyper(tol = 1e-4), maxIters = 40)
    assert(run.iterations < 40)
  }
}

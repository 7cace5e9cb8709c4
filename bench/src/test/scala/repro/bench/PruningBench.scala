package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.assign.EaiAssigner
import repro.baselines.TdhInference
import repro.data.{AnswerLog, Record, TdDataset, TruthDataGen}

/** The data behind Fig. 13 (§5.4 "Effects of the filtering for task
  * assignments"): EAI assignment time with and without the U_EAI upper-bound
  * pruning, on the BirthPlaces-like dataset duplicated by growing scale
  * factors. The paper reports the filter saving 78–94% of assignment time at
  * scale 15; we verify the pruned variant never loses and prints the ratio.
  */
class PruningBench extends AnyFunSuite {

  private def duplicated(scale: Int): TdDataset = {
    val base = TruthDataGen.birthPlaces()
    val records = Vector.newBuilder[Record]
    for (k <- 0 until scale; r <- base.records)
      records += Record(r.obj + k * base.numObjects, r.source, r.value)
    TdDataset(
      base.hierarchy,
      base.numObjects * scale,
      base.numSources,
      records.result(),
      Array.tabulate(base.numObjects * scale)(o => base.gold(o % base.numObjects)),
    )
  }

  test("EAI upper-bound pruning saves assignment time as data grows (Fig. 13 data)") {
    println("== Fig. 13 data — EAI assignment time (ms), pruned vs unpruned ==")
    for (scale <- Seq(1, 2, 4)) {
      val ds = duplicated(scale)
      val answers = new AnswerLog(ds.numObjects)
      val state = new TdhInference().infer(ds.views, answers)
      def time(pruned: Boolean): (Long, Set[(Int, Int)]) = {
        val a = new EaiAssigner(pruned)
        val t0 = System.nanoTime()
        val pairs = a.assign(state, answers, 0 until 10, 5).toSet
        ((System.nanoTime() - t0) / 1000000, pairs)
      }
      // warm up, then measure
      time(pruned = true); time(pruned = false)
      val (tp, pp) = time(pruned = true)
      val (tu, pu) = time(pruned = false)
      assert(pp == pu, s"scale=$scale: pruned and unpruned assignments diverged")
      println(f"scale=$scale%-2d objects=${ds.numObjects}%-6d pruned=${tp}ms unpruned=${tu}ms " +
        f"saved=${100.0 * (tu - tp) / math.max(1, tu)}%.0f%%")
      assert(tp <= tu * 2, s"scale=$scale: pruning should not be slower (pruned=$tp unpruned=$tu)")
    }
  }
}

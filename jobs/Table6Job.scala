package repro.jobs


import repro.tables.{PaperNumbers, Tables}

/** spark-submit entrypoint reproducing Table 6: numeric truth discovery
  * (MAE and mean relative error) on the synthetic stock dataset under the
  * implicit rounding hierarchy.
  */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("tdh-table6")
    try {
      println("== Table 6 — numeric stock data ==")
      println(f"${"attr"}%-12s ${"algorithm"}%-6s ${"MAE"}%9s ${"(paper)"}%9s ${"R/E"}%9s ${"(paper)"}%9s")
      Tables.table6().foreach { r =>
        val p = PaperNumbers.table6.get((r.algorithm, r.attr))
        def pp(f: ((Double, Double)) => Double) = p.map(v => Tables.fmt(f(v))).getOrElse("-")
        println(f"${r.attr}%-12s ${r.algorithm}%-6s ${Tables.fmt(r.mae)}%9s ${pp(_._1)}%9s ${Tables.fmt(r.re)}%9s ${pp(_._2)}%9s")
      }
    } finally spark.stop()
  }
}

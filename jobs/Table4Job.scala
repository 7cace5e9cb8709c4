package repro.jobs


import repro.tables.{PaperNumbers, Tables}

/** spark-submit entrypoint reproducing Table 4: accuracy after 50 rounds of
  * simulated crowdsourcing for every feasible inference × assignment combo.
  * Task assignment runs as a separate per-round step inside the loop (§4).
  *
  * args: [rounds] (default 50)
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val rounds = args.headOption.map(_.toInt).getOrElse(50)
    val spark = JobSession.create("tdh-table4")
    try {
      for ((name, ds) <- Tables.datasets()) {
        val paper = if (name == "BirthPlaces") PaperNumbers.table4BirthPlaces else PaperNumbers.table4Heritages
        println(s"== Table 4 — $name (accuracy after round $rounds) ==")
        println(f"${"inference"}%-9s ${"assign"}%-6s ${"acc"}%8s ${"(paper)"}%8s")
        Tables.table4(ds, rounds).foreach { r =>
          val p = paper.get((r.inference, r.assignment)).map(Tables.fmt).getOrElse("-")
          println(f"${r.inference}%-9s ${r.assignment}%-6s ${Tables.fmt(r.accuracyAt50)}%8s $p%8s")
        }
      }
    } finally spark.stop()
  }
}

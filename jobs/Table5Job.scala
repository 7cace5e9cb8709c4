package repro.jobs


import repro.tables.{PaperNumbers, Tables}

/** spark-submit entrypoint reproducing Table 5: multi-truth precision /
  * recall / F1 for the single-truth algorithms (estimates expanded to their
  * ancestors) and the multi-truth algorithms LFC-MT, DART and LTM.
  */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("tdh-table5")
    try {
      for ((name, ds) <- Tables.datasets()) {
        val paper = if (name == "BirthPlaces") PaperNumbers.table5BirthPlaces else PaperNumbers.table5Heritages
        println(s"== Table 5 — $name ==")
        println(f"${"algorithm"}%-9s ${"P"}%7s ${"(paper)"}%8s ${"R"}%7s ${"(paper)"}%8s ${"F1"}%7s ${"(paper)"}%8s")
        Tables.table5(ds).foreach { r =>
          val p = paper.get(r.algorithm)
          def pp(f: ((Double, Double, Double)) => Double) = p.map(v => Tables.fmt(f(v))).getOrElse("-")
          println(f"${r.algorithm}%-9s ${Tables.fmt(r.precision)}%7s ${pp(_._1)}%8s ${Tables.fmt(r.recall)}%7s ${pp(_._2)}%8s ${Tables.fmt(r.f1)}%7s ${pp(_._3)}%8s")
        }
      }
    } finally spark.stop()
  }
}

package repro.jobs


import repro.tables.{PaperNumbers, Tables}

/** spark-submit entrypoint reproducing Table 3 (truth inference without
  * crowdsourcing): all 10 algorithms on both datasets, with the paper's
  * numbers printed next to ours. TDH additionally runs through the Spark
  * DataFrame dataflow.
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("tdh-table3")
    try {
      for ((name, ds) <- Tables.datasets()) {
        val paper = if (name == "BirthPlaces") PaperNumbers.table3BirthPlaces else PaperNumbers.table3Heritages
        val rows = Tables.table3(ds) :+ Tables.table3TdhSpark(spark, ds)
        Tables.printQualityTable(s"Table 3 — $name", rows, paper)
      }
    } finally spark.stop()
  }
}

package repro.jobs

import repro.exp.{Fmt, Tables}

/** Reproduce Table IV (dataset statistics of the scaled substitutes). */
object TableIVJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table-iv")
    try {
      val rows = Tables.tableIV(spark)
      println("=== Table IV (scaled substitutes; see DESIGN.md §4) ===")
      println(Fmt.table(
        Seq("Dataset", "n", "m", "d_avg", "d_max", "Type"),
        rows.map(r => Seq(r.name, r.n.toString, r.m.toString, Fmt.f2(r.dAvg), r.dMax.toString,
          if (r.directed) "Directed" else "Undirected"))))
    } finally spark.stop()
  }
}

package repro.jobs

import repro.exp.{Fmt, Tables}

/** Reproduce Table III (toy-graph blockers and exact spreads). */
object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table-iii")
    try {
      val rows = Tables.tableIII(spark)
      println("=== Table III ===")
      println(Fmt.table(
        Seq("Algorithm", "b", "B", "E"),
        rows.map(r => Seq(r.algorithm, r.b.toString, r.blockers.mkString("{", ",", "}"), Fmt.f3(r.spread)))))
    } finally spark.stop()
  }
}

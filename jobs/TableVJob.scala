package repro.jobs

import repro.exp.{Fmt, Tables}

/** Reproduce Table V (Exact vs GreedyReplace, TR model). */
object TableVJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table-v")
    try {
      val rows = Tables.tableExactVsGR(spark, "TR")
      println("=== Table V: Exact v.s. GreedyReplace (TR model) ===")
      println(Fmt.table(
        Seq("b", "Exact E", "GR E", "Ratio", "Exact s", "GR s"),
        rows.map(r => Seq(r.b.toString, Fmt.f3(r.exactSpread), Fmt.f3(r.grSpread),
          Fmt.pct(r.ratio), Fmt.f2(r.exactSecs), Fmt.f3(r.grSecs)))))
    } finally spark.stop()
  }
}

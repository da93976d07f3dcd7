package repro.jobs

import repro.exp.{Fmt, Tables}

/** Reproduce Table VI (Exact vs GreedyReplace, WC model). */
object TableVIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table-vi")
    try {
      val rows = Tables.tableExactVsGR(spark, "WC")
      println("=== Table VI: Exact v.s. GreedyReplace (WC model) ===")
      println(Fmt.table(
        Seq("b", "Exact E", "GR E", "Ratio", "Exact s", "GR s"),
        rows.map(r => Seq(r.b.toString, Fmt.f3(r.exactSpread), Fmt.f3(r.grSpread),
          Fmt.pct(r.ratio), Fmt.f2(r.exactSecs), Fmt.f3(r.grSecs)))))
    } finally spark.stop()
  }
}

package repro.jobs

import repro.exp.{Datasets, Fmt, Tables}

/** Reproduce Table VII (RA / OD / AG / GR expected spreads).
  *
  * Usage: TableVIIJob [model] [dataset...]
  *   model:   TR | WC | both (default both)
  *   dataset: any of the 8 names (default all)
  */
object TableVIIJob {
  def main(args: Array[String]): Unit = {
    val models = args.headOption match {
      case Some("TR") => Seq("TR")
      case Some("WC") => Seq("WC")
      case _ => Seq("TR", "WC")
    }
    val specs =
      if (args.length > 1) args.drop(1).toSeq.map(Datasets.byName)
      else Datasets.all
    val spark = JobSession.get("table-vii")
    try {
      for (model <- models; spec <- specs) {
        val rows = Tables.tableVIIFor(spark, spec, model)
        println(s"=== Table VII block: ${spec.name} ($model model) ===")
        println(Fmt.table(
          Seq("b", "RA", "OD", "AG", "GR"),
          rows.map(r => Seq(r.b.toString, Fmt.f3(r.ra), Fmt.f3(r.od), Fmt.f3(r.ag), Fmt.f3(r.gr)))))
      }
    } finally spark.stop()
  }
}

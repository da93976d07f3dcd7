package repro.bench

import repro.SparkSpec
import repro.exp.{Datasets, Fmt, Tables}

/** Table IV — statistics of the datasets. The paper lists the 8 SNAP
  * originals; we print them next to our scaled synthetic substitutes
  * (offline image — DESIGN.md §4) and assert the substitutes preserve each
  * dataset's character: directedness, ordering by edge count, heavy-tailed
  * degrees.
  */
class TableIVBench extends SparkSpec {

  test("Table IV: scaled substitutes preserve the datasets' character") {
    val rows = Tables.tableIV(spark)

    println("\n=== Table IV: Statistics of Datasets (paper original vs scaled substitute) ===")
    println(Fmt.table(
      Seq("Dataset", "type", "n(paper)", "m(paper)", "davg(paper)", "dmax(paper)",
        "n(ours)", "m(ours)", "davg(ours)", "dmax(ours)"),
      rows.zip(Datasets.all).map { case (r, s) =>
        Seq(s.name, if (s.directed) "Directed" else "Undirected",
          s.paperN.toString, s.paperM.toString, s.paperDavg.toString, s.paperDmax.toString,
          r.n.toString, r.m.toString, Fmt.f2(r.dAvg), r.dMax.toString)
      }))

    // directedness and registry order preserved
    assert(rows.map(_.name) == Datasets.all.map(_.name))
    assert(rows.map(_.directed) == Datasets.all.map(_.directed))
    // substitutes keep the paper's ordering by raw edge count
    val paperOrder = Datasets.all.sortBy(_.paperM).map(_.name)
    assert(Datasets.all.map(_.name) == paperOrder)
    // every substitute is heavy-tailed: max degree far above the average
    for (r <- rows) assert(r.dMax > 3 * r.dAvg, s"${r.name}: dmax=${r.dMax} davg=${r.dAvg}")
    // densest datasets stay the densest (EmailCore/Twitter vs EmailAll/DBLP)
    val davg = rows.map(r => r.name -> r.dAvg).toMap
    assert(davg("EmailCore") > davg("EmailAll"))
    assert(davg("Twitter") > davg("DBLP"))
  }
}

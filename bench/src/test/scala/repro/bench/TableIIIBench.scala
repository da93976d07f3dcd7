package repro.bench

import repro.SparkSpec
import repro.exp.{Fmt, Tables}

/** Table III — blockers and their expected influence spread on the Figure-1
  * toy graph. Paper ground truth:
  *
  *   Greedy        b=1 {v5} 3        b=2 {v5, v2 or v4} 2
  *   OutNeighbors  b=1 {v2 or v4} 6.66   b=2 {v2, v4} 1
  *   GreedyReplace b=1 {v5} 3        b=2 {v2, v4} 1
  */
class TableIIIBench extends SparkSpec {

  test("Table III: toy-graph blockers match the paper exactly") {
    val rows = Tables.tableIII(spark)
    val paper = Map(
      ("Greedy", 1) -> 3.0, ("Greedy", 2) -> 2.0,
      ("OutNeighbors", 1) -> 6.66, ("OutNeighbors", 2) -> 1.0,
      ("GreedyReplace", 1) -> 3.0, ("GreedyReplace", 2) -> 1.0)

    println("\n=== Table III: Blockers and Their Expected Influence Spread ===")
    println(Fmt.table(
      Seq("Algorithm", "b", "B (ours)", "E (ours)", "E (paper)"),
      rows.map(r => Seq(
        r.algorithm, r.b.toString, r.blockers.mkString("{", ",", "}"),
        Fmt.f3(r.spread), Fmt.f3(paper((r.algorithm, r.b)))))))

    for (r <- rows)
      assert(math.abs(r.spread - paper((r.algorithm, r.b))) < 1e-9,
        s"${r.algorithm} b=${r.b}: got ${r.spread}")
  }
}

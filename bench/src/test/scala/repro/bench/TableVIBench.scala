package repro.bench

/** Table VI — WC model. Paper rows: (b, ratio, Exact secs, GR secs). */
class TableVIBench extends ExactVsGrBench(
  "WC", "Table VI",
  Seq((1, 1.0000, 2.63, 0.10), (2, 0.9999, 110.92, 0.18), (3, 0.9999, 3284.0, 0.23), (4, 0.9997, 69415.0, 0.33)))

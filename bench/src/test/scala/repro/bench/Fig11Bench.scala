package repro.bench

import repro.experiments.Figures

/** Fig. 11 — scalability with k.
  * Paper: Hercules wins for every k; ParIS+ deteriorates as k grows (its
  * neighbors are scattered over the file), while DSTree* and Hercules pay
  * mostly for the first neighbor.
  */
class Fig11Bench extends BenchBase {
  test("fig11: scalability with k") {
    val rows = emit("Fig 11: avg query time and %data vs k", Figures.fig11(spark, scale))
    for (k <- Seq(1, 10, 100)) {
      shape(s"k=$k: hercules beats pscan",
        value(rows, s"k=$k", "hercules", "avg_query_ms") <
          value(rows, s"k=$k", "pscan", "avg_query_ms"))
    }
    shape("paris k=100 is costlier than paris k=1 (skip-sequential degradation)",
      value(rows, "k=100", "paris", "avg_query_ms") >=
        value(rows, "k=1", "paris", "avg_query_ms"))
  }
}

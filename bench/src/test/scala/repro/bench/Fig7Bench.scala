package repro.bench

import repro.experiments.Figures

/** Fig. 7 — average 1NN query time on very large datasets.
  * Paper: Hercules outperforms all competitors including PSCAN; DSTree* and
  * VA+file could not even build at 1.5TB.
  */
class Fig7Bench extends BenchBase {
  test("fig7: very large datasets") {
    val rows = emit("Fig 7: avg 1NN query time, very large datasets", Figures.fig7(spark, scale))
    for (size <- Seq("1TB", "1.5TB")) {
      shape(s"$size: hercules beats pscan",
        value(rows, size, "hercules", "avg_query_ms") < value(rows, size, "pscan", "avg_query_ms"))
      shape(s"$size: hercules beats paris",
        value(rows, size, "hercules", "avg_query_ms") < value(rows, size, "paris", "avg_query_ms"))
    }
  }
}

package repro.bench

import repro.experiments.Figures

/** Fig. 8 — average query time vs series length.
  * Paper: Hercules is the bottom curve at every length (5–10x over the best
  * competitor; ≥10x over PSCAN).
  */
class Fig8Bench extends BenchBase {
  test("fig8: scalability with series length") {
    val rows = emit("Fig 8: avg query time vs series length", Figures.fig8(spark, scale))
    for (len <- Seq("len64", "len128", "len256", "len512", "len1024")) {
      shape(s"$len: hercules beats pscan",
        value(rows, len, "hercules", "avg_query_ms") < value(rows, len, "pscan", "avg_query_ms"))
    }
  }
}

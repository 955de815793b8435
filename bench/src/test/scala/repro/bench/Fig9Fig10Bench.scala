package repro.bench

import repro.experiments.Figures

/** Figs. 9 + 10 — query difficulty sweep over real-dataset proxies.
  * Paper: Hercules wins every dataset × workload (1.3x–9.4x over the best
  * competitor, 5.5x–63x over ParIS+, 1.5x–10x over DSTree*), and is the only
  * index beating the scan even on ood workloads; indexes degenerate on Deep.
  */
class Fig9Fig10Bench extends BenchBase {
  test("fig9+10: scalability with query difficulty") {
    val rows = emit("Figs 9+10: difficulty sweep (proxies for SALD/Seismic/Deep)",
      Figures.fig9and10(spark, scale))
    for (kind <- Seq("sald", "seismic", "deep"); wl <- Seq("1%", "5%", "ood")) {
      val cfgLabel = s"$kind/$wl"
      shape(s"$cfgLabel: hercules query time beats pscan",
        value(rows, cfgLabel, "hercules", "avg_query_ms") <
          value(rows, cfgLabel, "pscan", "avg_query_ms"))
      shape(s"$cfgLabel: hercules accesses less data than a full scan",
        value(rows, cfgLabel, "hercules", "data_accessed_%") < 100.0)
    }
    shape("easy sald queries access less data than hard ood ones (hercules)",
      value(rows, "sald/1%", "hercules", "data_accessed_%") <=
        value(rows, "sald/ood", "hercules", "data_accessed_%") + 1e-9)
  }
}

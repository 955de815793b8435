package repro.bench

import repro.experiments.Figures

/** Fig. 12 — ablation study.
  * Paper (a): DSTree* ≫ DSTree*P > NoWPara > Hercules in build+write time
  * (path locking is the bottleneck; parallel writing recovers the rest).
  * Paper (b): NoSAX always hurts; NoPara hurts easy/medium queries; NoThresh
  * hurts hard (ood) queries.
  */
class Fig12Bench extends BenchBase {
  test("fig12a: index construction ablation") {
    val rows = emit("Fig 12a: build ablation (in-core threaded builders)", Figures.fig12a(scale))
    shape("parallel leaf-locked build (hercules) is not slower than sequential dstree*",
      value(rows, "build", "hercules", "build_s") <= value(rows, "build", "dstree*", "build_s"))
    shape("path-locked dstree*P pays synchronization over hercules",
      value(rows, "build", "hercules", "build_s") <= value(rows, "build", "dstree*P", "build_s"))
  }

  test("fig12b: query answering ablation") {
    val rows = emit("Fig 12b: query ablation on the deep proxy", Figures.fig12b(spark, scale))
    for (wl <- Seq("1%", "5%", "ood")) {
      shape(s"$wl: full hercules is not slower than noSAX",
        value(rows, wl, "hercules", "avg_query_ms") <=
          value(rows, wl, "noSAX", "avg_query_ms") * 1.25)
    }
    shape("ood: thresholds help on hard queries (hercules <= noThresh)",
      value(rows, "ood", "hercules", "avg_query_ms") <=
        value(rows, "ood", "noThresh", "avg_query_ms") * 1.25)
  }
}

package repro.bench

import repro.experiments.Figures

/** Fig. 6 — combined indexing + query answering vs dataset size.
  * Paper: Hercules 3x–4x faster than DSTree* in construction, 1.6x–10x in
  * query answering; loses only to ParIS+ on 250GB with 100 queries, wins by
  * 3x at 10K queries.
  */
class Fig6Bench extends BenchBase {
  test("fig6: scalability with dataset size") {
    val rows = emit("Fig 6: idx + 100/10K 1NN queries vs dataset size", Figures.fig6(spark, scale))
    for (size <- Seq("25GB", "50GB", "100GB", "250GB")) {
      shape(s"$size: hercules builds faster than dstree*",
        value(rows, size, "hercules", "build_s") < value(rows, size, "dstree", "build_s"))
      shape(s"$size: hercules idx+10K queries beats pscan",
        value(rows, size, "hercules", "idx+10kq_s") < value(rows, size, "pscan", "idx+10kq_s"))
      shape(s"$size: hercules idx+10K queries beats paris",
        value(rows, size, "hercules", "idx+10kq_s") < value(rows, size, "paris", "idx+10kq_s"))
    }
  }
}

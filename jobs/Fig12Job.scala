package repro.jobs

import repro.experiments.Figures

/** Reproduces Fig. 12: index-construction (a) and query-answering (b)
  * ablation studies.
  */
object Fig12Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("hercules-fig12")
    try {
      JobUtil.emit("Fig 12a: index building ablation", Figures.fig12a(JobUtil.scaleOf(args)))
      JobUtil.emit("Fig 12b: query answering ablation", Figures.fig12b(spark, JobUtil.scaleOf(args)))
    } finally spark.stop()
  }
}

package repro.jobs

import repro.experiments.Figures

/** Reproduces Fig. 6: indexing + 100/10K 1NN queries vs dataset size. */
object Fig6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("hercules-fig6")
    try JobUtil.emit("Fig 6: scalability with dataset size", Figures.fig6(spark, JobUtil.scaleOf(args)))
    finally spark.stop()
  }
}

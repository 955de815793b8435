package repro.jobs

import repro.experiments.Figures

/** Reproduces Fig. 8: average query time vs series length. */
object Fig8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("hercules-fig8")
    try JobUtil.emit("Fig 8: scalability with series length", Figures.fig8(spark, JobUtil.scaleOf(args)))
    finally spark.stop()
  }
}

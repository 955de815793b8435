package repro.jobs

import repro.experiments.Figures

/** Reproduces Fig. 7: average 1NN query time on very large datasets. */
object Fig7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("hercules-fig7")
    try JobUtil.emit("Fig 7: scalability with very large datasets", Figures.fig7(spark, JobUtil.scaleOf(args)))
    finally spark.stop()
  }
}

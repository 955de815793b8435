package repro.jobs

import repro.experiments.Figures

/** Reproduces Fig. 11: query time and %data accessed vs k. */
object Fig11Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("hercules-fig11")
    try JobUtil.emit("Fig 11: scalability with k", Figures.fig11(spark, JobUtil.scaleOf(args)))
    finally spark.stop()
  }
}

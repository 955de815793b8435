package repro.jobs

import repro.experiments.Figures

/** Reproduces Figs. 9 & 10: combined totals + per-query time / %data
  * accessed across real-dataset proxies and query difficulties.
  */
object Fig9Fig10Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("hercules-fig9-10")
    try JobUtil.emit("Figs 9+10: scalability with query difficulty",
      Figures.fig9and10(spark, JobUtil.scaleOf(args)))
    finally spark.stop()
  }
}

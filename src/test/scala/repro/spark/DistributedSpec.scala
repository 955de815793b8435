package repro.spark

import java.nio.file.Files
import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec}
import repro.core.{IndexConfig, QueryKnobs, SeriesGen}

/** Distributed per-partition indexing: every method's Spark pipeline must
  * return exactly the DuckDB brute-force k-NN (via the oracle), partition
  * counts must not change answers, and save/load must round-trip.
  */
class DistributedSpec extends SparkSpec {

  private val n = 300
  private val len = 24
  private val k = 3
  private val seed = 77L
  private val cfg = IndexConfig(seriesLength = len, leafCapacity = 16, dbSize = 64)
  private val knobs = QueryKnobs(k = k, lmax = 3, threads = 1)

  private lazy val df: DataFrame =
    SeriesFrames.dataset(spark, "walk", n, len, seed).cache()

  private lazy val queries = SeriesGen.queries("walk", "5%", 3, n, len, seed)

  private lazy val queryDF: DataFrame = {
    import spark.implicits._
    queries.zipWithIndex.flatMap { case (q, qi) =>
      q.zipWithIndex.map { case (v, p) => (qi.toLong, p, v.toDouble) }
    }.toSeq.toDF("qid", "pos", "val")
  }

  private def oracleSql(kk: Int): String =
    s"""WITH dists AS (
       |  SELECT q.qid AS qid, d.id AS sid,
       |         sum(pow(CAST(d.val AS DOUBLE) - CAST(q.val AS DOUBLE), 2)) AS d2
       |  FROM data d JOIN query q ON d.pos = q.pos
       |  GROUP BY q.qid, d.id
       |)
       |SELECT qid, sid, sqrt(d2) AS dist
       |FROM dists
       |QUALIFY row_number() OVER (PARTITION BY qid ORDER BY d2, sid) <= $kk
       |""".stripMargin

  for (method <- LocalIndex.Methods)
    test(s"$method distributed kNN matches the DuckDB oracle") {
      val built = Distributed.build(df, method, cfg, Runner.partitions(method))
      try {
        val res = Distributed.knnBatch(built, queries, knobs)
        val out = Distributed.resultsToDF(spark, res)
        Oracle.assertEquivalent(out, oracleSql(k),
          "data" -> SeriesFrames.explode(df), "query" -> queryDF)
      } finally built.unpersist()
    }

  private object Runner {
    def partitions(method: String): Int = method match {
      case "dstree" | "vafile" => 1
      case _                   => 4
    }
  }

  test("answers are identical for 1, 2 and 5 partitions") {
    val refs = Seq(1, 2, 5).map { p =>
      val built = Distributed.build(df, "hercules", cfg, p)
      try Distributed.knnBatch(built, queries, knobs).neighbors
      finally built.unpersist()
    }
    refs.tail.foreach { r =>
      refs.head.zip(r).foreach { case (a, b) =>
        assert(a.map(x => (x.id, x.dist2)).toSeq == b.map(x => (x.id, x.dist2)).toSeq)
      }
    }
  }

  test("knnBatch reports timing and access stats") {
    val built = Distributed.build(df, "hercules", cfg, 2)
    try {
      val res = Distributed.knnBatch(built, queries, knobs)
      assert(res.totalSeries == n)
      assert(res.perQueryMs.length == queries.length)
      assert(res.avgAccessFraction > 0.0 && res.avgAccessFraction <= 1.0)
    } finally built.unpersist()
  }

  test("save/load round-trips the per-partition indexes") {
    val dir = Files.createTempDirectory("hercules-dist").toString
    val built = Distributed.build(df, "hercules", cfg, 3)
    try {
      Distributed.saveToDir(built, dir)
      val loaded = Distributed.loadFromDir(spark, dir)
      try {
        assert(loaded.partitions == 3)
        assert(loaded.totalSeries == n)
        val a = Distributed.knnBatch(built, queries, knobs).neighbors
        val b = Distributed.knnBatch(loaded, queries, knobs).neighbors
        a.zip(b).foreach { case (x, y) =>
          assert(x.map(v => (v.id, v.dist2)).toSeq == y.map(v => (v.id, v.dist2)).toSeq)
        }
      } finally loaded.unpersist()
    } finally built.unpersist()
  }

  test("ood queries against a larger k also match the oracle (hercules)") {
    val oodQ = SeriesGen.queries("walk", "ood", 2, n, len, seed)
    val oodQDF = {
      import spark.implicits._
      oodQ.zipWithIndex.flatMap { case (q, qi) =>
        q.zipWithIndex.map { case (v, p) => (qi.toLong, p, v.toDouble) }
      }.toSeq.toDF("qid", "pos", "val")
    }
    val built = Distributed.build(df, "hercules", cfg, 4)
    try {
      val res = Distributed.knnBatch(built, oodQ, knobs.copy(k = 10))
      val out = Distributed.resultsToDF(spark, res)
      Oracle.assertEquivalent(out, oracleSql(10),
        "data" -> SeriesFrames.explode(df), "query" -> oodQDF)
    } finally built.unpersist()
  }
}

package repro.core

import java.util.Random

/** Deterministic data-series generators (DESIGN.md §3).
  *
  * `walk` reproduces the paper's synthetic datasets (random walk with N(0,1)
  * steps). The three "real dataset" proxies reproduce the *hardness ordering*
  * of SALD / Seismic / Deep: smooth walks cluster well (easy), bursty series
  * are medium, i.i.d. Gaussian vectors are near-equidistant (hard — like the
  * real Deep embeddings). All series are z-normalized, as is standard in this
  * literature (UCR suite) and required for the iSAX breakpoints.
  *
  * Every series is a pure function of (kind, globalSeed, id), so the Spark
  * generators and the driver-side query generators agree exactly.
  */
object SeriesGen {

  /** Dataset kinds. */
  val Kinds: Seq[String] = Seq("walk", "sald", "seismic", "deep")

  private def rngFor(globalSeed: Long, id: Long): Random =
    new Random(globalSeed * 0x9E3779B97F4A7C15L + id * 0xC2B2AE3D27D4EB4FL + 0x165667B19E3779F9L)

  /** The `id`-th series of a deterministic dataset. */
  def seriesForId(kind: String, id: Long, len: Int, globalSeed: Long): Array[Float] = {
    val rng = rngFor(globalSeed, id)
    val raw = kind match {
      case "walk"    => walk(rng, len)
      case "sald"    => smooth(rng, len)
      case "seismic" => bursty(rng, len)
      case "deep"    => gaussian(rng, len)
      case other     => throw new IllegalArgumentException(s"unknown dataset kind: $other")
    }
    Stats.znorm(raw)
  }

  /** Random walk: cumulative sum of N(0,1) steps (paper's Synth). */
  private def walk(rng: Random, len: Int): Array[Float] = {
    val out = new Array[Float](len)
    var acc = 0.0
    var i = 0
    while (i < len) { acc += rng.nextGaussian(); out(i) = acc.toFloat; i += 1 }
    out
  }

  /** SALD proxy: random walk smoothed with a window-8 moving average. */
  private def smooth(rng: Random, len: Int): Array[Float] = {
    val w = walk(rng, len)
    val out = new Array[Float](len)
    var i = 0
    while (i < len) {
      var s = 0.0
      var j = math.max(0, i - 7)
      while (j <= i) { s += w(j); j += 1 }
      out(i) = (s / (i - math.max(0, i - 7) + 1)).toFloat
      i += 1
    }
    out
  }

  /** Seismic proxy: low noise with a few high-amplitude burst segments. */
  private def bursty(rng: Random, len: Int): Array[Float] = {
    val out = new Array[Float](len)
    var i = 0
    while (i < len) { out(i) = (rng.nextGaussian() * 0.1).toFloat; i += 1 }
    val bursts = 1 + rng.nextInt(3)
    var b = 0
    while (b < bursts) {
      val start = rng.nextInt(math.max(1, len - len / 8))
      val blen = math.max(2, len / 16 + rng.nextInt(math.max(1, len / 16)))
      var j = start
      val amp = 2.0 + 3.0 * rng.nextDouble()
      while (j < math.min(len, start + blen)) {
        out(j) = (out(j) + amp * math.sin((j - start) * 0.5) * math.exp(-(j - start) / blen.toDouble)).toFloat
        j += 1
      }
      b += 1
    }
    out
  }

  /** Deep proxy: i.i.d. N(0,1) points — near-equidistant after z-norm. */
  private def gaussian(rng: Random, len: Int): Array[Float] = {
    val out = new Array[Float](len)
    var i = 0
    while (i < len) { out(i) = rng.nextGaussian().toFloat; i += 1 }
    out
  }

  /** A whole dataset, materialized (driver/core-test side). */
  def dataset(kind: String, n: Int, len: Int, globalSeed: Long): Array[Array[Float]] =
    Array.tabulate(n)(i => seriesForId(kind, i.toLong, len, globalSeed))

  /** Query workloads of §4.1: `1%`/`2%`/`5%`/`10%` perturb random in-dataset
    * series with Gaussian noise of that variance; `ood` draws unseen series
    * from the same generator (ids ≥ n are excluded from indexing).
    */
  def queries(kind: String, workload: String, nQueries: Int, nData: Long, len: Int,
              globalSeed: Long, querySeed: Long = 4242): Array[Array[Float]] = {
    val rng = new Random(querySeed * 31 + workload.hashCode)
    workload match {
      case "ood" =>
        Array.tabulate(nQueries)(i => seriesForId(kind, nData + i, len, globalSeed))
      case pct =>
        val sigma2 = pct.stripSuffix("%").toDouble / 100.0
        val sigma = math.sqrt(sigma2)
        Array.tabulate(nQueries) { _ =>
          val id = math.floorMod(rng.nextLong(), nData)
          val base = seriesForId(kind, id, len, globalSeed)
          val out = new Array[Float](len)
          var i = 0
          while (i < len) { out(i) = (base(i) + sigma * rng.nextGaussian()).toFloat; i += 1 }
          Stats.znorm(out)
        }
    }
  }
}

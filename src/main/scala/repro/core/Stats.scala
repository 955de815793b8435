package repro.core

/** Running statistics over data series segments. */
object Stats {

  /** Mean and population standard deviation of `s[from, until)` in one pass. */
  def meanSd(s: Array[Float], from: Int, until: Int): (Double, Double) = {
    val len = until - from
    var i = from
    var sum = 0.0
    var sum2 = 0.0
    while (i < until) { val v = s(i).toDouble; sum += v; sum2 += v * v; i += 1 }
    val mean = sum / len
    val vari = math.max(0.0, sum2 / len - mean * mean)
    (mean, math.sqrt(vari))
  }

  /** Z-normalize: subtract mean, divide by population sd (zeros if constant). */
  def znorm(s: Array[Float]): Array[Float] = {
    val (mean, sd) = meanSd(s, 0, s.length)
    val out = new Array[Float](s.length)
    if (sd < 1e-9) out
    else {
      var i = 0
      while (i < s.length) { out(i) = ((s(i) - mean) / sd).toFloat; i += 1 }
      out
    }
  }
}

/** Prefix sums of a series; O(1) mean/sd over any segment.
  *
  * Used for the query (one context per query, reused against every node's
  * segmentation) and for split-policy evaluation (one context per leaf
  * series, reused against every candidate segmentation).
  */
final class SeriesCtx(s: Array[Float]) {
  private val n = s.length
  private val pre = new Array[Double](n + 1)
  private val pre2 = new Array[Double](n + 1)
  locally {
    var i = 0
    while (i < n) {
      val v = s(i).toDouble
      pre(i + 1) = pre(i) + v
      pre2(i + 1) = pre2(i) + v * v
      i += 1
    }
  }

  /** Mean of the segment `[from, until)`. */
  def mean(from: Int, until: Int): Double = (pre(until) - pre(from)) / (until - from)

  /** Population standard deviation of the segment `[from, until)`. */
  def sd(from: Int, until: Int): Double = {
    val len = until - from
    val m = (pre(until) - pre(from)) / len
    val v = (pre2(until) - pre2(from)) / len - m * m
    math.sqrt(math.max(0.0, v))
  }
}

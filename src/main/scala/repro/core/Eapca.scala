package repro.core

/** EAPCA lower bound (`LB_EAPCA`, Wang et al. DSTree).
  *
  * For any series S in node N and any query Q:
  * `ED²(Q,S) ≥ Σᵢ lenᵢ · ((μQᵢ−μSᵢ)² + (σQᵢ−σSᵢ)²)` (Cauchy–Schwarz on the
  * per-segment covariance), and each per-series term is at least the squared
  * gap to N's synopsis range — so the sum of squared gaps lower-bounds the
  * true distance to every series in the subtree.
  */
object Eapca {

  /** Squared `LB_EAPCA` between query `qc` (prefix-sum context) and node `n`.
    * Returns 0 for nodes whose synopsis is empty (never prunes them).
    */
  def lb2(qc: SeriesCtx, n: Node): Double = {
    var i = 0
    var acc = 0.0
    while (i < n.segCount) {
      if (n.muMin(i).isPosInfinity) return 0.0 // empty synopsis: cannot prune
      val from = n.segStart(i)
      val until = n.ends(i)
      val mq = qc.mean(from, until)
      val sq = qc.sd(from, until)
      val gm =
        if (mq < n.muMin(i)) n.muMin(i) - mq
        else if (mq > n.muMax(i)) mq - n.muMax(i)
        else 0.0
      val gs =
        if (sq < n.sdMin(i)) n.sdMin(i) - sq
        else if (sq > n.sdMax(i)) sq - n.sdMax(i)
        else 0.0
      acc += (until - from) * (gm * gm + gs * gs)
      i += 1
    }
    acc
  }
}

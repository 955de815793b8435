package repro.core

import java.util.concurrent.atomic.AtomicInteger
import scala.collection.mutable.ArrayBuffer

/** Split-policy selection (§3.2): evaluates every H-split and V-split
  * candidate on the actual leaf contents and keeps the one maximizing the
  * "QoS" *gain* — the reduction, from the undivided node to the weighted
  * children, of the per-segment squared synopsis ranges measured on the
  * candidate's own child segmentation (the DSTree heuristic family: tighter
  * child ranges ⇒ tighter `LB_EAPCA`). Measuring before and after on the
  * same segmentation is what lets V-splits compete fairly with H-splits:
  * z-normalized series are indistinguishable on the whole-series segment
  * (μ=0, σ=1), so the root must discover sub-segment structure.
  */
object SplitPolicy {

  /** Pick the best split for a full leaf, or None when the leaf's series are
    * indistinguishable under every candidate statistic (the leaf is then
    * allowed to exceed capacity instead of splitting forever).
    */
  def choose(node: Node, series: IndexedSeq[Array[Float]]): Option[SplitInfo] = {
    val ctxs = series.map(new SeriesCtx(_))
    val rho = series.length

    var best: SplitInfo = null
    var bestGain = Double.NegativeInfinity

    def consider(vertical: Boolean, childEnds: Array[Int], routeSeg: Int, useSd: Boolean): Unit = {
      val from = if (routeSeg == 0) 0 else childEnds(routeSeg - 1)
      val until = childEnds(routeSeg)
      val stats = new Array[Double](rho)
      var i = 0
      var mn = Double.PositiveInfinity
      var mx = Double.NegativeInfinity
      while (i < rho) {
        val v = if (useSd) ctxs(i).sd(from, until) else ctxs(i).mean(from, until)
        stats(i) = v
        if (v < mn) mn = v
        if (v > mx) mx = v
        i += 1
      }
      if (mx <= mn) return // cannot separate on this stat
      var value = (mn + mx) / 2.0 // midrange, as in the paper's H-split
      var leftCnt = stats.count(_ < value)
      if (leftCnt == 0 || leftCnt == rho) {
        // Skewed: midrange leaves a side empty; fall back to the second
        // distinct value so both children are non-empty.
        val distinct = stats.distinct.sorted
        value = distinct(1)
        leftCnt = stats.count(_ < value)
      }
      val gain = qosGain(ctxs, stats, value, childEnds, leftCnt, rho - leftCnt)
      if (gain > bestGain) {
        bestGain = gain
        best = SplitInfo(vertical, childEnds, routeSeg, useSd, value)
      }
    }

    var seg = 0
    while (seg < node.segCount) {
      val st = node.segStart(seg)
      val en = node.ends(seg)
      consider(vertical = false, node.ends, seg, useSd = false)
      consider(vertical = false, node.ends, seg, useSd = true)
      if (en - st >= 2) {
        val mid = (st + en) / 2
        val vEnds = (node.ends.take(seg) :+ mid) ++ node.ends.drop(seg)
        consider(vertical = true, vEnds, seg, useSd = false)
        consider(vertical = true, vEnds, seg, useSd = true)
        consider(vertical = true, vEnds, seg + 1, useSd = false)
        consider(vertical = true, vEnds, seg + 1, useSd = true)
      }
      seg += 1
    }
    Option(best)
  }

  /** QoS gain of one candidate: the node's QoS on the candidate's child
    * segmentation minus the count-weighted children QoS (same segmentation).
    * Positive gain = the split tightens the synopsis ranges.
    */
  private def qosGain(ctxs: IndexedSeq[SeriesCtx], stats: Array[Double], value: Double,
                      childEnds: Array[Int], leftCnt: Int, rightCnt: Int): Double = {
    val m = childEnds.length
    // accumulators 0=left, 1=right, 2=whole node; rows: muMin,muMax,sdMin,sdMax
    val acc = Array.fill(3)(Array.fill(4, m)(0.0))
    acc.foreach { a =>
      java.util.Arrays.fill(a(0), Double.PositiveInfinity)
      java.util.Arrays.fill(a(1), Double.NegativeInfinity)
      java.util.Arrays.fill(a(2), Double.PositiveInfinity)
      java.util.Arrays.fill(a(3), Double.NegativeInfinity)
    }
    var i = 0
    while (i < ctxs.length) {
      val side = if (stats(i) < value) 0 else 1
      var j = 0
      while (j < m) {
        val from = if (j == 0) 0 else childEnds(j - 1)
        val until = childEnds(j)
        val mu = ctxs(i).mean(from, until)
        val sd = ctxs(i).sd(from, until)
        var g = 0
        while (g < 2) {
          val a = if (g == 0) acc(side) else acc(2)
          if (mu < a(0)(j)) a(0)(j) = mu
          if (mu > a(1)(j)) a(1)(j) = mu
          if (sd < a(2)(j)) a(2)(j) = sd
          if (sd > a(3)(j)) a(3)(j) = sd
          g += 1
        }
        j += 1
      }
      i += 1
    }
    def qos(a: Array[Array[Double]]): Double = {
      var j = 0
      var q = 0.0
      while (j < m) {
        if (!a(0)(j).isPosInfinity) {
          val len = childEnds(j) - (if (j == 0) 0 else childEnds(j - 1))
          val dm = a(1)(j) - a(0)(j)
          val ds = a(3)(j) - a(2)(j)
          q += len * (dm * dm + ds * ds)
        }
        j += 1
      }
      q
    }
    val before = qos(acc(2))
    val after = leftCnt.toDouble / ctxs.length * qos(acc(0)) +
      rightCnt.toDouble / ctxs.length * qos(acc(1))
    before - after
  }
}

/** The Hercules index tree (§3.2) with the insertion paths of §3.3:
  * lock-free routing, leaf-only locking (Algorithm 5), and — for the
  * ablation study — sequential (DSTree*) and path-locked (DSTree*P) modes.
  */
final class HerculesTree(val cfg: IndexConfig) extends Serializable {
  private val nextId = new AtomicInteger(0)

  /** Root starts as a single-segment leaf over the whole series. */
  val root: Node = newNode(Array(cfg.seriesLength))

  private def newNode(ends: Array[Int]): Node = new Node(ends, nextId.getAndIncrement())

  /** Descend from `from` to the leaf that should hold `s` (no locks; relies
    * on `isLeaf` volatile publication of splits).
    */
  def routeToLeaf(from: Node, s: Array[Float]): Node = {
    var n = from
    while (!n.isLeaf) n = if (n.split.goesLeft(s)) n.left else n.right
    n
  }

  /** Algorithm 5: route, lock the leaf, re-check leafness, append, and split
    * when full. Only the leaf is locked; internal synopses are deferred to
    * index writing (Hercules mode).
    */
  def insertConcurrent(id: Long, s: Array[Float], worker: Int, store: SeriesStore): Unit = {
    while (true) {
      val leaf = routeToLeaf(root, s)
      leaf.synchronized {
        if (leaf.isLeaf) {
          appendToLeaf(leaf, id, s, worker, store)
          return
        }
      }
      // Lost a race with a split of this leaf: re-route (Algorithm 5 loop).
    }
  }

  /** DSTree* sequential insert: additionally maintains the synopsis of every
    * node on the root-to-leaf path (the work Hercules defers — Fig. 12a).
    */
  def insertSequential(id: Long, s: Array[Float], store: SeriesStore): Unit = {
    var n = root
    while (!n.isLeaf) { n.updateSynopsis(s); n.count += 1; n = if (n.split.goesLeft(s)) n.left else n.right }
    appendToLeaf(n, id, s, 0, store)
  }

  /** DSTree*P ablation insert: locks the whole root-to-leaf path (in root→leaf
    * order, so deadlock-free) to update internal synopses concurrently.
    */
  def insertPathLocked(id: Long, s: Array[Float], worker: Int, store: SeriesStore): Unit = {
    while (true) {
      val path = new ArrayBuffer[Node]
      var n = root
      path += n
      while (!n.isLeaf) { n = if (n.split.goesLeft(s)) n.left else n.right; path += n }
      path.foreach(_.lock.lock())
      try {
        val leaf = path.last
        if (leaf.isLeaf) {
          var i = 0
          while (i < path.length - 1) { path(i).updateSynopsis(s); path(i).count += 1; i += 1 }
          leaf.synchronized(appendToLeaf(leaf, id, s, worker, store))
          return
        }
      } finally path.reverseIterator.foreach(_.lock.unlock())
    }
  }

  /** Append under the leaf lock; update the leaf synopsis; split when full. */
  private def appendToLeaf(leaf: Node, id: Long, s: Array[Float], worker: Int, store: SeriesStore): Unit = {
    leaf.updateSynopsis(s)
    val slot = store.alloc(worker, id, s)
    leaf.slots += slot
    leaf.count += 1
    if (leaf.count >= cfg.leafCapacity) splitLeaf(leaf, store)
  }

  /** Split a full leaf (Algorithm 5 lines 9–14): gather its series from
    * memory and spill, choose the best policy from the actual data, create
    * two children, and redistribute SBuffer slots / spill records.
    */
  private def splitLeaf(leaf: Node, store: SeriesStore): Unit = {
    val spilled = store.readSpill(leaf)
    val memSlots = leaf.slots
    val allSeries: IndexedSeq[Array[Float]] =
      (spilled.map(_._2) ++ memSlots.map(store.seriesAt)).toIndexedSeq
    SplitPolicy.choose(leaf, allSeries) match {
      case None => // indistinguishable contents: tolerate an oversized leaf
      case Some(policy) =>
        val l = newNode(policy.childEnds)
        val r = newNode(policy.childEnds)
        l.parent = leaf
        r.parent = leaf
        // Spilled records stream to the children's spill files.
        if (spilled.nonEmpty) {
          val outs = Array(l, r).map { c =>
            new java.io.DataOutputStream(new java.io.BufferedOutputStream(
              new java.io.FileOutputStream(store.spillPathFor(c).toFile, true)))
          }
          try {
            spilled.foreach { case (sid, sv) =>
              val side = if (policy.goesLeft(sv)) 0 else 1
              val child = if (side == 0) l else r
              outs(side).writeLong(sid)
              var i = 0
              while (i < sv.length) { outs(side).writeFloat(sv(i)); i += 1 }
              child.spilledCount += 1
              child.updateSynopsis(sv)
              child.count += 1
            }
          } finally outs.foreach(_.close())
        }
        // In-memory slots keep their HBuffer place; only SBuffer pointers move.
        memSlots.foreach { slot =>
          val sv = store.seriesAt(slot)
          val child = if (policy.goesLeft(sv)) l else r
          child.slots += slot
          child.updateSynopsis(sv)
          child.count += 1
        }
        store.dropSpill(leaf)
        leaf.slots = null
        leaf.split = policy
        leaf.left = l
        leaf.right = r
        leaf.isLeaf = false // volatile store last: publishes the split safely
    }
  }

  /** Number of leaves currently in the tree. */
  def leafCount: Int = root.leavesInorder.size
}

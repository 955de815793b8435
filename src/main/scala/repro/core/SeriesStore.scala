package repro.core

import java.io.{BufferedOutputStream, DataInputStream, DataOutputStream, FileInputStream, FileOutputStream}
import java.nio.file.{Files, Path}
import scala.collection.mutable.ArrayBuffer

/** The HBuffer of §3.3: one pre-allocated flat float buffer holding the raw
  * series of all leaves, divided into per-worker bump-allocated regions.
  * Leaves reference it through SBuffer slot lists (`Node.slots`); when a
  * flush is ordered, every leaf's buffered series are appended to that leaf's
  * spill file and all regions reset — exactly the paper's two-level scheme.
  *
  * Allocation is region-local (no synchronization); cross-thread visibility
  * of written floats is provided by the leaf lock under which slots are
  * published (writer stores floats, then adds the slot under the lock).
  */
final class SeriesStore(
    val seriesLen: Int,
    val numWorkers: Int,
    val regionSlots: Int,
    spillRoot: Path,
) {
  require(regionSlots >= 1)

  private val flat = new Array[Float](numWorkers * regionSlots * seriesLen)
  private val slotIds = new Array[Long](numWorkers * regionSlots)
  private val used = new Array[Int](numWorkers)

  /** Remaining slots in worker `w`'s region. */
  def freeSlots(w: Int): Int = regionSlots - used(w)

  /** Copy a series into worker `w`'s region; returns its global slot index. */
  def alloc(w: Int, id: Long, s: Array[Float]): Int = {
    val local = used(w)
    require(local < regionSlots, s"worker $w region overflow")
    used(w) = local + 1
    val slot = w * regionSlots + local
    System.arraycopy(s, 0, flat, slot * seriesLen, seriesLen)
    slotIds(slot) = id
    slot
  }

  /** Materialize the series stored in `slot` (defensive copy). */
  def seriesAt(slot: Int): Array[Float] = {
    val out = new Array[Float](seriesLen)
    System.arraycopy(flat, slot * seriesLen, out, 0, seriesLen)
    out
  }

  /** Original id of the series stored in `slot`. */
  def idAt(slot: Int): Long = slotIds(slot)

  /** Stat of one segment of the slot's series without copying. */
  def segMeanSd(slot: Int, from: Int, until: Int): (Double, Double) = {
    val off = slot * seriesLen
    var i = off + from
    val end = off + until
    var sum = 0.0
    var sum2 = 0.0
    while (i < end) { val v = flat(i).toDouble; sum += v; sum2 += v * v; i += 1 }
    val len = until - from
    val m = sum / len
    (m, math.sqrt(math.max(0.0, sum2 / len - m * m)))
  }

  /** Flush every leaf of `root`: append buffered series to the leaf's spill
    * file, clear its SBuffer, then reset all regions. Single-threaded — the
    * FlushCoordinator runs this while all other workers are parked (§3.3.2).
    */
  def flushAll(root: Node): Unit = {
    root.leavesInorder.foreach { leaf =>
      if (leaf.slots != null && leaf.slots.nonEmpty) {
        val out = new DataOutputStream(new BufferedOutputStream(
          new FileOutputStream(spillPathFor(leaf).toFile, true)))
        try {
          leaf.slots.foreach { slot =>
            out.writeLong(slotIds(slot))
            val off = slot * seriesLen
            var i = 0
            while (i < seriesLen) { out.writeFloat(flat(off + i)); i += 1 }
          }
        } finally out.close()
        leaf.spilledCount += leaf.slots.size
        leaf.slots.clear()
      }
    }
    java.util.Arrays.fill(used, 0)
  }

  /** The spill file of a leaf (created lazily on first flush). */
  def spillPathFor(leaf: Node): Path = {
    if (leaf.spillFile == null) leaf.spillFile = spillRoot.resolve(s"leaf-${leaf.id}.bin")
    leaf.spillFile
  }

  /** Read a leaf's spilled records (id, series) in append order. */
  def readSpill(leaf: Node): ArrayBuffer[(Long, Array[Float])] = {
    val out = new ArrayBuffer[(Long, Array[Float])](leaf.spilledCount)
    if (leaf.spilledCount > 0 && leaf.spillFile != null && Files.exists(leaf.spillFile)) {
      val in = new DataInputStream(new java.io.BufferedInputStream(
        new FileInputStream(leaf.spillFile.toFile)))
      try {
        var r = 0
        while (r < leaf.spilledCount) {
          val id = in.readLong()
          val s = new Array[Float](seriesLen)
          var i = 0
          while (i < seriesLen) { s(i) = in.readFloat(); i += 1 }
          out += ((id, s))
          r += 1
        }
      } finally in.close()
    }
    out
  }

  /** All series of a leaf: spilled records first, then in-memory slots. */
  def gather(leaf: Node): ArrayBuffer[(Long, Array[Float])] = {
    val out = readSpill(leaf)
    if (leaf.slots != null) leaf.slots.foreach(slot => out += ((idAt(slot), seriesAt(slot))))
    out
  }

  /** Delete a split node's spill file (children got their own). */
  def dropSpill(leaf: Node): Unit = {
    if (leaf.spillFile != null) { Files.deleteIfExists(leaf.spillFile); leaf.spillFile = null }
    leaf.spilledCount = 0
  }
}

object SeriesStore {

  /** Create a store with a fresh temp spill directory.
    *
    * @param totalSlots capacity across all workers; rounded up so each region
    *                   holds at least `minRegion` series (the DBuffer chunk —
    *                   Algorithm 2's "at least DBSize empty slots" check needs
    *                   regions that can absorb one full chunk).
    */
  def create(seriesLen: Int, numWorkers: Int, totalSlots: Int, minRegion: Int): SeriesStore = {
    val region = math.max(minRegion, (totalSlots + numWorkers - 1) / numWorkers)
    val dir = Files.createTempDirectory("hercules-spill-")
    dir.toFile.deleteOnExit()
    new SeriesStore(seriesLen, numWorkers, region, dir)
  }
}

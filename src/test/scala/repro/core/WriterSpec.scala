package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil

/** Index writing: LRDFile layout, LSDFile alignment, synopsis rebuild
  * (HSplitSynopsis + VSplitSynopsis) and subtree counts.
  */
class WriterSpec extends AnyFunSuite {

  private def build(n: Int, threads: Int, writerThreads: Int, seed: Long,
                    mode: BuildMode = BuildMode.Hercules): (HerculesIndex, Array[Long], Array[Array[Float]]) = {
    val cfg = TestUtil.cfg(32, 16, threads).copy(writerThreads = writerThreads)
    val (ids, data) = TestUtil.dataset(n, 32, seed)
    (HerculesIndex.build(ids, data, cfg, mode), ids, data)
  }

  test("LRDFile positions are the inorder leaf traversal, contiguous from 0") {
    val (idx, _, _) = build(400, 2, 2, 1)
    var pos = 0
    idx.leaves.foreach { leaf =>
      assert(leaf.filePos == pos)
      pos += leaf.leafSize
    }
    assert(pos == idx.nSeries)
  }

  test("LRDFile contents equal the original series (by id)") {
    val (idx, ids, data) = build(300, 2, 2, 2)
    val byId = ids.zip(data).toMap
    for (i <- 0 until idx.nSeries) {
      val sid = idx.ids(i)
      val orig = byId(sid)
      for (j <- 0 until 32)
        assert(idx.lrd(i * 32 + j) == orig(j), s"series $sid point $j")
    }
  }

  test("LSDFile words match the iSAX of LRDFile series at the same position") {
    val (idx, _, _) = build(300, 2, 2, 3)
    val segs = idx.isax.segments
    for (i <- 0 until idx.nSeries) {
      val s = new Array[Float](32)
      System.arraycopy(idx.lrd, i * 32, s, 0, 32)
      val w = idx.isax.word(s)
      for (j <- 0 until segs)
        assert(idx.lsd(i * segs + j) == w(j), s"pos $i seg $j")
    }
  }

  for ((writerThreads, seed) <- Seq((1, 4), (4, 5)))
    test(s"internal synopses cover every subtree member (writerThreads=$writerThreads)") {
      val (idx, _, _) = build(500, 4, writerThreads, seed)
      def membersOf(n: Node): Seq[Array[Float]] =
        n.leavesInorder.toSeq.flatMap { leaf =>
          (leaf.filePos until leaf.filePos + leaf.leafSize).map { i =>
            val s = new Array[Float](32)
            System.arraycopy(idx.lrd, i * 32, s, 0, 32)
            s
          }
        }
      def walk(n: Node): Unit = {
        val members = membersOf(n)
        members.foreach { s =>
          for (j <- 0 until n.segCount) {
            val (m, sd) = Stats.meanSd(s, n.segStart(j), n.ends(j))
            assert(m >= n.muMin(j) - 1e-6 && m <= n.muMax(j) + 1e-6,
              s"node ${n.id} seg $j mean $m not in [${n.muMin(j)}, ${n.muMax(j)}]")
            assert(sd >= n.sdMin(j) - 1e-6 && sd <= n.sdMax(j) + 1e-6,
              s"node ${n.id} seg $j sd $sd not in [${n.sdMin(j)}, ${n.sdMax(j)}]")
          }
        }
        if (!n.isLeaf) { walk(n.left); walk(n.right) }
      }
      walk(idx.root)
    }

  test("subtree counts are consistent after writing") {
    val (idx, _, _) = build(400, 2, 2, 6)
    def walk(n: Node): Int =
      if (n.isLeaf) { assert(n.count == n.leafSize); n.count }
      else {
        val c = walk(n.left) + walk(n.right)
        assert(n.count == c, s"node ${n.id}: count ${n.count} != children sum $c")
        c
      }
    assert(walk(idx.root) == idx.nSeries)
  }

  test("sequential (DSTree*) build without writer synopsis pass is also covering") {
    val (idx, _, _) = build(400, 1, 1, 7, BuildMode.Sequential)
    // the LB must never exceed a member's true distance — covering synopses
    val q = SeriesGen.dataset("walk", 1, 32, 1234)(0)
    val qc = new SeriesCtx(q)
    def walk(n: Node): Unit = {
      val lb2 = Eapca.lb2(qc, n)
      n.leavesInorder.foreach { leaf =>
        (leaf.filePos until leaf.filePos + leaf.leafSize).foreach { i =>
          val d = Dist.ed2Flat(q, idx.lrd, i * 32, Double.PositiveInfinity)
          assert(lb2 <= d + 1e-6)
        }
      }
      if (!n.isLeaf) { walk(n.left); walk(n.right) }
    }
    walk(idx.root)
  }

  test("writer nulls build-time leaf storage") {
    val (idx, _, _) = build(200, 2, 2, 8)
    idx.leaves.foreach(l => assert(l.slots == null))
  }

  test("V-split destroyed segments get correct raw-recomputed synopses") {
    // force many V-splits by starting from a single segment and small leaves
    val cfg = TestUtil.cfg(64, 8, 4).copy(writerThreads = 4)
    val (ids, data) = TestUtil.dataset(400, 64, 9)
    val idx = HerculesIndex.build(ids, data, cfg)
    var vSplits = 0
    def walk(n: Node): Unit = if (!n.isLeaf) {
      if (n.split.vertical) vSplits += 1
      walk(n.left); walk(n.right)
    }
    walk(idx.root)
    assert(vSplits > 0, "dataset produced no V-splits; invariant untested")
    // covered by the synopsis-covering test above, but re-assert on this tree
    val q = SeriesGen.dataset("walk", 1, 64, 77)(0)
    val res = idx.knn(q, QueryKnobs(k = 5, lmax = 2))
    TestUtil.assertExact(ids, data, q, 5, res, "v-split tree")
  }
}

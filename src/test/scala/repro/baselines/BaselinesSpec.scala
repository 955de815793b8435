package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core._

/** Exactness of every baseline against brute force, across datasets,
  * workloads and k — plus method-specific invariants.
  */
class BaselinesSpec extends AnyFunSuite {

  private val len = 32
  private val n = 700

  private lazy val fixtures: Map[String, (Array[Long], Array[Array[Float]])] =
    Seq("walk", "deep").map(kind => kind -> TestUtil.dataset(n, len, 31, kind)).toMap

  private lazy val pscans = fixtures.map { case (k, (ids, data)) => k -> Pscan.build(ids, data, len) }
  private lazy val dstrees = fixtures.map { case (k, (ids, data)) =>
    k -> DSTreeIndex.build(ids, data, TestUtil.cfg(len, 16))
  }
  private lazy val pariss = fixtures.map { case (k, (ids, data)) =>
    k -> ParISIndex.build(ids, data, TestUtil.cfg(len, 16))
  }
  private lazy val vafiles = fixtures.map { case (k, (ids, data)) => k -> VAFile.build(ids, data, len) }

  for (kind <- Seq("walk", "deep"); wl <- Seq("1%", "5%", "ood"); k <- Seq(1, 5))
    test(s"PSCAN exact ($kind/$wl k=$k)") {
      val (ids, data) = fixtures(kind)
      SeriesGen.queries(kind, wl, 3, n, len, 31).zipWithIndex.foreach { case (q, qi) =>
        TestUtil.assertExact(ids, data, q, k, pscans(kind).knn(q, k, 4), s"pscan $qi")
      }
    }

  for (kind <- Seq("walk", "deep"); wl <- Seq("1%", "5%", "ood"); k <- Seq(1, 5))
    test(s"DSTree* exact ($kind/$wl k=$k)") {
      val (ids, data) = fixtures(kind)
      SeriesGen.queries(kind, wl, 3, n, len, 31).zipWithIndex.foreach { case (q, qi) =>
        TestUtil.assertExact(ids, data, q, k, dstrees(kind).knn(q, k), s"dstree $qi")
      }
    }

  for (kind <- Seq("walk", "deep"); wl <- Seq("1%", "5%", "ood"); k <- Seq(1, 5))
    test(s"ParIS+ exact ($kind/$wl k=$k)") {
      val (ids, data) = fixtures(kind)
      SeriesGen.queries(kind, wl, 3, n, len, 31).zipWithIndex.foreach { case (q, qi) =>
        TestUtil.assertExact(ids, data, q, k, pariss(kind).knn(q, k, 3), s"paris $qi")
      }
    }

  for (kind <- Seq("walk", "deep"); wl <- Seq("1%", "5%", "ood"); k <- Seq(1, 5))
    test(s"VA+file exact ($kind/$wl k=$k)") {
      val (ids, data) = fixtures(kind)
      SeriesGen.queries(kind, wl, 3, n, len, 31).zipWithIndex.foreach { case (q, qi) =>
        TestUtil.assertExact(ids, data, q, k, vafiles(kind).knn(q, k), s"vafile $qi")
      }
    }

  test("VAFile DFT transform lower-bounds the true distance") {
    val data = SeriesGen.dataset("walk", 30, len, 5)
    val q = SeriesGen.dataset("walk", 1, len, 6)(0)
    val qf = VAFile.transform(q, 16)
    data.foreach { s =>
      val sf = VAFile.transform(s, 16)
      val featDist = qf.zip(sf).map { case (a, b) => (a - b) * (a - b) }.sum
      assert(featDist <= Dist.ed2(q, s) + 1e-6)
    }
  }

  test("VAFile transform preserves energy ordering (Parseval sanity)") {
    val s = SeriesGen.dataset("walk", 1, 64, 8)(0)
    val f = VAFile.transform(s, 16)
    val featEnergy = f.map(x => x * x).sum
    val fullEnergy = s.map(x => x.toDouble * x).sum
    assert(featEnergy <= fullEnergy + 1e-6)
    assert(featEnergy > 0.3 * fullEnergy, "DFT should capture most walk energy")
  }

  test("VAFile cell bounds contain their member features") {
    val (ids, data) = fixtures("walk")
    val va = vafiles("walk")
    for (i <- 0 until 50) {
      val f = VAFile.transform(data(i), va.dims)
      for (d <- 0 until va.dims) {
        val c = va.cells(i * va.dims + d) & 0xff
        assert(f(d) >= va.boundaries(d)(c) - 1e-9)
        assert(f(d) <= va.boundaries(d)(c + 1) + 1e-9)
      }
    }
  }

  test("ParIS+ groups partition the collection") {
    val p = pariss("walk")
    assert(p.groups.values.map(_.length).sum == n)
  }

  test("ParIS+ handles a query landing in an empty subtree") {
    val (ids, data) = fixtures("deep")
    val far = Array.fill(len)(0f) // all-zero z-normed vector: likely empty key
    val res = pariss("deep").knn(Stats.znorm(far.map(_ + 1f)), 3, 2)
    TestUtil.assertExact(ids, data, Stats.znorm(far.map(_ + 1f)), 3, res, "empty subtree")
  }

  test("DSTree query visits fewer series than a scan on easy queries") {
    val (_, data) = fixtures("walk")
    val st = new QueryStats
    val q = SeriesGen.queries("walk", "1%", 1, n, len, 31)(0)
    dstrees("walk").knn(q, 1, st)
    assert(st.seriesAccessed.get < n, s"accessed ${st.seriesAccessed.get} of $n")
  }

  test("BruteForce returns k sorted answers") {
    val (ids, data) = fixtures("walk")
    val q = SeriesGen.queries("walk", "5%", 1, n, len, 31)(0)
    val res = BruteForce.knn(ids, data, q, 7)
    assert(res.length == 7)
    res.sliding(2).foreach(p => assert(p(0).dist2 <= p(1).dist2))
  }
}

package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil

/** Exact query answering across every adaptive path, knob, k, and workload. */
class QuerySpec extends AnyFunSuite {

  private val len = 32
  private val n = 900

  // One index per dataset kind, shared across the suite's tests.
  private lazy val fixtures: Map[String, (Array[Long], Array[Array[Float]], HerculesIndex)] =
    Seq("walk", "deep", "seismic").map { kind =>
      val (ids, data) = TestUtil.dataset(n, len, 11, kind)
      kind -> ((ids, data, HerculesIndex.build(ids, data, TestUtil.cfg(len, 16, 2))))
    }.toMap

  private def checkQueries(kind: String, workload: String, k: Int, knobs: QueryKnobs,
                           nQ: Int = 4): Unit = {
    val (ids, data, idx) = fixtures(kind)
    val queries = SeriesGen.queries(kind, workload, nQ, n, len, 11, querySeed = k * 31 + workload.hashCode)
    queries.zipWithIndex.foreach { case (q, qi) =>
      val stats = new QueryStats
      val res = idx.knn(q, knobs.copy(k = k), stats)
      TestUtil.assertExact(ids, data, q, k, res, s"$kind/$workload k=$k q$qi knobs=$knobs")
      assert(stats.seriesAccessed.get >= res.length.toLong)
    }
  }

  for (kind <- Seq("walk", "deep", "seismic"); wl <- Seq("1%", "5%", "ood"); k <- Seq(1, 5, 20))
    test(s"exact kNN matches brute force ($kind/$wl k=$k)") {
      checkQueries(kind, wl, k, QueryKnobs(lmax = 4, threads = 2))
    }

  for (lmax <- Seq(1, 2, 64, 10000))
    test(s"exactness independent of Lmax=$lmax") {
      checkQueries("walk", "5%", 3, QueryKnobs(lmax = lmax, threads = 2))
    }

  test("forced EAPCA skip-sequential path (eapcaTh=1.0) is exact and flagged") {
    val (ids, data, idx) = fixtures("deep")
    val q = SeriesGen.queries("deep", "ood", 1, n, len, 11)(0)
    val stats = new QueryStats
    val res = idx.knn(q, QueryKnobs(k = 3, lmax = 2, eapcaTh = 1.0, threads = 2), stats)
    TestUtil.assertExact(ids, data, q, 3, res, "forced eapca skip-seq")
    assert(stats.skipSeqEapca)
  }

  test("forced SAX skip-sequential path (saxTh=1.0, eapcaTh=0) is exact and flagged") {
    val (ids, data, idx) = fixtures("deep")
    val q = SeriesGen.queries("deep", "ood", 1, n, len, 11)(0)
    val stats = new QueryStats
    val res = idx.knn(q, QueryKnobs(k = 3, lmax = 2, eapcaTh = 0.0, saxTh = 1.0, threads = 2), stats)
    TestUtil.assertExact(ids, data, q, 3, res, "forced sax skip-seq")
    assert(stats.skipSeqSax && !stats.skipSeqEapca)
  }

  for (threads <- Seq(1, 2, 4, 8))
    test(s"exactness independent of query threads=$threads") {
      checkQueries("walk", "5%", 5, QueryKnobs(lmax = 4, threads = threads))
    }

  test("NoSAX ablation (useSax=false) is exact") {
    checkQueries("walk", "ood", 3, QueryKnobs(lmax = 4, useSax = false, threads = 2))
    checkQueries("deep", "ood", 3, QueryKnobs(lmax = 4, useSax = false, threads = 2))
  }

  test("NoThresh ablation (useThresholds=false) is exact") {
    checkQueries("deep", "ood", 3, QueryKnobs(lmax = 4, useThresholds = false, threads = 2))
  }

  test("NoPara ablation (threads=1) is exact") {
    checkQueries("seismic", "10%", 3, QueryKnobs(lmax = 4, threads = 1))
  }

  test("k larger than the dataset returns every series") {
    val (ids, data) = TestUtil.dataset(10, len, 3)
    val idx = HerculesIndex.build(ids, data, TestUtil.cfg(len, 4))
    val q = SeriesGen.queries("walk", "ood", 1, 10, len, 3)(0)
    val res = idx.knn(q, QueryKnobs(k = 50, lmax = 2))
    assert(res.length == 10)
    TestUtil.assertExact(ids, data, q, 50, res, "k > n")
  }

  test("query identical to an indexed series finds it at distance 0") {
    val (ids, data, idx) = fixtures("walk")
    val res = idx.knn(data(123), QueryKnobs(k = 1, lmax = 2))
    assert(res(0).id == 123L && res(0).dist2 == 0.0)
  }

  test("easy queries access less data than hard ones (pruning works)") {
    val (_, _, idx) = fixtures("walk")
    def accessed(wl: String): Double = {
      val qs = SeriesGen.queries("walk", wl, 5, n, len, 11)
      qs.map { q =>
        val st = new QueryStats
        idx.knn(q, QueryKnobs(k = 1, lmax = 4, threads = 2), st)
        st.accessFraction(n)
      }.sum / qs.length
    }
    val easy = accessed("1%")
    val hard = accessed("ood")
    assert(easy <= hard + 1e-9, s"easy=$easy hard=$hard")
    assert(easy < 0.9, s"easy workload should prune most data, accessed ${easy * 100}%")
  }

  test("QueryStats counters populate consistently") {
    val (_, _, idx) = fixtures("walk")
    val q = SeriesGen.queries("walk", "5%", 1, n, len, 11)(0)
    val st = new QueryStats
    idx.knn(q, QueryKnobs(k = 1, lmax = 4, threads = 2), st)
    assert(st.leavesVisited.get >= 1)
    assert(st.seriesAccessed.get >= 1 && st.seriesAccessed.get <= n)
  }
}

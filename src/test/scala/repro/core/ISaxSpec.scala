package repro.core

import java.util.Random
import org.scalatest.funsuite.AnyFunSuite

/** iSAX codec: breakpoints, symbols, PAA, and the LB_SAX lower bound. */
class ISaxSpec extends AnyFunSuite {

  private val isax = new ISax(64, 16, 256)

  test("invNormCdf is a valid quantile function") {
    assert(math.abs(ISax.invNormCdf(0.5)) < 1e-9)
    assert(math.abs(ISax.invNormCdf(0.975) - 1.959964) < 1e-4)
    assert(math.abs(ISax.invNormCdf(0.025) + 1.959964) < 1e-4)
    assert(ISax.invNormCdf(0.001) < -3.0 && ISax.invNormCdf(0.999) > 3.0)
  }

  test("breakpoints are strictly increasing and symmetric") {
    val bp = isax.breakpoints
    assert(bp.length == 255)
    bp.sliding(2).foreach(p => assert(p(0) < p(1)))
    bp.indices.foreach(i => assert(math.abs(bp(i) + bp(bp.length - 1 - i)) < 1e-6))
  }

  test("segment boundaries cover [0, n) exactly") {
    for (n <- Seq(16, 17, 64, 96, 100, 128); m <- Seq(4, 16)) {
      val s = new ISax(n, math.min(m, n), 256)
      assert(s.ends.head == 0 && s.ends.last == n)
      s.ends.sliding(2).foreach(p => assert(p(0) < p(1)))
    }
  }

  test("symbolOf maps values to the correct region") {
    assert(isax.symbolOf(-100.0) == 0)
    assert((isax.symbolOf(100.0) & 0xff) == 255)
    for (i <- 0 until 255) {
      val bp = isax.breakpoints(i)
      assert((isax.symbolOf(bp - 1e-9) & 0xff) == i)
      assert((isax.symbolOf(bp + 1e-9) & 0xff) == i + 1)
    }
  }

  test("paa of a constant series is constant") {
    val p = isax.paa(Array.fill(64)(2f))
    assert(p.forall(v => math.abs(v - 2.0) < 1e-6))
  }

  test("word round-trips through symbolOf(paa)") {
    val s = SeriesGen.dataset("walk", 1, 64, 7)(0)
    val p = isax.paa(s)
    val w = isax.word(s)
    p.indices.foreach(i => assert(w(i) == isax.symbolOf(p(i))))
  }

  test("lbSax2 is zero for the series' own word when PAA falls in-region") {
    val s = SeriesGen.dataset("walk", 1, 64, 9)(0)
    val w = isax.word(s)
    assert(isax.lbSax2(isax.paa(s), w, 0) == 0.0)
  }

  for (seed <- 1 to 10)
    test(s"LB_SAX lower-bounds the true squared ED (seed $seed)") {
      val rng = new Random(seed)
      val data = SeriesGen.dataset("walk", 20, 64, seed)
      val q = SeriesGen.dataset("walk", 1, 64, seed + 1000)(0)
      val paaQ = isax.paa(q)
      data.foreach { s =>
        val lb = isax.lbSax2(paaQ, isax.word(s), 0)
        val d = Dist.ed2(q, s)
        assert(lb <= d + 1e-6, s"lb=$lb > ed2=$d")
      }
      // also for non-walk shapes
      val g = Array.fill(64)((rng.nextGaussian()).toFloat)
      val lb = isax.lbSax2(paaQ, isax.word(g), 0)
      assert(lb <= Dist.ed2(q, g) + 1e-6)
    }

  for (len <- Seq(17, 33, 96))
    test(s"LB_SAX holds for uneven segment lengths (len $len)") {
      val s = new ISax(len, 16, 256)
      val data = SeriesGen.dataset("deep", 10, len, len)
      val q = SeriesGen.dataset("deep", 1, len, len + 5)(0)
      val paaQ = s.paa(q)
      data.foreach { x =>
        assert(s.lbSax2(paaQ, s.word(x), 0) <= Dist.ed2(q, x) + 1e-6)
      }
    }

  test("smaller cardinality gives looser (but valid) bounds") {
    val coarse = new ISax(64, 16, 16)
    val fine = new ISax(64, 16, 256)
    val data = SeriesGen.dataset("walk", 15, 64, 3)
    val q = SeriesGen.dataset("walk", 1, 64, 99)(0)
    data.foreach { x =>
      val lbC = coarse.lbSax2(coarse.paa(q), coarse.word(x), 0)
      val lbF = fine.lbSax2(fine.paa(q), fine.word(x), 0)
      val d = Dist.ed2(q, x)
      assert(lbC <= d + 1e-6 && lbF <= d + 1e-6)
      assert(lbC <= lbF + 1e-6) // finer alphabet can only tighten
    }
  }
}

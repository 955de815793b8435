package repro.core

import java.util.Random
import org.scalatest.funsuite.AnyFunSuite

/** Stats, z-normalization and prefix-sum segment statistics. */
class StatsSpec extends AnyFunSuite {

  private def randSeries(rng: Random, n: Int): Array[Float] =
    Array.fill(n)((rng.nextDouble() * 100 - 50).toFloat)

  test("meanSd of a constant segment is (c, 0)") {
    val s = Array.fill(10)(3.5f)
    val (m, sd) = Stats.meanSd(s, 0, 10)
    assert(math.abs(m - 3.5) < 1e-9 && sd < 1e-9)
  }

  test("meanSd matches direct computation on a known segment") {
    val s = Array(1f, 2f, 3f, 4f, 5f, 6f)
    val (m, sd) = Stats.meanSd(s, 1, 5) // 2,3,4,5
    assert(math.abs(m - 3.5) < 1e-12)
    assert(math.abs(sd - math.sqrt(1.25)) < 1e-12)
  }

  test("meanSd never returns negative variance (catastrophic cancellation)") {
    val s = Array.fill(32)(1e6f)
    val (_, sd) = Stats.meanSd(s, 0, 32)
    assert(sd >= 0.0)
  }

  for (seed <- 1 to 8)
    test(s"znorm produces mean ~0 and sd ~1 (seed $seed)") {
      val z = Stats.znorm(randSeries(new Random(seed), 40 + seed))
      val (m, sd) = Stats.meanSd(z, 0, z.length)
      assert(math.abs(m) < 1e-4)
      assert(math.abs(sd - 1.0) < 1e-4)
    }

  test("znorm of a constant series is all zeros") {
    val z = Stats.znorm(Array.fill(8)(7f))
    assert(z.forall(_ == 0f))
  }

  for (seed <- 1 to 5)
    test(s"SeriesCtx mean/sd equals Stats.meanSd on every segment (seed $seed)") {
      val s = randSeries(new Random(100 + seed), 32)
      val ctx = new SeriesCtx(s)
      for (from <- 0 until s.length; until <- (from + 1) to s.length) {
        val (m, sd) = Stats.meanSd(s, from, until)
        assert(math.abs(ctx.mean(from, until) - m) < 1e-5, s"mean [$from,$until)")
        assert(math.abs(ctx.sd(from, until) - sd) < 1e-5, s"sd [$from,$until)")
      }
    }

  for (seed <- 1 to 5)
    test(s"SeriesCtx whole-series stats match on walk data (seed $seed)") {
      val s = SeriesGen.dataset("walk", 1, 64, seed)(0)
      val ctx = new SeriesCtx(s)
      val (m, sd) = Stats.meanSd(s, 0, 64)
      assert(math.abs(ctx.mean(0, 64) - m) < 1e-9)
      assert(math.abs(ctx.sd(0, 64) - sd) < 1e-9)
    }
}

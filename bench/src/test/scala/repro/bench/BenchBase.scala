package repro.bench

import repro.SparkSpec
import repro.experiments.BenchRow

/** Shared bench plumbing: scale factor, rendering, and sanity assertions.
  * Exactness is enforced inside the harness (`Runner.checkExactAgreement`),
  * so a green bench means all methods returned identical exact answers; the
  * numbers themselves are printed for EXPERIMENTS.md and compared to the
  * paper's digitized values there (shape, not absolute scale).
  */
trait BenchBase extends SparkSpec {
  /** Dataset scale multiplier (BENCH_SCALE env; 1.0 default). */
  def scale: Double = sys.env.get("BENCH_SCALE").map(_.toDouble).getOrElse(1.0)

  /** Print a figure's table and sanity-check its rows. */
  def emit(title: String, rows: Seq[BenchRow]): Seq[BenchRow] = {
    println(BenchRow.render(title, rows))
    assert(rows.nonEmpty, s"$title produced no rows")
    rows.foreach(r => assert(!r.value.isNaN && r.value >= 0.0, s"bad value in $r"))
    rows
  }

  /** Value lookup helper for shape statements. */
  def value(rows: Seq[BenchRow], config: String, method: String, metric: String): Double =
    rows.find(r => r.config == config && r.method == method && r.metric == metric)
      .map(_.value)
      .getOrElse(fail(s"missing row $config/$method/$metric"))

  /** Print a shape comparison against the paper (warn, don't fail: absolute
    * hardware differs; EXPERIMENTS.md records both sides).
    */
  def shape(claim: String, holds: Boolean): Unit =
    println(f"  [shape] ${if (holds) "OK  " else "WARN"} $claim")
}

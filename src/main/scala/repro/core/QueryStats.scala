package repro.core

import java.util.concurrent.atomic.AtomicLong

/** Per-query access accounting — the paper's "percentage of data accessed"
  * metric plus which adaptive path Algorithm 10 took. Counters are atomic so
  * parallel steps 3–4 can update them directly.
  */
final class QueryStats extends Serializable {
  /** Raw series whose floats were touched (real-distance computations). */
  val seriesAccessed = new AtomicLong(0)

  /** Leaves visited by the approximate search (step 1). */
  val leavesVisited = new AtomicLong(0)

  /** iSAX words evaluated (step 3). */
  val saxChecked = new AtomicLong(0)

  /** Candidate leaves after EAPCA pruning (size of LCList). */
  @volatile var candidateLeaves: Long = 0

  /** Candidate series after SAX pruning (size of SCList). */
  @volatile var candidateSeries: Long = 0

  /** True if step 2 fell back to the skip-sequential scan (EAPCA_TH). */
  @volatile var skipSeqEapca: Boolean = false

  /** True if step 3 fell back to the skip-sequential scan (SAX_TH). */
  @volatile var skipSeqSax: Boolean = false

  /** Fraction of the collection accessed, given its total size. */
  def accessFraction(total: Long): Double =
    if (total == 0) 0.0 else seriesAccessed.get.toDouble / total

  /** Fold another partition's stats into this one. */
  def merge(o: QueryStats): Unit = {
    seriesAccessed.addAndGet(o.seriesAccessed.get)
    leavesVisited.addAndGet(o.leavesVisited.get)
    saxChecked.addAndGet(o.saxChecked.get)
    candidateLeaves += o.candidateLeaves
    candidateSeries += o.candidateSeries
    skipSeqEapca ||= o.skipSeqEapca
    skipSeqSax ||= o.skipSeqSax
  }
}

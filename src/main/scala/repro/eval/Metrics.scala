package repro.eval

/** Effectiveness measures of Sec. 8.1 (Eq. 12, Eq. 13).
  *
  * Conventions from the paper:
  *  - if a method returns fewer than k results, the missing slots count as
  *    incorrect for P@k (the "2 of 20, 1 correct → P@10 = 1/10" example);
  *  - R@k divides by the full ground-truth size, so when k < |T_Q| perfect
  *    recall is impossible (the "Ideal" line of Fig. 8);
  *  - MAP@k is the mean of P@i over ranks i = 1..k, exactly as Eq. 13 is
  *    written (the summation runs over every rank, not only relevant ones).
  */
object Metrics {

  def precisionAtK(ranked: Seq[String], relevant: Set[String], k: Int): Double = {
    require(k > 0, "k must be positive")
    ranked.take(k).count(relevant.contains).toDouble / k
  }

  def recallAtK(ranked: Seq[String], relevant: Set[String], k: Int): Double = {
    require(k > 0, "k must be positive")
    if (relevant.isEmpty) 0.0
    else ranked.take(k).count(relevant.contains).toDouble / relevant.size
  }

  def mapAtK(ranked: Seq[String], relevant: Set[String], k: Int): Double = {
    require(k > 0, "k must be positive")
    (1 to k).map(i => precisionAtK(ranked, relevant, i)).sum / k
  }

  /** Best achievable R@k given the ground-truth size (the Fig. 8 ideal line). */
  def idealRecallAtK(nRelevant: Int, k: Int): Double =
    if (nRelevant == 0) 0.0 else math.min(k, nRelevant).toDouble / nRelevant

  /** Mean of a metric over queries. */
  def mean(xs: Seq[Double]): Double = if (xs.isEmpty) 0.0 else xs.sum / xs.size

  /** Percentile with linear interpolation (for the Fig. 10 query-time 10th
    * and 90th percentiles).
    */
  def percentile(xs: Seq[Double], p: Double): Double = {
    require(xs.nonEmpty, "empty sample")
    require(p >= 0 && p <= 1, "p in [0,1]")
    val sorted = xs.sorted
    val pos = p * (sorted.size - 1)
    val lo = math.floor(pos).toInt
    val hi = math.ceil(pos).toInt
    if (lo == hi) sorted(lo)
    else sorted(lo) + (pos - lo) * (sorted(hi) - sorted(lo))
  }
}

package repro.core

import IoUMath._

/** Algorithm 1: minimise the number of layers L subject to the bin budget
  * B and the expected-false-positive budget F0 (§IV-A0c).
  *
  * Structure follows the paper exactly: a cheap lower-bound feasibility
  * check (Lemma 1); if the fast region [1, L_min] already satisfies the
  * budget, binary-search the smallest such integer L there (F̂ is strictly
  * decreasing on that region by Lemma 2); otherwise iterate L upward
  * through the slow region [L_min, L_max] (no monotonicity guarantee,
  * Lemma 3 bounds it) and reject if nothing satisfies the budget.
  * Constraint checks use the *exact* F of Eq. (2).
  */
object LayerOptimizer {

  /** Why a (B, F0) configuration was rejected. */
  sealed trait Rejection { def message: String }
  case object InfeasibleLowerBound extends Rejection {
    val message = "Lemma-1 lower bound exceeds F0: no L can satisfy the budget at this B"
  }
  case object SearchExhausted extends Rejection {
    val message = "no integer L in [1, L_max] satisfies the F0 budget"
  }

  /** Find the minimum feasible integer number of layers. */
  def minimizeLayers(b: Int, f0: Double, hist: Seq[HistRow]): Either[Rejection, Int] = {
    require(b >= 1 && f0 >= 0 && hist.nonEmpty)
    val bd = b.toDouble

    if (lowerBound(bd, hist) > f0) return Left(InfeasibleLowerBound)

    val lMinC = lMin(bd, hist)
    val lMaxC = lMax(bd, hist)
    // Largest integer inside the fast region (clamped to [1, B]).
    val lMinInt = math.max(1, math.min(b, math.floor(lMinC).toInt))

    if (fExact(lMinInt, bd, hist) <= f0) {
      // Fast region: binary search the smallest feasible L in [1, lMinInt].
      var lo = 1
      var hi = lMinInt
      while (lo < hi) {
        val mid = (lo + hi) / 2
        if (fExact(mid, bd, hist) <= f0) hi = mid else lo = mid + 1
      }
      Right(lo)
    } else {
      // Slow region: iterate upward from just past L_min to L_max.
      val start = math.max(lMinInt + 1, 1)
      val end = math.max(start, math.min(b, math.ceil(lMaxC).toInt))
      (start to end).find(l => fExact(l, bd, hist) <= f0) match {
        case Some(l) => Right(l)
        case None    => Left(SearchExhausted)
      }
    }
  }

  /** Brute-force reference: smallest L in [1, maxL] with F(L) <= F0.
    * Used by tests to validate [[minimizeLayers]] inside the fast region.
    */
  def bruteForce(b: Int, f0: Double, hist: Seq[HistRow], maxL: Int): Option[Int] =
    (1 to math.min(maxL, b)).find(l => fExact(l, b.toDouble, hist) <= f0)
}

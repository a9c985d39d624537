package repro.core

/** Lower-bound specification deciding when a pattern's top-k count is
  * biased. Mirrors the two problem definitions of the paper; both are
  * expressed through a per-(pattern, k) threshold so the top-down search
  * (Algorithm 1) is shared, exactly as the paper's baseline is.
  */
sealed trait BiasBound {

  /** Representation threshold for a pattern with dataset size `sD` in the
    * top-`k`; the pattern is biased iff its top-k count is strictly below.
    */
  def threshold(sD: Long, k: Int): Double

  /** Is a pattern with the given counts biased at position `k`? */
  final def biased(cnt: Long, sD: Long, k: Int): Boolean =
    cnt.toDouble < threshold(sD, k)
}

/** Problem 3.1: user-given bounds `L_k`, independent of the group size. */
final case class GlobalLowerBound(lk: Int => Double) extends BiasBound {
  override def threshold(sD: Long, k: Int): Double = lk(k)
}

object GlobalLowerBound {

  /** The paper's default step bounds: 10 for k∈[10,20), 20 for [20,30),
    * 30 for [30,40), 40 for k ≥ 40 (Section VI-A).
    */
  val paperDefault: GlobalLowerBound =
    GlobalLowerBound(k => math.min(40, (k / 10) * 10).toDouble)
}

/** Problem 3.2: proportional bound `α · s_D(p) · k / |D|`. */
final case class ProportionalLowerBound(alpha: Double, dSize: Long) extends BiasBound {
  require(dSize > 0, "dataset must be non-empty")

  override def threshold(sD: Long, k: Int): Double =
    alpha * sD * k / dSize

  /** `k̃` (Section IV-C): the minimal k at which a pattern with a fixed
    * top-k count `cnt` becomes biased. Computed from the closed form and
    * then adjusted so it is exactly consistent with [[biased]] under
    * floating-point rounding. Returns `Int.MaxValue` when no such k fits
    * in an Int (e.g. `cnt` large enough relative to `sD`).
    */
  def kTilde(cnt: Long, sD: Long): Int = {
    val base = cnt * dSize / (alpha * sD)
    if (base >= Int.MaxValue - 2) return Int.MaxValue
    var k = math.max(1, math.floor(base).toInt)
    // walk to the exact boundary of the predicate
    while (!biased(cnt, sD, k) && k < Int.MaxValue - 1) k += 1
    while (k > 1 && biased(cnt, sD, k - 1)) k -= 1
    k
  }
}

/** Cooperative wall-clock budget for the searches; checked once per BFS
  * wave so a timed-out run returns a partial result quickly (the paper
  * uses a 10-minute timeout in Figures 4–5).
  */
final class Budget(deadlineNanos: Long) {
  def expired: Boolean = System.nanoTime() > deadlineNanos
}

object Budget {
  /** No deadline. */
  val unlimited: Budget = new Budget(Long.MaxValue)

  /** Budget expiring `millis` from now. */
  def ofMillis(millis: Long): Budget = new Budget(System.nanoTime() + millis * 1000000L)
}

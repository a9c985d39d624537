package repro.divergence

import scala.collection.mutable
import repro.core.{Budget, Pattern, PatternCounter}

/** Reimplementation of the comparison method of Pastor, de Alfaro and
  * Baralis [27] ("Identifying biased subgroups in ranking and
  * classification"), used in the paper's Section VI-D case study.
  *
  * Each tuple gets an outcome `o(t) = 1` iff it appears in the top-k of
  * the ranking, else 0. For a subgroup `G` (a pattern), the outcome is
  * the mean over its members — i.e. `s_{R^k(D)}(p) / s_D(p)` — and its
  * divergence is `o(G) − o(D)` with `o(D) = k / |D|`. The method reports
  * *all* subgroups with support at least `minSupport` (no most-general
  * filtering and a single k), ranked by divergence.
  *
  * Enumeration is level-wise over the search tree (support is
  * anti-monotone), with each level counted in one
  * [[PatternCounter.countBatch]] call — frequent-pattern mining as
  * DataFrame aggregation when backed by the Spark counter.
  */
object DivergenceExplorer {

  /** One reported subgroup. */
  final case class DivGroup(p: Pattern, support: Long, outcome: Double, divergence: Double)

  /** All subgroups with support ≥ `minSupport`, sorted by divergence
    * descending (ties broken deterministically by pattern rendering).
    */
  def run(
      counter: PatternCounter,
      k: Int,
      minSupport: Long,
      budget: Budget = Budget.unlimited,
  ): Seq[DivGroup] = {
    val oD = k.toDouble / counter.datasetSize
    val out = mutable.ArrayBuffer.empty[DivGroup]
    var frontier: Seq[Pattern] =
      Pattern.root(counter.width).searchTreeChildren(counter.domainSizes)
    while (frontier.nonEmpty && !budget.expired) {
      val counts = counter.countBatch(frontier, k)
      val next = mutable.ArrayBuffer.empty[Pattern]
      for (p <- frontier) {
        val (sD, cnt) = counts(p)
        if (sD >= minSupport) {
          val oG = cnt.toDouble / sD
          out += DivGroup(p, sD, oG, oG - oD)
          next ++= p.searchTreeChildren(counter.domainSizes)
        }
      }
      frontier = next.toSeq
    }
    out.sortBy(g => (-g.divergence, g.p.toString)).toSeq
  }
}

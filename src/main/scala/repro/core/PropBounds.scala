package repro.core

import scala.collection.immutable.SortedMap
import scala.collection.mutable

/** PROPBOUNDS (Algorithm 3) — incremental detection for Problem 3.2.
  *
  * Under the proportional bound `α · s_D(p) · k / |D|` a pattern's status
  * can change in both directions as k grows: patterns satisfied by the
  * newly admitted tuple gain count (+1, which always outpaces the bound's
  * growth `α·s_D/|D| < 1`, so a biased pattern may recover but an
  * adequately represented one never slips on the tuple it gains), while
  * a pattern the tuple does not satisfy keeps its count and becomes
  * biased exactly when k reaches its `k̃` value (Section IV-C).
  *
  * The algorithm therefore tracks every visited node with its dataset
  * size and running top-k count, keeps the paper's `K` structure as
  * buckets `k̃ → patterns` (entries are verified lazily when their bucket
  * is reached), and resumes the top-down search below any node that flips
  * from biased to adequately represented and whose subtree had never been
  * expanded. `Res[k]` is the set of most general currently-biased visited
  * nodes; correctness (Proposition 4.8) is enforced by tests against
  * ITERTD on randomized inputs.
  */
object PropBounds {

  private final class NodeState(val sD: Long, var cnt: Long)

  def run(
      counter: PatternCounter,
      alpha: Double,
      tauS: Long,
      kMin: Int,
      kMax: Int,
      budget: Budget = Budget.unlimited,
  ): DetectionResult = {
    require(kMin >= 1 && kMax >= kMin && kMax <= counter.datasetSize, s"bad range [$kMin,$kMax]")
    val bound = ProportionalLowerBound(alpha, counter.datasetSize)

    var res = SortedMap.empty[Int, Set[Pattern]]
    var examined = 0L
    var timedOut = false

    // Every visited node with s_D ≥ τ_s, with its live top-k count.
    val visited = mutable.LinkedHashMap.empty[Pattern, NodeState]
    // Nodes whose search-tree children have been generated.
    val expanded = mutable.HashSet.empty[Pattern]
    // Currently biased visited nodes.
    val biasedSet = mutable.LinkedHashSet.empty[Pattern]
    // The paper's K: k̃ → candidate patterns (lazily verified on arrival).
    val kBuckets = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Pattern]]

    def scheduleKTilde(p: Pattern, st: NodeState): Unit = {
      val kt = bound.kTilde(st.cnt, st.sD)
      if (kt <= kMax) kBuckets.getOrElseUpdate(kt, mutable.ArrayBuffer.empty) += p
    }

    /** BFS below `frontier0` at position k, recording node states. */
    def explore(frontier0: Seq[Pattern], k: Int): Unit = {
      if (frontier0.isEmpty) return
      val (ex, to) = TopDownSearch.bfs(counter, bound, tauS, k, frontier0, budget) {
        case TopDownSearch.Biased(p, sD, cnt) =>
          visited(p) = new NodeState(sD, cnt)
          biasedSet += p
        case TopDownSearch.Open(p, sD, cnt) =>
          val st = new NodeState(sD, cnt)
          visited(p) = st
          expanded += p
          scheduleKTilde(p, st)
        case _ => ()
      }
      examined += ex
      timedOut ||= to
    }

    explore(Pattern.root(counter.width).searchTreeChildren(counter.domainSizes), kMin)
    var currentRes: Set[Pattern] = Set.empty
    if (!timedOut) {
      currentRes = Pattern.splitMostGeneral(biasedSet)._1
      res += kMin -> currentRes
    }

    var k = kMin + 1
    while (k <= kMax && !timedOut) {
      var changed = false
      val newRow = counter.rankedRow(k)

      // 1. Patterns the new tuple satisfies: bump counts; biased ones may
      //    recover (and then their cut subtree must be explored).
      val recovered = mutable.ArrayBuffer.empty[Pattern]
      for ((p, st) <- visited) {
        var sat = true
        val attrs = p.attrs
        var i = 0
        while (sat && i < attrs.length) {
          val a = attrs(i)
          if (newRow(a) != p.vals(a)) sat = false
          i += 1
        }
        if (sat) {
          st.cnt += 1
          if (biasedSet.contains(p) && !bound.biased(st.cnt, st.sD, k)) {
            biasedSet -= p
            changed = true
            scheduleKTilde(p, st)
            if (!expanded.contains(p)) {
              expanded += p
              recovered += p
            }
          }
        }
      }
      explore(recovered.toSeq.flatMap(_.searchTreeChildren(counter.domainSizes)), k)
      if (recovered.nonEmpty) changed = true

      // 2. Patterns reaching their k̃ this round become biased without any
      //    count change. Entries are stale-tolerant: verify with the live
      //    count; if not biased yet (count grew since scheduling),
      //    reschedule at the recomputed k̃.
      kBuckets.remove(k).foreach { bucket =>
        for (p <- bucket) {
          val st = visited(p)
          if (!biasedSet.contains(p)) {
            if (bound.biased(st.cnt, st.sD, k)) {
              biasedSet += p
              changed = true
            } else scheduleKTilde(p, st)
          }
        }
      }

      if (!timedOut) {
        if (changed) currentRes = Pattern.splitMostGeneral(biasedSet)._1
        res += k -> currentRes
      }
      k += 1
    }
    DetectionResult(res, examined, timedOut)
  }
}

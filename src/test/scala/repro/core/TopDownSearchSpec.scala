package repro.core

import org.scalatest.funsuite.AnyFunSuite

class TopDownSearchSpec extends AnyFunSuite {
  import RunningExample.p
  private val ix = RunningExample.index
  private val counter = new LocalPatternCounter(ix)

  // ---- Example 4.6 (global bounds, τ_s = 4, L_4 = L_5 = 2) ----

  private val g2 = GlobalLowerBound(_ => 2.0)

  test("Example 4.6: Res[4] for global bounds") {
    val snap = TopDownSearch.singleK(counter, g2, tauS = 4, k = 4)
    val expected = Set(
      p(1 -> 0),           // School=GP
      p(2 -> 1),           // Address=U
      p(3 -> 1),           // Failures=1
      p(3 -> 2),           // Failures=2
      p(0 -> 0, 1 -> 1),   // Gender=F, School=MS
      p(0 -> 0, 2 -> 0),   // Gender=F, Address=R
    )
    assert(snap.res.toSet == expected)
  }

  test("Example 4.6: DRes[4] contains the four patterns named in the paper") {
    val snap = TopDownSearch.singleK(counter, g2, tauS = 4, k = 4)
    val named = Set(
      p(0 -> 0, 2 -> 1), // Gender=F, Address=U
      p(0 -> 1, 2 -> 1), // Gender=M, Address=U
      p(0 -> 0, 3 -> 1), // Gender=F, Failures=1
      p(2 -> 0, 3 -> 1), // Address=R, Failures=1
    )
    assert(named.subsetOf(snap.dres.toSet))
  }

  test("Example 4.6: DRes[4] exact contents") {
    val snap = TopDownSearch.singleK(counter, g2, tauS = 4, k = 4)
    val expected = Set(
      p(0 -> 0, 1 -> 0), p(0 -> 1, 1 -> 0), // {G,S=GP} pair under School=GP
      p(0 -> 0, 2 -> 1), p(0 -> 1, 2 -> 1),
      p(0 -> 0, 3 -> 1), p(0 -> 1, 3 -> 1),
      p(1 -> 1, 3 -> 1), p(2 -> 0, 3 -> 1),
    )
    assert(snap.dres.toSet == expected)
  }

  test("Res and DRes are disjoint; DRes members are dominated by Res members") {
    val snap = TopDownSearch.singleK(counter, g2, tauS = 4, k = 4)
    assert(snap.res.toSet.intersect(snap.dres.toSet).isEmpty)
    assert(snap.dres.forall(d => snap.res.exists(_.strictlySubsumes(d))))
    assert(snap.res.forall(r => !snap.res.exists(_.strictlySubsumes(r))))
  }

  // ---- Example 4.9 (proportional, τ_s = 5, α = 0.9) ----

  private def prop09 = ProportionalLowerBound(0.9, ix.size.toLong)

  test("Example 4.9: Res[4] for proportional bounds is exactly {School=GP},{Address=U},{Failures=1}") {
    val snap = TopDownSearch.singleK(counter, prop09, tauS = 5, k = 4)
    assert(snap.res.toSet == Set(p(1 -> 0), p(2 -> 1), p(3 -> 1)))
  }

  test("Example 4.9: Res[5] adds {Gender=F}") {
    val snap = TopDownSearch.singleK(counter, prop09, tauS = 5, k = 5)
    assert(snap.res.toSet == Set(p(0 -> 0), p(1 -> 0), p(2 -> 1), p(3 -> 1)))
  }

  test("Example 4.7: k̃ of {Gender=F} with count 2 is 5") {
    assert(prop09.kTilde(cnt = 2, sD = 8) == 5)
  }

  test("Example 4.9: k̃ values named in the paper") {
    assert(prop09.kTilde(2, 8) == 5) // {Gender=M}, {Gender=F}
    assert(prop09.kTilde(3, 8) == 7) // {School=MS}, {Address=R}
    assert(prop09.kTilde(3, 6) == 9) // {School=MS, Address=R}
  }

  test("kTilde is consistent with the biased predicate") {
    for (alpha <- Seq(0.5, 0.8, 0.9, 1.0, 1.3); sD <- 1L to 16L; cnt <- 0L to sD) {
      val b = ProportionalLowerBound(alpha, 16)
      val kt = b.kTilde(cnt, sD)
      if (kt != Int.MaxValue) {
        assert(b.biased(cnt, sD, kt), s"not biased at kTilde: a=$alpha sD=$sD cnt=$cnt kt=$kt")
        if (kt > 1) assert(!b.biased(cnt, sD, kt - 1), s"already biased before kTilde: a=$alpha sD=$sD cnt=$cnt kt=$kt")
      }
    }
  }

  // ---- engine behaviour ----

  test("τ_s above dataset size yields an empty result") {
    val snap = TopDownSearch.singleK(counter, g2, tauS = 17, k = 4)
    assert(snap.res.isEmpty && snap.dres.isEmpty)
  }

  test("bound 0 yields no biased patterns") {
    val snap = TopDownSearch.singleK(counter, GlobalLowerBound(_ => 0.0), tauS = 1, k = 4)
    assert(snap.res.isEmpty)
  }

  test("huge bound reports exactly the most general level-1 patterns") {
    val snap = TopDownSearch.singleK(counter, GlobalLowerBound(_ => 100.0), tauS = 1, k = 4)
    // every level-1 pattern is biased, so Res is all of them, nothing deeper
    assert(snap.res.toSet == Pattern.root(4).searchTreeChildren(ix.domainSizes).toSet)
    assert(snap.dres.isEmpty)
  }

  test("examined counts the counted patterns (level-1 at minimum)") {
    val snap = TopDownSearch.singleK(counter, GlobalLowerBound(_ => 100.0), tauS = 1, k = 4)
    assert(snap.examined == 9) // only level 1 counted, all biased
  }

  test("expired budget returns timedOut") {
    val snap = TopDownSearch.singleK(counter, g2, tauS = 1, k = 4, budget = Budget.ofMillis(-1))
    assert(snap.timedOut)
  }

  test("singleK against brute force on random data (global bounds)") {
    for (seed <- 0 until 15) {
      val rix = RandomData.index(seed, n = 40, m = 4)
      val c = new LocalPatternCounter(rix)
      val bound = GlobalLowerBound(_ => 2.0 + seed % 3)
      val tauS = 3 + seed % 4
      for (k <- Seq(5, 11, 20)) {
        val expect = BruteForce.run(rix, bound, tauS, k, k)(k)
        val got = TopDownSearch.singleK(c, bound, tauS, k).res.toSet
        assert(got == expect, s"seed=$seed k=$k")
      }
    }
  }

  test("singleK against brute force on random data (proportional bounds)") {
    for (seed <- 0 until 15) {
      val rix = RandomData.index(seed + 100, n = 40, m = 4)
      val c = new LocalPatternCounter(rix)
      val bound = ProportionalLowerBound(0.6 + 0.1 * (seed % 5), rix.size.toLong)
      val tauS = 3 + seed % 4
      for (k <- Seq(5, 11, 20)) {
        val expect = BruteForce.run(rix, bound, tauS, k, k)(k)
        val got = TopDownSearch.singleK(c, bound, tauS, k).res.toSet
        assert(got == expect, s"seed=$seed k=$k")
      }
    }
  }
}

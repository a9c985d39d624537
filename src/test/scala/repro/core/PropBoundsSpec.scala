package repro.core

import org.scalatest.funsuite.AnyFunSuite

class PropBoundsSpec extends AnyFunSuite {
  import RunningExample.p
  private val ix = RunningExample.index
  private val counter = new LocalPatternCounter(ix)

  test("Example 4.9: Res[4] = {School=GP},{Address=U},{Failures=1}") {
    val res = PropBounds.run(counter, alpha = 0.9, tauS = 5, kMin = 4, kMax = 5)
    assert(res.resByK(4) == Set(p(1 -> 0), p(2 -> 1), p(3 -> 1)))
  }

  test("Example 4.9: Res[5] gains {Gender=F} via its k̃ = 5 entry") {
    val res = PropBounds.run(counter, alpha = 0.9, tauS = 5, kMin = 4, kMax = 5)
    assert(res.resByK(5) == Set(p(0 -> 0), p(1 -> 0), p(2 -> 1), p(3 -> 1)))
  }

  test("single-k run equals the plain top-down search") {
    val got = PropBounds.run(counter, 0.9, 5, 4, 4).resByK(4)
    val b = TopDownSearch.singleK(counter, ProportionalLowerBound(0.9, 16), 5, 4).res.toSet
    assert(got == b)
  }

  test("full range on the running example matches brute force") {
    for (alpha <- Seq(0.5, 0.8, 0.9, 1.0)) {
      val got = PropBounds.run(counter, alpha, tauS = 4, kMin = 2, kMax = 16)
      val expect = BruteForce.run(ix, ProportionalLowerBound(alpha, 16), 4, 2, 16)
      assert(got.resByK == expect, s"alpha=$alpha")
    }
  }

  test("timed-out run flags timedOut") {
    val res = PropBounds.run(counter, 0.9, 4, 4, 10, Budget.ofMillis(-1))
    assert(res.timedOut)
  }

  test("examined is below ITERTD's over a long range") {
    val alpha = 0.8
    val base = IterTD.run(counter, ProportionalLowerBound(alpha, 16), tauS = 4, kMin = 2, kMax = 16)
    val opt  = PropBounds.run(counter, alpha, tauS = 4, kMin = 2, kMax = 16)
    assert(opt.resByK == base.resByK)
    assert(opt.examined < base.examined,
      s"expected fewer examined patterns: opt=${opt.examined} base=${base.examined}")
  }

  for (seed <- 0 until 25)
    test(s"equivalent to ITERTD on random data (seed $seed)") {
      val rix = RandomData.index(seed, n = 40, m = 4)
      val c = new LocalPatternCounter(rix)
      val alpha = 0.5 + 0.1 * (seed % 7)
      val tauS = 3 + seed % 4
      val got  = PropBounds.run(c, alpha, tauS, 2, 35)
      val base = IterTD.run(c, ProportionalLowerBound(alpha, rix.size.toLong), tauS, 2, 35)
      assert(got.resByK == base.resByK, s"seed=$seed alpha=$alpha tauS=$tauS")
    }

  for (seed <- 0 until 8)
    test(s"equivalent to ITERTD on wider random data (5 attrs, seed $seed)") {
      val rix = RandomData.index(seed + 500, n = 60, m = 5)
      val c = new LocalPatternCounter(rix)
      val alpha = 0.6 + 0.1 * (seed % 5)
      val got  = PropBounds.run(c, alpha, 4, 2, 50)
      val base = IterTD.run(c, ProportionalLowerBound(alpha, rix.size.toLong), 4, 2, 50)
      assert(got.resByK == base.resByK, s"seed=$seed alpha=$alpha")
    }

  test("status can oscillate: a pattern may leave and re-enter the result across k") {
    // Find a witness in random data: a pattern biased at some k, not at
    // k+1, biased again later — the regime PROPBOUNDS must track.
    var witnessed = false
    for (seed <- 0 until 40 if !witnessed) {
      val rix = RandomData.index(seed + 900, n = 30, m = 3)
      val res = BruteForce.run(rix, ProportionalLowerBound(0.9, rix.size.toLong), 3, 2, 28)
      val all = res.values.flatten.toSet
      witnessed = all.exists { q =>
        val in = res.toSeq.sortBy(_._1).map(_._2.contains(q))
        in.zip(in.tail).count { case (a, b) => a && !b } >= 1 &&
          in.zip(in.tail).exists { case (a, b) => !a && b }
      }
    }
    assert(witnessed, "no oscillating pattern found — tighten the generator")
  }
}

package repro.core

import org.scalatest.funsuite.AnyFunSuite

class DatasetIndexSpec extends AnyFunSuite {
  private val ix = RunningExample.index
  import RunningExample.p

  test("index has 16 tuples over 4 attributes") {
    assert(ix.size == 16 && ix.width == 4)
    assert(ix.domainSizes == IndexedSeq(2, 2, 2, 3))
  }

  test("Example 2.3: s_D({School=GP}) = 8") {
    assert(ix.sizeD(p(1 -> 0)) == 8)
  }

  test("Example 2.3: s_{R^5(D)}({School=GP}) = 1") {
    assert(ix.sizeTopK(p(1 -> 0), 5) == 1)
  }

  test("root pattern counts the whole dataset") {
    assert(ix.sizeD(Pattern.root(4)) == 16)
    assert(ix.sizeTopK(Pattern.root(4), 7) == 7)
  }

  test("single-attribute sizes match Figure 1") {
    assert(ix.sizeD(p(0 -> 0)) == 8) // Gender=F
    assert(ix.sizeD(p(0 -> 1)) == 8) // Gender=M
    assert(ix.sizeD(p(1 -> 1)) == 8) // School=MS
    assert(ix.sizeD(p(2 -> 0)) == 8) // Address=R
    assert(ix.sizeD(p(2 -> 1)) == 8) // Address=U
    assert(ix.sizeD(p(3 -> 0)) == 4) // Failures=0
    assert(ix.sizeD(p(3 -> 1)) == 8)
    assert(ix.sizeD(p(3 -> 2)) == 4)
  }

  test("Example 2.4: one GP student in the top-5") {
    assert(ix.sizeTopK(p(1 -> 0), 5) == 1)
    assert(ix.sizeTopK(p(1 -> 1), 5) == 4)
  }

  test("conjunctive pattern sizes match hand counts") {
    assert(ix.sizeD(p(0 -> 0, 1 -> 1)) == 4)          // F ∧ MS: rows 1,6,9,10
    assert(ix.sizeD(p(1 -> 1, 2 -> 0)) == 6)          // MS ∧ R
    assert(ix.sizeD(p(0 -> 1, 1 -> 1, 2 -> 0)) == 3)  // M ∧ MS ∧ R: rows 2,5,11
  }

  test("sizes returns both counts consistently") {
    for (k <- 1 to 16) {
      val (d, t) = ix.sizes(p(2 -> 1), k)
      assert(d == ix.sizeD(p(2 -> 1)))
      assert(t == ix.sizeTopK(p(2 -> 1), k))
    }
  }

  test("top-k counts are monotone in k") {
    val pat = p(0 -> 0, 3 -> 1)
    val counts = (1 to 16).map(ix.sizeTopK(pat, _))
    assert(counts.zip(counts.tail).forall { case (a, b) => a <= b })
    assert(counts.last == ix.sizeD(pat))
  }

  test("tupleSatisfies agrees with the raw Figure 1 rows") {
    // rank 1 is student 12: (F, GP, U, 0)
    assert(ix.tupleSatisfies(1, p(0 -> 0)))
    assert(ix.tupleSatisfies(1, p(1 -> 0, 2 -> 1)))
    assert(!ix.tupleSatisfies(1, p(3 -> 1)))
    // rank 5 is student 14: (M, MS, U, 1)
    assert(ix.tupleSatisfies(5, p(0 -> 1, 1 -> 1, 2 -> 1, 3 -> 1)))
    assert(!ix.tupleSatisfies(5, p(2 -> 0)))
  }

  test("random data: bitset counts equal naive scans") {
    for (seed <- 0 until 20) {
      val rix = RandomData.index(seed, n = 30, m = 4)
      val rnd = new scala.util.Random(seed + 1000)
      for (_ <- 0 until 25) {
        val nAttrs = 1 + rnd.nextInt(3)
        val attrs = rnd.shuffle((0 until rix.width).toList).take(nAttrs)
        val pat = Pattern.of(rix.width, attrs.map(a => a -> rnd.nextInt(rix.domainSizes(a))): _*)
        val k = 1 + rnd.nextInt(rix.size)
        val naiveD = rix.rows.count(r => pat.attrs.forall(a => r(a) == pat.vals(a)))
        val naiveK = rix.rows.take(k).count(r => pat.attrs.forall(a => r(a) == pat.vals(a)))
        assert(rix.sizeD(pat) == naiveD, s"sizeD mismatch for $pat seed=$seed")
        assert(rix.sizeTopK(pat, k) == naiveK, s"sizeTopK mismatch for $pat k=$k seed=$seed")
      }
    }
  }
}

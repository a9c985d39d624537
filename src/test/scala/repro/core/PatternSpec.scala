package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import org.scalacheck.rng.Seed

class PatternSpec extends AnyFunSuite {

  /** Deterministically drawn samples from a ScalaCheck generator. */
  private def samples[A](gen: Gen[A], n: Int): Seq[A] =
    (0 until n).map(i => gen.pureApply(Gen.Parameters.default, Seed(i.toLong)))

  private val doms = IndexedSeq(2, 2, 2, 3)

  test("root pattern has no attributes and maxIdx -1") {
    val r = Pattern.root(4)
    assert(r.isRoot && r.attrs.isEmpty && r.maxIdx == -1 && r.level == 0)
  }

  test("attrs/level/maxIdx of a two-attribute pattern") {
    val p = Pattern.of(4, 1 -> 0, 3 -> 2)
    assert(p.attrs == Seq(1, 3) && p.level == 2 && p.maxIdx == 3)
  }

  test("subsumes: more general pattern subsumes its extensions") {
    val g = Pattern.of(4, 0 -> 1)
    val s = Pattern.of(4, 0 -> 1, 2 -> 0)
    assert(g.subsumes(s) && !s.subsumes(g))
    assert(g.strictlySubsumes(s) && !g.strictlySubsumes(g))
  }

  test("subsumes is reflexive; strictlySubsumes is not") {
    val p = Pattern.of(4, 0 -> 0, 1 -> 1)
    assert(p.subsumes(p) && !p.strictlySubsumes(p))
  }

  test("patterns on different values of the same attribute are incomparable") {
    val a = Pattern.of(4, 0 -> 0)
    val b = Pattern.of(4, 0 -> 1)
    assert(!a.subsumes(b) && !b.subsumes(a))
  }

  test("root children enumerate every attribute-value pair") {
    val kids = Pattern.root(4).searchTreeChildren(doms)
    assert(kids.size == 2 + 2 + 2 + 3)
    assert(kids.forall(_.level == 1))
    assert(kids.distinct.size == kids.size)
  }

  test("Example 4.2: {G=F,S=GP} is a search-tree child of {G=F}, not of {S=GP}") {
    val gf = Pattern.of(4, 0 -> 0)
    val sgp = Pattern.of(4, 1 -> 0)
    val both = Pattern.of(4, 0 -> 0, 1 -> 0)
    assert(gf.searchTreeChildren(doms).contains(both))
    assert(!sgp.searchTreeChildren(doms).contains(both))
  }

  test("search-tree children only extend with larger attribute indices") {
    val p = Pattern.of(4, 2 -> 1)
    val kids = p.searchTreeChildren(doms)
    assert(kids.size == 3) // only Failures (idx 3, card 3) remains
    assert(kids.forall(c => c.attrs == Seq(2, 3)))
  }

  test("a full pattern has no search-tree children") {
    val p = Pattern.of(4, 0 -> 0, 1 -> 0, 2 -> 0, 3 -> 0)
    assert(p.searchTreeChildren(doms).isEmpty)
  }

  test("parents drop exactly one attribute each") {
    val p = Pattern.of(4, 0 -> 1, 2 -> 0, 3 -> 2)
    val par = p.parents
    assert(par.size == 3)
    assert(par.forall(q => q.level == 2 && q.strictlySubsumes(p)))
  }

  test("splitMostGeneral keeps minimal patterns and dominates the rest") {
    val a = Pattern.of(4, 0 -> 0)
    val ab = Pattern.of(4, 0 -> 0, 1 -> 1)
    val c = Pattern.of(4, 2 -> 1)
    val (min, dom) = Pattern.splitMostGeneral(Seq(ab, a, c))
    assert(min == Set(a, c) && dom == Set(ab))
  }

  test("splitMostGeneral of an antichain keeps everything") {
    val xs = Seq(Pattern.of(4, 0 -> 0), Pattern.of(4, 0 -> 1), Pattern.of(4, 1 -> 0))
    val (min, dom) = Pattern.splitMostGeneral(xs)
    assert(min == xs.toSet && dom.isEmpty)
  }

  test("render uses attribute names and value labels") {
    val p = RunningExample.p(1 -> 0, 2 -> 1)
    assert(p.render(RunningExample.attrNames, RunningExample.domains) == "{School=GP, Address=U}")
  }

  test("search tree visits every pattern exactly once (spanning tree)") {
    // BFS expansion from the root must enumerate each pattern graph node once.
    val all = scala.collection.mutable.ArrayBuffer.empty[Pattern]
    var frontier: Seq[Pattern] = Pattern.root(4).searchTreeChildren(doms)
    while (frontier.nonEmpty) {
      all ++= frontier
      frontier = frontier.flatMap(_.searchTreeChildren(doms))
    }
    val expected = (1 + 2) * (1 + 2) * (1 + 2) * (1 + 3) - 1 // Π(card+1) − root
    assert(all.size == expected)
    assert(all.distinct.size == all.size)
  }

  test("property: subsumption is transitive") {
    val gen = Gen.listOfN(3, Gen.listOfN(4, Gen.choose(-1, 1)).map(v => Pattern(v.toVector)))
    for (Seq(p, q, r) <- samples(gen, 200)) {
      if (p.subsumes(q) && q.subsumes(r)) assert(p.subsumes(r))
    }
  }

  test("property: splitMostGeneral partition covers the input") {
    val gen = Gen.listOfN(8, Gen.listOfN(4, Gen.choose(-1, 1)).map(v => Pattern(v.toVector)))
    for (ps <- samples(gen, 100)) {
      val (min, dom) = Pattern.splitMostGeneral(ps)
      assert((min ++ dom) == ps.toSet)
      assert(min.forall(p => !min.exists(_.strictlySubsumes(p))))
      assert(dom.forall(p => min.exists(_.strictlySubsumes(p))))
    }
  }
}

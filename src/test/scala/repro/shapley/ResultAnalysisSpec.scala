package repro.shapley

import repro.SparkSpec
import repro.core.Pattern
import repro.data.BiasDataGen

class ResultAnalysisSpec extends SparkSpec {

  // Use a moderate schema so the suite stays fast.
  private lazy val student = BiasDataGen.studentLike(spark, nAttrs = 12)

  private lazy val meduExpl = {
    // group {Medu = 0} (primary education) — the paper's p1 analogue.
    val meduIdx = student.attrCols.indexOf("Medu")
    val p = Pattern.of(student.attrCols.size, meduIdx -> 0)
    ResultAnalysis.explain(student, p, k = 49)
  }

  test("aggregated Shapley covers every attribute") {
    assert(meduExpl.aggShapley.map(_._1).toSet == student.attrCols.toSet)
  }

  test("aggregated Shapley is sorted by magnitude") {
    val mags = meduExpl.aggShapley.map { case (_, v) => math.abs(v) }
    assert(mags.zip(mags.tail).forall { case (a, b) => a >= b })
  }

  test("the ranking attribute G3 has the largest Shapley value (Fig 10a analogue)") {
    assert(meduExpl.topAttr == "G3", s"got ${meduExpl.aggShapley.take(4)}")
  }

  test("correlated grade attributes G1/G2 appear among the top attributes") {
    // Signed group-aggregation partially cancels weakly-weighted attrs
    // (the paper notes the same for e.g. father's education), so allow a
    // little slack beyond the figure's top-6 cut.
    val top8 = meduExpl.aggShapley.take(8).map(_._1).toSet
    assert(top8.contains("G1") && top8.contains("G2"), s"top8=$top8")
  }

  test("group and top-k distributions are probability vectors") {
    for (dist <- Seq(meduExpl.groupDist, meduExpl.topkDist)) {
      assert(math.abs(dist.map(_._2).sum - 1.0) < 1e-9)
      assert(dist.forall(_._2 >= 0.0))
    }
  }

  test("distributions differ between the detected group and the top-k (Fig 10d analogue)") {
    // top-k is dominated by the highest G3 bucket; the under-represented
    // group is not.
    val l1 = meduExpl.groupDist.zip(meduExpl.topkDist)
      .map { case ((_, g), (_, t)) => math.abs(g - t) }.sum
    assert(l1 > 0.4, s"distributions unexpectedly close: L1=$l1")
  }

  test("top-k distribution concentrates on the top grade bucket") {
    val topBucket = meduExpl.topkDist.maxBy(_._2)
    assert(topBucket._1 == "3", s"top-k mode is G3=$topBucket")
    assert(topBucket._2 > 0.8)
  }

  test("rendered pattern names the defining attribute") {
    assert(meduExpl.rendered.contains("Medu"))
  }

  test("explain validates the pattern width") {
    intercept[IllegalArgumentException] {
      ResultAnalysis.explain(student, Pattern.of(3, 0 -> 0), k = 10)
    }
  }

  test("german-like: scoring attributes dominate the attribution (Fig 10c analogue)") {
    val german = BiasDataGen.germanLike(spark, nAttrs = 10)
    val p = Pattern.of(10, 0 -> 0) // {status_account = low}
    val expl = ResultAnalysis.explain(german, p, k = 49)
    val top4 = expl.aggShapley.take(4).map(_._1).toSet
    assert(Set("status_account", "duration", "credit_amount", "installment_rate")
      .intersect(top4).size >= 3, s"top4=$top4")
  }
}

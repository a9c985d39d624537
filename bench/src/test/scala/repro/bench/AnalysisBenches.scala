package repro.bench

import repro.SparkSpec
import repro.exp.{Experiments, Tables}

/** T4 — Figure 10a–c: aggregated Shapley values of groups detected by
  * GLOBALBOUNDS at k = 49, L_k = 40, per dataset.
  */
class T4ShapleyBench extends SparkSpec {

  test("T4: aggregated Shapley values of detected groups (Figure 10a-c)") {
    val explanations = Experiments.t4Shapley(spark)
    for ((name, ex) <- explanations) {
      println(Tables.render(s"T4 / Figure 10: aggregated Shapley — $name, group ${ex.rendered}",
        Seq("attribute", "aggregated Shapley"),
        ex.aggShapley.take(6).map { case (a, v) => Seq(a, f"$v%.4f") }))
    }
    val byName = explanations.toMap
    // Paper: the attribute actually used for ranking tops the attribution.
    assert(byName("student").topAttr == "G3",
      s"student top attr: ${byName("student").aggShapley.take(3)}")
    // COMPAS: a scoring attribute must top the list (paper found end/priors).
    val compasScoring = Set("days_from_compas", "juv_other_count", "days_b_screening",
      "c_start", "c_end", "age_bucket", "priors_count")
    assert(compasScoring.contains(byName("compas").topAttr))
    // German: the creditworthiness attributes dominate.
    val germanScoring = Set("status_account", "duration", "credit_amount", "installment_rate")
    val germanTop4 = byName("german").aggShapley.take(4).map(_._1).toSet
    assert(germanScoring.intersect(germanTop4).size >= 3, s"german top4 $germanTop4")
  }
}

/** T5 — Figure 10d–f: value distribution of the top-Shapley attribute
  * in the top-k vs the detected group.
  */
class T5DistributionBench extends SparkSpec {

  test("T5: value distributions, top-k vs detected group (Figure 10d-f)") {
    for ((name, ex) <- Experiments.t4Shapley(spark)) {
      println(Tables.render(
        s"T5 / Figure 10d-f: $name, attribute '${ex.topAttr}', group ${ex.rendered}",
        Seq("value", "top-k share", "group share"),
        ex.topkDist.zip(ex.groupDist).map { case ((v, tk), (_, g)) =>
          Seq(v, f"$tk%.3f", f"$g%.3f")
        }))
      // Paper: the distributions differ vastly between top-k and group.
      val l1 = ex.groupDist.zip(ex.topkDist).map { case ((_, g), (_, t)) => math.abs(g - t) }.sum
      assert(l1 > 0.25, s"$name: top-k and group distributions unexpectedly close (L1=$l1)")
    }
  }
}

/** T6 — Section VI-D: case-study comparison with Pastor et al. [27]. */
class T6CaseStudyBench extends SparkSpec {

  test("T6: case study vs the divergence method (VI-D)") {
    val cs = Experiments.t6CaseStudy(spark)
    println(Tables.render("T6 / VI-D: detected groups per method (paper: 2 / 5 / 28)",
      Seq("method", "#groups", "groups"),
      Seq(
        Seq("PropBounds", cs.propPatterns.size.toString,
          cs.propPatterns.map(cs.index.render).toSeq.sorted.mkString("; ")),
        Seq("GlobalBounds", cs.globalPatterns.size.toString,
          cs.globalPatterns.map(cs.index.render).toSeq.sorted.mkString("; ")),
        Seq("Divergence[27]", cs.divergenceGroups.size.toString,
          cs.divergenceGroups.take(5).map(g => cs.index.render(g.p)).mkString("; ") + "; ..."),
      )))
    println(Tables.render("T6b: top-5 groups by divergence",
      Seq("group", "support", "outcome", "divergence"),
      cs.divergenceGroups.take(5).map(g =>
        Seq(cs.index.render(g.p), g.support.toString, f"${g.outcome}%.3f", f"${g.divergence}%.3f"))))

    // Shape assertions mirroring the paper's qualitative findings:
    // 1. PROPBOUNDS is more selective than GLOBALBOUNDS, and each of its
    //    groups is (a superset refinement of) a GLOBALBOUNDS group.
    assert(cs.propPatterns.size <= cs.globalPatterns.size)
    for (p <- cs.propPatterns)
      assert(cs.globalPatterns.exists(g => g.subsumes(p)),
        s"prop group ${cs.index.render(p)} has no GlobalBounds ancestor")
    // 2. The divergence method reports far more groups, including every
    //    group our methods detect (they all meet the support threshold).
    assert(cs.divergenceGroups.size > cs.globalPatterns.size)
    val divSet = cs.divergenceGroups.map(_.p).toSet
    for (g <- cs.globalPatterns) assert(divSet.contains(g), s"missing ${cs.index.render(g)}")
    // 3. Reported groups stay within the user-digestible range (<100).
    assert(cs.globalPatterns.size < 100 && cs.propPatterns.size < 100)
  }
}

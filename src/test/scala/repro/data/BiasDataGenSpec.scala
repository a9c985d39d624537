package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.{GlobalLowerBound, IterTD, LocalPatternCounter}

class BiasDataGenSpec extends SparkSpec {

  private lazy val student = BiasDataGen.studentLike(spark)
  private lazy val compas = BiasDataGen.compasLike(spark)
  private lazy val german = BiasDataGen.germanLike(spark)

  test("student-like dataset has 395 rows and 33 pattern attributes") {
    assert(student.df.count() == 395)
    assert(student.attrCols.size == 33)
  }

  test("compas-like dataset has 6889 rows and 16 pattern attributes") {
    assert(compas.df.count() == 6889)
    assert(compas.attrCols.size == 16)
  }

  test("german-like dataset has 1000 rows and 20 pattern attributes") {
    assert(german.df.count() == 1000)
    assert(german.attrCols.size == 20)
  }

  test("student marginals approximate the real dataset (VI-D case study)") {
    val n = 395.0
    val gp = student.df.filter(col("school") === 0).count() / n
    val m = student.df.filter(col("sex") === 1).count() / n
    val u = student.df.filter(col("address") === 1).count() / n
    assert(math.abs(gp - 349.0 / 395) < 0.06, s"school=GP marginal $gp")
    assert(math.abs(m - 208.0 / 395) < 0.08, s"sex=M marginal $m")
    assert(math.abs(u - 307.0 / 395) < 0.08, s"address=U marginal $u")
  }

  test("generation is deterministic in the seed") {
    val a = BiasDataGen.studentLike(spark, nAttrs = 8).df.select("rank", "school", "sex").collect()
    val b = BiasDataGen.studentLike(spark, nAttrs = 8).df.select("rank", "school", "sex").collect()
    assert(a.map(_.toSeq).toSeq == b.map(_.toSeq).toSeq)
  }

  test("different seeds give different rankings") {
    val a = BiasDataGen.studentLike(spark, nAttrs = 8, seed = 1).df
      .orderBy("rank").limit(20).select("row_id").collect().map(_.getLong(0)).toSeq
    val b = BiasDataGen.studentLike(spark, nAttrs = 8, seed = 2).df
      .orderBy("rank").limit(20).select("row_id").collect().map(_.getLong(0)).toSeq
    assert(a != b)
  }

  test("attribute cardinalities stay within the declared domains") {
    for (c <- compas.attrCols) {
      val mx = compas.df.agg(max(col(c))).collect()(0).getInt(0)
      val mn = compas.df.agg(min(col(c))).collect()(0).getInt(0)
      assert(mn >= 0 && mx <= 3, s"$c out of range [$mn,$mx]")
    }
  }

  test("nAttrs truncates the schema from the right") {
    val small = BiasDataGen.compasLike(spark, nAttrs = 5)
    assert(small.attrCols.size == 5)
    assert(small.attrCols == compas.attrCols.take(5))
  }

  test("scoring attributes drive the ranking: top-k skews towards high-score buckets") {
    // priors_count has the largest positive weight in compas; its mean
    // in the top 100 must exceed the dataset mean.
    val top = compas.df.filter(col("rank") <= 100).agg(avg("priors_count")).collect()(0).getDouble(0)
    val all = compas.df.agg(avg("priors_count")).collect()(0).getDouble(0)
    assert(top > all + 0.5, s"top=$top all=$all")
  }

  test("age contributes negatively in compas: old buckets are under-represented on top") {
    val top = compas.df.filter(col("rank") <= 100).agg(avg("age_bucket")).collect()(0).getDouble(0)
    val all = compas.df.agg(avg("age_bucket")).collect()(0).getDouble(0)
    assert(top < all - 0.3, s"top=$top all=$all")
  }

  test("the generated bias is detectable by the search (paper defaults)") {
    val ix = Encoding.index(student.df, student.attrCols.take(8), student.rankCol)
    val res = IterTD.run(
      new LocalPatternCounter(ix), GlobalLowerBound.paperDefault, tauS = 50, kMin = 10, kMax = 20)
    assert(res.resByK.values.exists(_.nonEmpty), "no biased groups detected at all")
  }

  test("generate rejects duplicate attribute names") {
    intercept[IllegalArgumentException] {
      BiasDataGen.generate(
        spark, "dup", 10,
        Seq(BiasDataGen.AttrSpec("x", 2), BiasDataGen.AttrSpec("x", 3)), 0.1, 1)
    }
  }

  test("AttrSpec validates cardinality and probability length") {
    intercept[IllegalArgumentException](BiasDataGen.AttrSpec("x", 1))
    intercept[IllegalArgumentException](BiasDataGen.AttrSpec("x", 3, probs = Seq(0.5, 0.5)))
  }

  test("skewed marginals follow the declared probabilities") {
    val ds = BiasDataGen.generate(
      spark, "skew", 4000,
      Seq(BiasDataGen.AttrSpec("a", 3, probs = Seq(0.7, 0.2, 0.1)), BiasDataGen.AttrSpec("b", 2)),
      0.1, 5)
    val counts = ds.df.groupBy("a").count().collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    assert(math.abs(counts(0) / 4000.0 - 0.7) < 0.05)
    assert(math.abs(counts(1) / 4000.0 - 0.2) < 0.05)
    assert(math.abs(counts(2) / 4000.0 - 0.1) < 0.05)
  }
}

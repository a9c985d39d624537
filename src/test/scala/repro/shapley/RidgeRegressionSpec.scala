package repro.shapley

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.{BiasDataGen, Encoding}

class LinalgSpec extends org.scalatest.funsuite.AnyFunSuite {

  test("choleskySolve solves a known SPD system") {
    val a = Array(Array(4.0, 2.0), Array(2.0, 3.0))
    val b = Array(10.0, 8.0)
    val x = Linalg.choleskySolve(a, b)
    assert(math.abs(x(0) - 1.75) < 1e-9)
    assert(math.abs(x(1) - 1.5) < 1e-9)
  }

  test("choleskySolve handles the identity") {
    val a = Array.tabulate(5, 5)((i, j) => if (i == j) 1.0 else 0.0)
    val b = Array(1.0, 2.0, 3.0, 4.0, 5.0)
    assert(Linalg.choleskySolve(a, b).zip(b).forall { case (x, y) => math.abs(x - y) < 1e-12 })
  }

  test("choleskySolve leaves its inputs untouched") {
    val a = Array(Array(2.0, 0.0), Array(0.0, 2.0))
    val b = Array(2.0, 4.0)
    Linalg.choleskySolve(a, b)
    assert(a(0)(0) == 2.0 && b(0) == 2.0)
  }

  test("choleskySolve rejects an indefinite matrix") {
    val a = Array(Array(0.0, 1.0), Array(1.0, 0.0))
    intercept[IllegalArgumentException](Linalg.choleskySolve(a, Array(1.0, 1.0)))
  }

  test("residual is orthogonal to the column space (normal equations hold)") {
    val rnd = new scala.util.Random(3)
    val d = 6
    val m = Array.fill(8, d)(rnd.nextDouble())
    val a = Array.tabulate(d, d)((i, j) => m.map(r => r(i) * r(j)).sum + (if (i == j) 1e-9 else 0))
    val y = Array.fill(8)(rnd.nextDouble())
    val b = Array.tabulate(d)(i => m.zip(y).map { case (r, yy) => r(i) * yy }.sum)
    val x = Linalg.choleskySolve(a, b)
    // Aᵀ(Ax − b) ≈ 0 by construction of the solve
    val ax = Array.tabulate(d)(i => a(i).zip(x).map { case (v, xx) => v * xx }.sum)
    assert(ax.zip(b).forall { case (l, r) => math.abs(l - r) < 1e-6 })
  }
}

class RidgeRegressionSpec extends SparkSpec {

  /** Small synthetic: label is an exact linear function of one-hot
    * features, so the fit must interpolate.
    */
  private lazy val fixture = {
    val ds = BiasDataGen.generate(
      spark, "toy", 500,
      Seq(
        BiasDataGen.AttrSpec("a", 3, weight = 1.0),
        BiasDataGen.AttrSpec("b", 2, weight = -0.5),
        BiasDataGen.AttrSpec("c", 4),
      ),
      noise = 0.0, seed = 21)
    val (enc, domainSizes, _) = Encoding.encode(ds.df, Seq("a", "b", "c"), "rank")
    val withLabel = enc
      .withColumn("label", col("a") / 2.0 * 1.0 - col("b") * 0.5 + lit(3.0))
    (withLabel.cache(), domainSizes)
  }

  test("fit recovers an exactly linear labeling (prediction error ~ 0)") {
    val (df, domainSizes) = fixture
    val model = RidgeRegression.fit(df, Seq("a", "b", "c"), domainSizes, "label")
    val rows = df.select("a", "b", "c", "label").collect()
    for (r <- rows.take(100)) {
      val pred = model.predict(Array(r.getInt(0), r.getInt(1), r.getInt(2)))
      assert(math.abs(pred - r.getDouble(3)) < 1e-4, s"row $r pred=$pred")
    }
  }

  test("meanPrediction equals the label mean (intercept property)") {
    val (df, domainSizes) = fixture
    val model = RidgeRegression.fit(df, Seq("a", "b", "c"), domainSizes, "label")
    val mean = df.agg(avg("label")).collect()(0).getDouble(0)
    assert(math.abs(model.meanPrediction - mean) < 1e-6)
  }

  test("feature means match the empirical one-hot frequencies") {
    val (df, domainSizes) = fixture
    val model = RidgeRegression.fit(df, Seq("a", "b", "c"), domainSizes, "label")
    val n = df.count().toDouble
    for (v <- 0 until domainSizes(0)) {
      val freq = df.filter(col("a") === v).count() / n
      assert(math.abs(model.featureMeans(v) - freq) < 1e-9, s"a=$v")
    }
  }

  test("design-matrix moments validated against DuckDB") {
    val (df, _) = fixture
    val sparkAgg = df.agg(
      sum(when(col("a") === 0, col("label")).otherwise(0.0)).alias("xty_a0"),
      sum(when(col("a") === 1 && col("b") === 0, 1L).otherwise(0L)).alias("xtx_a1b0"),
      count(lit(1)).alias("n"),
    )
    Oracle.assertEquivalent(
      sparkAgg,
      """SELECT
        |  sum(CASE WHEN a = '0' THEN CAST(label AS DOUBLE) ELSE 0 END) AS xty_a0,
        |  sum(CASE WHEN a = '1' AND b = '0' THEN 1 ELSE 0 END) AS xtx_a1b0,
        |  count(*) AS n
        |FROM t""".stripMargin,
      "t" -> df,
    )
  }

  test("fit on the rank label produces a usable surrogate of the ranker") {
    val ds = BiasDataGen.studentLike(spark, nAttrs = 10)
    val (enc, domainSizes, _) = Encoding.encode(ds.df, ds.attrCols.take(10), "rank")
    val model = RidgeRegression.fit(enc, ds.attrCols.take(10), domainSizes, "rank")
    // Spearman-like sanity: predictions must correlate with rank.
    val rows = enc.collect()
    val preds = rows.map(r => (r.getInt(10), model.predict(Array.tabulate(10)(r.getInt))))
    val n = preds.length.toDouble
    val mr = preds.map(_._1.toDouble).sum / n
    val mp = preds.map(_._2).sum / n
    val cov = preds.map { case (r, p) => (r - mr) * (p - mp) }.sum
    val vr = math.sqrt(preds.map { case (r, _) => (r - mr) * (r - mr) }.sum)
    val vp = math.sqrt(preds.map { case (_, p) => (p - mp) * (p - mp) }.sum)
    val corr = cov / (vr * vp)
    assert(corr > 0.8, s"rank/prediction correlation too low: $corr")
  }

  test("fit rejects an empty training set") {
    val (df, domainSizes) = fixture
    intercept[Exception] {
      RidgeRegression.fit(df.filter(lit(false)), Seq("a", "b", "c"), domainSizes, "label")
    }
  }
}

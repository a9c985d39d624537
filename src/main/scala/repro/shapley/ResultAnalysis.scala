package repro.shapley

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.Pattern
import repro.data.{BiasDataGen, Encoding}

/** End-to-end result analysis (Section V): given a group detected as
  * having biased representation in the top-k,
  *
  *  1. train the surrogate regression model `M_R` on `(t, rank(t))`;
  *  2. compute per-tuple Shapley values of every tuple in the group and
  *     aggregate them per attribute, `s_i = Σ_t s_i^t / s_D(p)`, as a
  *     DataFrame aggregation over the group's rows;
  *  3. compare the value distribution of the highest-Shapley attribute
  *     between the group and the top-k tuples (Figures 10d–f).
  */
object ResultAnalysis {

  /** Analysis output for one detected group. */
  final case class Explanation(
      pattern: Pattern,
      rendered: String,
      /** (attribute, aggregated Shapley), sorted by |value| descending. */
      aggShapley: Seq[(String, Double)],
      /** Attribute with the largest |aggregated Shapley|. */
      topAttr: String,
      /** (value label, proportion) of `topAttr` within the group. */
      groupDist: Seq[(String, Double)],
      /** (value label, proportion) of `topAttr` within the top-k. */
      topkDist: Seq[(String, Double)],
  )

  /** Explain the biased representation of `pattern` in the top-k of
    * `ranked`. Shapley values use the exact closed form for the linear
    * surrogate (the Monte-Carlo engine is validated against it in
    * tests).
    */
  def explain(ranked: BiasDataGen.RankedDataset, pattern: Pattern, k: Int): Explanation = {
    val spark = ranked.df.sparkSession
    import spark.implicits._

    val attrs = ranked.attrCols
    require(pattern.width == attrs.length, "pattern width must match the schema")
    val (enc, domainSizes, dicts) = Encoding.encode(ranked.df, attrs, ranked.rankCol)
    val encCached = enc.cache()
    val model = RidgeRegression.fit(encCached, attrs, domainSizes, ranked.rankCol)

    val m = attrs.length
    val bcModel = spark.sparkContext.broadcast(model)

    // Per-tuple Shapley vectors, kept alongside the encoded values.
    val shapDf: DataFrame = encCached
      .select(attrs.map(c => col(c).cast("int")) :+ col(ranked.rankCol).cast("int"): _*)
      .map { r =>
        val vals = Array.tabulate(m)(r.getInt)
        val shap = Shapley.linearExact(bcModel.value, vals)
        (r.getInt(m), vals.toSeq, shap.toSeq)
      }
      .toDF("rank", "vals", "shap")

    val groupPred = pattern.attrs
      .map(a => element_at(col("vals"), a + 1) === lit(pattern.vals(a)))
      .reduceOption(_ && _)
      .getOrElse(lit(true))

    // s_i = Σ_{t ⊨ p} s_i^t / s_D(p) — one aggregation over the group.
    val aggExprs = (0 until m).map(i => avg(element_at(col("shap"), i + 1)).alias(s"s$i"))
    val aggRow = shapDf.filter(groupPred).agg(aggExprs.head, aggExprs.tail: _*).collect()(0)
    val agg = (0 until m)
      .map(i => attrs(i) -> aggRow.getDouble(i))
      .sortBy { case (_, v) => -math.abs(v) }

    val topAttr = agg.head._1
    val topIdx = attrs.indexOf(topAttr)

    def distribution(pred: org.apache.spark.sql.Column): Seq[(String, Double)] = {
      val rows = shapDf
        .filter(pred)
        .groupBy(element_at(col("vals"), topIdx + 1).alias("v"))
        .agg(count(lit(1)).alias("c"))
        .collect()
      val total = rows.map(_.getLong(1)).sum.toDouble
      (0 until domainSizes(topIdx)).map { v =>
        val c = rows.find(_.getInt(0) == v).map(_.getLong(1)).getOrElse(0L)
        dicts(topIdx)(v) -> (if (total == 0) 0.0 else c / total)
      }
    }

    val out = Explanation(
      pattern = pattern,
      rendered = pattern.render(attrs, dicts),
      aggShapley = agg,
      topAttr = topAttr,
      groupDist = distribution(groupPred),
      topkDist = distribution(col("rank") <= lit(k)),
    )
    encCached.unpersist()
    out
  }
}

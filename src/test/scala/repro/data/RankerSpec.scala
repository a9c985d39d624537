package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.RunningExample

class RankerSpec extends SparkSpec {

  test("ranking the running example by grade/failures reproduces Figure 1's Rank column") {
    val df = RunningExample.df(spark)
    val ranked = Ranker.byScore(df, "grade", idCol = "id", tieBreak = Seq(col("failures").asc))
    val rows = ranked.select("id", "rank", "paper_rank").collect()
    assert(rows.forall(r => r.getInt(1) == r.getInt(2)),
      rows.filter(r => r.getInt(1) != r.getInt(2)).mkString(", "))
  }

  test("rank column is a permutation of 1..n") {
    val ds = BiasDataGen.studentLike(spark, nAttrs = 6)
    val ranks = ds.df.select("rank").collect().map(_.getInt(0)).sorted
    assert(ranks.toSeq == (1 to 395))
  }

  test("ranking is descending in score") {
    val ds = BiasDataGen.germanLike(spark, nAttrs = 5)
    val rows = ds.df.select("rank", "score").orderBy("rank").collect()
    val scores = rows.map(_.getDouble(1))
    assert(scores.zip(scores.tail).forall { case (a, b) => a >= b })
  }

  test("row_number ranking validated against DuckDB") {
    val df = RunningExample.df(spark)
    val ranked = Ranker
      .byScore(df, "grade", idCol = "id", tieBreak = Seq(col("failures").asc))
      .select(col("id").cast("int").alias("id"), col("rank").cast("int").alias("rank"))
    Oracle.assertEquivalent(
      ranked,
      """SELECT CAST(id AS INT) AS id,
        |       CAST(row_number() OVER (ORDER BY CAST(grade AS INT) DESC,
        |                                        CAST(failures AS INT) ASC,
        |                                        CAST(id AS INT) ASC) AS INT) AS rank
        |FROM students""".stripMargin,
      "students" -> df,
    )
  }

  test("ascending ranking inverts the order") {
    val df = RunningExample.df(spark)
    val asc = Ranker.byScore(df, "grade", idCol = "id", ascending = true)
    val topId = asc.filter(col("rank") === 1).select("id").collect()(0).getInt(0)
    assert(Set(4, 6).contains(topId)) // grade 4 students; id tiebreak → 4
    assert(topId == 4)
  }
}

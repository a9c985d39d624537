package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.RunningExample

class EncodingSpec extends SparkSpec {

  private val attrs = Seq("gender", "school", "address", "failures")

  private lazy val rankedDf =
    RunningExample.df(spark).withColumnRenamed("paper_rank", "rank")

  test("dictionaries are sorted distinct string values") {
    val dicts = Encoding.dictionaries(rankedDf, attrs)
    assert(dicts(0) == IndexedSeq("F", "M"))
    assert(dicts(1) == IndexedSeq("GP", "MS"))
    assert(dicts(2) == IndexedSeq("R", "U"))
    assert(dicts(3) == IndexedSeq("0", "1", "2"))
  }

  test("encode produces integer columns with the declared domain sizes") {
    val (enc, domainSizes, _) = Encoding.encode(rankedDf, attrs, "rank")
    assert(domainSizes == IndexedSeq(2, 2, 2, 3))
    for ((c, i) <- attrs.zipWithIndex) {
      val vals = enc.select(c).distinct().collect().map(_.getInt(0)).toSet
      assert(vals == (0 until domainSizes(i)).toSet, s"column $c")
    }
  }

  test("index built from the DataFrame equals the hand-built fixture") {
    val ix = Encoding.index(rankedDf, attrs, "rank")
    assert(ix.size == RunningExample.index.size)
    assert(ix.domainSizes == RunningExample.index.domainSizes)
    for (i <- 0 until ix.size)
      assert(ix.rows(i).toSeq == RunningExample.index.rows(i).toSeq, s"rank ${i + 1}")
  }

  test("encoding preserves the rank column") {
    val (enc, _, _) = Encoding.encode(rankedDf, attrs, "rank")
    val ranks = enc.select("rank").collect().map(_.getInt(0)).sorted
    assert(ranks.toSeq == (1 to 16))
  }

  test("null attribute values are encoded via the ∅ sentinel") {
    import spark.implicits._
    val df = Seq((1, Some("a"), 1), (2, None, 2), (3, Some("b"), 3))
      .toDF("id", "x", "rank")
    val (enc, domainSizes, dicts) = Encoding.encode(df, Seq("x"), "rank")
    assert(domainSizes == IndexedSeq(3))
    assert(dicts(0).contains("∅"))
    assert(enc.select("x").collect().map(_.getInt(0)).toSet == Set(0, 1, 2))
  }

  test("numeric attribute columns are treated as categorical via string form") {
    val (_, domainSizes, dicts) = Encoding.encode(rankedDf, Seq("failures"), "rank")
    assert(domainSizes == IndexedSeq(3))
    assert(dicts(0) == IndexedSeq("0", "1", "2"))
  }

  test("round trip: decoding an encoded value yields the original label") {
    val (enc, _, dicts) = Encoding.encode(rankedDf, attrs, "rank")
    val first = enc.orderBy("rank").limit(1).collect()(0)
    // rank 1 is student 12: F, GP, U, 0
    assert(dicts(0)(first.getInt(0)) == "F")
    assert(dicts(1)(first.getInt(1)) == "GP")
    assert(dicts(2)(first.getInt(2)) == "U")
    assert(dicts(3)(first.getInt(3)) == "0")
  }
}

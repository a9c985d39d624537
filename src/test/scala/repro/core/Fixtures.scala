package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.util.Random

/** The paper's running example (Figure 1): 16 students with attributes
  * Gender, School, Address, Failures, ranked by grade (desc) with
  * failures (asc) as tie-break. The `Rank` column of Figure 1 is
  * reproduced verbatim.
  *
  * Encoded value indices follow the sorted-string dictionaries of
  * [[repro.data.Encoding]]: F=0/M=1, GP=0/MS=1, R=0/U=1, failures 0/1/2.
  */
object RunningExample {
  // (id, gender, school, address, failures, grade, rank) — Figure 1 rows.
  val raw: Seq[(Int, String, String, String, Int, Int, Int)] = Seq(
    (1, "F", "MS", "R", 1, 11, 8),
    (2, "M", "MS", "R", 1, 15, 3),
    (3, "M", "GP", "U", 1, 8, 10),
    (4, "M", "GP", "U", 2, 4, 16),
    (5, "M", "MS", "R", 0, 19, 2),
    (6, "F", "MS", "U", 1, 4, 15),
    (7, "F", "GP", "R", 1, 7, 11),
    (8, "M", "GP", "R", 1, 6, 13),
    (9, "F", "MS", "R", 0, 14, 4),
    (10, "F", "MS", "R", 2, 7, 12),
    (11, "M", "MS", "R", 2, 13, 6),
    (12, "F", "GP", "U", 0, 20, 1),
    (13, "F", "GP", "U", 2, 12, 7),
    (14, "M", "MS", "U", 1, 13, 5),
    (15, "F", "GP", "U", 1, 5, 14),
    (16, "M", "GP", "U", 0, 9, 9),
  )

  val attrNames: IndexedSeq[String] = IndexedSeq("Gender", "School", "Address", "Failures")
  val domains: IndexedSeq[IndexedSeq[String]] =
    IndexedSeq(IndexedSeq("F", "M"), IndexedSeq("GP", "MS"), IndexedSeq("R", "U"), IndexedSeq("0", "1", "2"))

  private def enc(t: (Int, String, String, String, Int, Int, Int)): Array[Int] = {
    val (_, g, s, a, f, _, _) = t
    Array(domains(0).indexOf(g), domains(1).indexOf(s), domains(2).indexOf(a), f)
  }

  /** Index with tuples in rank order. */
  lazy val index: DatasetIndex = {
    val rows = raw.sortBy(_._7).map(enc).toArray
    new DatasetIndex(rows, IndexedSeq(2, 2, 2, 3), attrNames, domains)
  }

  /** Unencoded DataFrame with id/grade columns, no rank (for Ranker tests). */
  def df(spark: SparkSession): DataFrame = {
    import spark.implicits._
    raw.toDF("id", "gender", "school", "address", "failures", "grade", "paper_rank")
  }

  /** Pattern helper over this 4-attribute schema. */
  def p(assignments: (Int, Int)*): Pattern = Pattern.of(4, assignments: _*)
}

/** Small random ranked datasets for property-style tests (pure Scala —
  * the searches are exercised without Spark; Spark paths have their own
  * suites).
  */
object RandomData {

  /** Random index: `n` tuples, attribute cardinalities drawn from 2–3;
    * position i holds the rank-(i+1) tuple.
    */
  def index(seed: Long, n: Int = 40, m: Int = 4): DatasetIndex = {
    val rnd = new Random(seed)
    val cards = IndexedSeq.fill(m)(2 + rnd.nextInt(2))
    val rows = Array.fill(n)(Array.tabulate(m)(a => rnd.nextInt(cards(a))))
    val names = IndexedSeq.tabulate(m)(i => s"A$i")
    val doms = cards.map(c => IndexedSeq.tabulate(c)(_.toString))
    new DatasetIndex(rows, cards, names, doms)
  }

  /** Random non-decreasing step bounds for Problem 3.1. */
  def stepBound(seed: Long, kMax: Int): GlobalLowerBound = {
    val rnd = new Random(seed * 31 + 1)
    val step = 1 + rnd.nextInt(5)
    val base = 1 + rnd.nextInt(3)
    GlobalLowerBound(k => (base + (k / step)).toDouble)
  }
}

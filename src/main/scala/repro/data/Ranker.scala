package repro.data

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Score-based ranking algorithms `R` (treated as black boxes by the
  * detection algorithms, exactly as in the paper).
  */
object Ranker {

  /** Rank tuples by `scoreCol` (descending by default), breaking ties by
    * `tieBreak` columns and finally by `idCol` so ranking is total and
    * deterministic. Adds a dense 1-based `rankCol` via `row_number`.
    *
    * The window is unpartitioned — a global sort — which is the correct
    * semantics for a total ranking; our evaluation datasets are small
    * enough for the single-partition window the optimizer will warn
    * about.
    */
  def byScore(
      df: DataFrame,
      scoreCol: String,
      idCol: String,
      rankCol: String = "rank",
      ascending: Boolean = false,
      tieBreak: Seq[Column] = Seq.empty,
  ): DataFrame = {
    val primary = if (ascending) col(scoreCol).asc else col(scoreCol).desc
    val w = Window.orderBy(primary +: tieBreak :+ col(idCol).asc: _*)
    df.withColumn(rankCol, row_number().over(w))
  }
}

package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.{BiasDataGen, Encoding}
import repro.divergence.DivergenceExplorer
import repro.shapley.ResultAnalysis

/** Experiment runners reproducing the paper's evaluation (Section VI).
  * One public entry point per reproduced table; jobs/ mains and the
  * bench suites are thin wrappers around these. Paper reference numbers
  * are recorded alongside measurements in EXPERIMENTS.md.
  */
object Experiments {

  /** Paper defaults (Section VI-A): τ_s = 50, k ∈ [10, 49], step lower
    * bounds for the global problem, α = 0.8 for the proportional one.
    */
  val DefaultTauS = 50L
  val DefaultKMin = 10
  val DefaultKMax = 49
  val DefaultAlpha = 0.8

  /** One timed detection run. */
  final case class TimingRow(
      dataset: String,
      problem: String, // "global" | "prop"
      algo: String,    // "IterTD" | "GlobalBounds" | "PropBounds"
      paramName: String,
      param: Long,
      millis: Long,
      timedOut: Boolean,
      examined: Long,
      resCells: Seq[Int], // |Res[k]| for each computed k
  )

  /** The three evaluation datasets (synthetic stand-ins, DESIGN.md §2). */
  def datasets(spark: SparkSession): Seq[BiasDataGen.RankedDataset] =
    Seq(BiasDataGen.compasLike(spark), BiasDataGen.studentLike(spark), BiasDataGen.germanLike(spark))

  private def indexFor(ds: BiasDataGen.RankedDataset, nAttrs: Int): DatasetIndex =
    Encoding.index(ds.df, ds.attrCols.take(nAttrs), ds.rankCol)

  private def time[A](body: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1000000L)
  }

  private def runAlgo(
      algo: String,
      counter: PatternCounter,
      problem: String,
      tauS: Long,
      kMin: Int,
      kMax: Int,
      timeoutMs: Long,
  ): DetectionResult = {
    val budget = Budget.ofMillis(timeoutMs)
    (algo, problem) match {
      case ("IterTD", "global") =>
        IterTD.run(counter, GlobalLowerBound.paperDefault, tauS, kMin, kMax, budget)
      case ("IterTD", "prop") =>
        IterTD.run(counter, ProportionalLowerBound(DefaultAlpha, counter.datasetSize), tauS, kMin, kMax, budget)
      case ("GlobalBounds", "global") =>
        GlobalBounds.run(counter, GlobalLowerBound.paperDefault, tauS, kMin, kMax, budget)
      case ("PropBounds", "prop") =>
        PropBounds.run(counter, DefaultAlpha, tauS, kMin, kMax, budget)
      case other => throw new IllegalArgumentException(s"bad combination $other")
    }
  }

  private def sweep(
      spark: SparkSession,
      paramName: String,
      points: BiasDataGen.RankedDataset => Seq[Long],
      config: (BiasDataGen.RankedDataset, Long) => (DatasetIndex, Long, Int, Int),
      timeoutMs: Long,
  ): Seq[TimingRow] = {
    val rows = Seq.newBuilder[TimingRow]
    for (ds <- datasets(spark)) {
      for ((problem, algos) <- Seq("global" -> Seq("IterTD", "GlobalBounds"),
                                   "prop"   -> Seq("IterTD", "PropBounds"));
           algo <- algos) {
        var skip = false // once an algo times out, larger points only get slower
        for (pt <- points(ds)) {
          if (!skip) {
            val (ix, tauS, kMin, kMax) = config(ds, pt)
            val counter = new LocalPatternCounter(ix)
            val (res, ms) = time(runAlgo(algo, counter, problem, tauS, kMin, kMax, timeoutMs))
            rows += TimingRow(ds.name, problem, algo, paramName, pt, ms, res.timedOut,
              res.examined, res.resByK.values.map(_.size).toSeq)
            skip = res.timedOut
          } else {
            rows += TimingRow(ds.name, problem, algo, paramName, pt, timeoutMs, timedOut = true, 0L, Seq.empty)
          }
        }
      }
    }
    rows.result()
  }

  // ------------------------------------------------------------------
  // T1 — Figures 4–5: running time vs number of attributes.
  // ------------------------------------------------------------------

  def attrPoints(ds: BiasDataGen.RankedDataset): Seq[Long] = ds.name match {
    case "compas"  => Seq(3, 6, 9, 12, 16)
    case "student" => Seq(3, 9, 15, 21, 27, 33)
    case _         => Seq(3, 8, 12, 16, 20)
  }

  def t1Attributes(spark: SparkSession, timeoutMs: Long = 30000): Seq[TimingRow] =
    sweep(spark, "nAttrs", attrPoints,
      (ds, n) => (indexFor(ds, n.toInt), DefaultTauS, DefaultKMin, DefaultKMax), timeoutMs)

  // ------------------------------------------------------------------
  // T2 — Figures 6–7: running time vs size threshold τ_s.
  // ------------------------------------------------------------------

  def t2Threshold(spark: SparkSession, timeoutMs: Long = 30000,
                  taus: Seq[Long] = Seq(10, 25, 50, 75, 100)): Seq[TimingRow] = {
    // reuse one index per dataset: τ_s does not change the encoding
    val cache = scala.collection.mutable.Map.empty[String, DatasetIndex]
    sweep(spark, "tauS", _ => taus,
      (ds, tau) => (cache.getOrElseUpdate(ds.name, indexFor(ds, ds.attrCols.size)),
                    tau, DefaultKMin, DefaultKMax), timeoutMs)
  }

  // ------------------------------------------------------------------
  // T3 — Figures 8–9: running time vs range of k; plus the
  // patterns-examined gain quoted in Section VI-B.
  // ------------------------------------------------------------------

  def kMaxPoints(ds: BiasDataGen.RankedDataset): Seq[Long] = ds.name match {
    case "compas" => Seq(50, 125, 250, 500, 1000)
    case _        => Seq(50, 125, 200, 275, 350)
  }

  def t3KRange(spark: SparkSession, timeoutMs: Long = 60000): Seq[TimingRow] = {
    val cache = scala.collection.mutable.Map.empty[String, DatasetIndex]
    sweep(spark, "kMax", kMaxPoints,
      (ds, kMax) => (cache.getOrElseUpdate(ds.name, indexFor(ds, ds.attrCols.size)),
                     DefaultTauS, DefaultKMin, kMax.toInt), timeoutMs)
  }

  /** Patterns-examined gain of the optimized algorithm vs ITERTD,
    * per dataset and problem, at the largest k-range point both
    * completed. Mirrors the percentages quoted in Section VI-B.
    */
  final case class GainRow(dataset: String, problem: String, kMax: Long,
                           baseExamined: Long, optExamined: Long) {
    def gainPct: Double = 100.0 * (1.0 - optExamined.toDouble / baseExamined)
  }

  def examinedGains(rows: Seq[TimingRow]): Seq[GainRow] =
    rows.groupBy(r => (r.dataset, r.problem)).toSeq.sortBy(_._1).flatMap {
      case ((ds, prob), rs) =>
        val base = rs.filter(r => r.algo == "IterTD" && !r.timedOut)
        val opt  = rs.filter(r => r.algo != "IterTD" && !r.timedOut)
        val common = base.map(_.param).toSet.intersect(opt.map(_.param).toSet)
        if (common.isEmpty) None
        else {
          val k = common.max
          Some(GainRow(ds, prob, k,
            base.find(_.param == k).get.examined,
            opt.find(_.param == k).get.examined))
        }
    }

  /** Section III claim: in 97.58 % of cases fewer than 100 groups are
    * reported. Computed over all per-k result cells of the given runs.
    */
  def under100Share(rows: Seq[TimingRow]): (Long, Long) = {
    val cells = rows.flatMap(_.resCells)
    (cells.count(_ < 100).toLong, cells.size.toLong)
  }

  // ------------------------------------------------------------------
  // T4/T5 — Figure 10: Shapley-based result analysis.
  // ------------------------------------------------------------------

  /** The per-dataset group analogues of the paper's p1/p2/p3, detected
    * at k = 49 with L_k = 40 (Section VI-C), then explained.
    */
  def t4Shapley(spark: SparkSession): Seq[(String, ResultAnalysis.Explanation)] = {
    val wanted = Map(
      "student" -> "Medu",
      "compas" -> "age_bucket",
      "german" -> "status_account",
    )
    datasets(spark).map { ds =>
      val ix = indexFor(ds, ds.attrCols.size)
      val counter = new LocalPatternCounter(ix)
      val res = GlobalBounds.run(counter, GlobalLowerBound(_ => 40.0), DefaultTauS, 49, 49)
      val detected = res.resByK(49)
      require(detected.nonEmpty, s"no biased group detected on ${ds.name}")
      val attr = wanted(ds.name)
      val attrIdx = ds.attrCols.indexOf(attr)
      // prefer the paper-analogue group on the expected attribute (value 0
      // = the "low" bucket, e.g. Medu=primary); fall back to the largest
      // detected group
      val group = detected
        .filter(p => p.attrs == Seq(attrIdx))
        .minByOption(_.vals(attrIdx))
        .getOrElse(detected.maxBy(ix.sizeD))
      ds.name -> ResultAnalysis.explain(ds, group, DefaultKMax)
    }
  }

  // ------------------------------------------------------------------
  // T6 — Section VI-D case study: comparison with Pastor et al. [27].
  // ------------------------------------------------------------------

  final case class CaseStudy(
      propPatterns: Set[Pattern],
      globalPatterns: Set[Pattern],
      divergenceGroups: Seq[DivergenceExplorer.DivGroup],
      index: DatasetIndex,
  )

  def t6CaseStudy(spark: SparkSession): CaseStudy = {
    val ds = BiasDataGen.studentLike(spark)
    val attrs = ds.attrCols.take(4) // school, sex, age, address — as in the paper
    val ix = Encoding.index(ds.df, attrs, ds.rankCol)
    val counter = new LocalPatternCounter(ix)
    val k = 10
    val prop = PropBounds.run(counter, DefaultAlpha, DefaultTauS, k, k).resByK(k)
    val glob = GlobalBounds.run(counter, GlobalLowerBound(_ => 10.0), DefaultTauS, k, k).resByK(k)
    val div = DivergenceExplorer.run(counter, k, minSupport = DefaultTauS)
    CaseStudy(prop, glob, div, ix)
  }

  // ------------------------------------------------------------------
  // T7 — distributed counting at scale (ours; DESIGN.md §1 fidelity note).
  // ------------------------------------------------------------------

  final case class ScaleRow(nRows: Long, engine: String, millis: Long, resSize: Int, examined: Long)

  def t7Scale(spark: SparkSession, sizes: Seq[Long] = Seq(10000, 100000)): Seq[ScaleRow] = {
    sizes.flatMap { n =>
      val ds = BiasDataGen.compasScaled(spark, n)
      // 10 attributes keep the frontier (and hence the number of Catalyst
      // aggregation plans) moderate; throughput, not depth, is measured.
      val attrs = ds.attrCols.take(10)
      val (enc, domainSizes, _) = Encoding.encode(ds.df, attrs, ds.rankCol)
      val sparkCounter = new SparkPatternCounter(enc, attrs, ds.rankCol, domainSizes)
      val localIx = Encoding.index(ds.df, attrs, ds.rankCol)
      val local = new LocalPatternCounter(localIx)
      // A shallow-but-wide search: the point is counting throughput of the
      // distributed engine, not search depth.
      val tauS = n / 20
      val k = (n / 10).toInt
      val bound = GlobalLowerBound(_ => k / 10.0)
      val (snapS, msS) = time(TopDownSearch.singleK(sparkCounter, bound, tauS, k))
      val (snapL, msL) = time(TopDownSearch.singleK(local, bound, tauS, k))
      require(snapS.res.toSet == snapL.res.toSet, s"engines disagree at n=$n")
      sparkCounter.unpersist()
      ds.df.unpersist()
      Seq(
        ScaleRow(n, "SparkPatternCounter", msS, snapS.res.size, snapS.examined),
        ScaleRow(n, "LocalPatternCounter", msL, snapL.res.size, snapL.examined),
      )
    }
  }

  // ------------------------------------------------------------------
  // Rendering helpers shared by jobs and benches.
  // ------------------------------------------------------------------

  def renderTimings(title: String, rows: Seq[TimingRow]): String =
    Tables.render(title,
      Seq("dataset", "problem", "algo", rows.headOption.map(_.paramName).getOrElse("param"),
          "time", "examined", "max|Res|"),
      rows.map(r => Seq(r.dataset, r.problem, r.algo, r.param.toString,
        Tables.fmtMillis(r.millis, r.timedOut),
        if (r.timedOut) "-" else r.examined.toString,
        if (r.resCells.isEmpty) "-" else r.resCells.max.toString)))
}

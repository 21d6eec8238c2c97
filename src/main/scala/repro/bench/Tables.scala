package repro.bench

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.baselines._
import repro.core._
import repro.data.Datasets

/** Reproduces the paper's evaluation tables (Sec 5), printing measured numbers
  * next to the published ones. Scale and workload sizes are env-tunable:
  * REPRO_SF (default 0.1), REPRO_QUERIES (default 400). Paper numbers come
  * from the authors' real datasets and testbed; the reproduction target is the
  * *shape* of each table (see DESIGN.md §5).
  */
object Tables {

  def sf: Double   = sys.env.get("REPRO_SF").map(_.toDouble).getOrElse(0.1)
  def nQ: Int      = sys.env.get("REPRO_QUERIES").map(_.toInt).getOrElse(400)
  def seed: Long   = sys.env.get("REPRO_SEED").map(_.toLong).getOrElse(42L)
  val lambda       = 2.576 // 99% CI, the paper's default
  val partitions   = 64    // Table 1/2 partition count
  val sampleRate   = 0.005 // the paper's 0.5% sampling rate

  /** One benchmark dataset: cached DataFrame + driver-side ground truth + a
    * random query workload.
    */
  final case class Bundle(
      name: String,
      df: DataFrame,
      predCols: Seq[String],
      aggCol: String,
      gt: GroundTruth,
      queries: Array[Rect],
  ) {
    def n: Long = gt.n.toLong
    def k: Int  = math.max(200, math.ceil(sampleRate * n).toInt) // the US sample budget K
  }

  private def bundle1D(name: String, df: DataFrame, predCol: String, aggCol: String,
                       queries: Int): Bundle = {
    val cached = df.persist()
    cached.count()
    val gt = GroundTruth.collect(cached, Seq(predCol), aggCol)
    Bundle(name, cached, Seq(predCol), aggCol, gt,
           Workloads.ranges1D(gt, queries, minFrac = 0.01, seed))
  }

  /** The three 1-D dataset bundles of Sec 5.1.1 at the current scale factor. */
  def bundles1D(spark: SparkSession, queries: Int = nQ): Seq[Bundle] = Seq(
    bundle1D("Intel", Datasets.intelLite(spark, sf), "time", "light", queries),
    bundle1D("Insta", Datasets.instacartLite(spark, sf), "product_id", "reordered", queries),
    bundle1D("NYC", Datasets.nycLite(spark, sf), "pickup_datetime", "trip_distance", queries),
  )

  // ------------------------------------------------------------------ Table 1

  final case class Table1Row(approach: String, costS: Double,
                             re: Map[(Agg, String), Double])

  /** Paper Table 1 reference: cost, then COUNT/SUM/AVG × Intel/Insta/NYC (%). */
  val paperTable1: Map[String, (Double, Seq[Double])] = Map(
    "US"          -> (0.09, Seq(0.94, 1.20, 0.50, 1.61, 1.82, 1.0, 1.21, 1.25, 0.87)),
    "ST"          -> (0.35, Seq(0.16, 0.22, 0.08, 1.0, 1.27, 0.8, 1.0, 1.22, 0.89)),
    "AQP++"       -> (0.8, Seq(0.33, 0.37, 0.16, 0.5, 0.47, 0.2, 0.4, 0.31, 0.22)),
    "PASS-ESS"    -> (23.0, Seq(0.03, 0.038, 0.02, 0.05, 0.07, 0.044, 0.04, 0.057, 0.04)),
    "PASS-BSS2x"  -> (23.0, Seq(0.12, 0.17, 0.07, 0.23, 0.3, 0.16, 0.2, 0.23, 0.15)),
    "PASS-BSS10x" -> (23.0, Seq(0.06, 0.06, 0.02, 0.1, 0.11, 0.07, 0.08, 0.09, 0.07)),
  )

  def table1(spark: SparkSession): (Seq[Table1Row], String) = {
    val bs   = bundles1D(spark)
    val aggs = Seq(Agg.Count, Agg.Sum, Agg.Avg)

    def metricsOf(b: Bundle, answer: (Rect, Agg) => Estimate): Map[(Agg, String), Double] =
      aggs.map(a => (a, b.name) -> Harness.evaluate(answer, b.gt, b.queries, a).medianRelErr).toMap

    def passVariant(alloc: Bundle => PassBuilder.Allocation): (Double, Map[(Agg, String), Double]) = {
      var cost = 0.0
      val re = bs.flatMap { b =>
        val r = PassBuilder.build(b.df, b.predCols, b.aggCol,
          PassBuilder.Adp1D(partitions, Agg.Sum), alloc(b), lambda = lambda, seed = seed)
        cost += r.buildMillis / 1000.0
        metricsOf(b, r.synopsis.answer)
      }.toMap
      (cost / bs.size, re)
    }

    val rows = scala.collection.mutable.ArrayBuffer.empty[Table1Row]

    locally { // US
      var cost = 0.0
      val re = bs.flatMap { b =>
        val (syn, ms) = UniformSampling.build(b.df, b.predCols, b.aggCol, b.k, lambda, seed)
        cost += ms / 1000.0
        metricsOf(b, syn.answer)
      }.toMap
      rows += Table1Row("US", cost / bs.size, re)
    }
    locally { // ST
      var cost = 0.0
      val re = bs.flatMap { b =>
        val (syn, ms) = StratifiedSampling.build(b.df, b.predCols, b.aggCol, partitions, b.k,
          lambda = lambda, seed = seed)
        cost += ms / 1000.0
        metricsOf(b, syn.answer)
      }.toMap
      rows += Table1Row("ST", cost / bs.size, re)
    }
    locally { // AQP++
      var cost = 0.0
      val re = bs.flatMap { b =>
        val (syn, ms) = AqpPlusPlus.build(b.df, b.predCols, b.aggCol, partitions, b.k,
          lambda = lambda, seed = seed)
        cost += ms / 1000.0
        metricsOf(b, syn.answer)
      }.toMap
      rows += Table1Row("AQP++", cost / bs.size, re)
    }
    locally { // PASS-ESS: rate scaled so processed tuples per query ≈ K
      val essRate = math.min(0.5, sampleRate * partitions / 2.0)
      val (cost, re) = passVariant(_ => PassBuilder.Rate(essRate))
      rows += Table1Row("PASS-ESS", cost, re)
    }
    locally {
      val (cost, re) = passVariant(b => PassBuilder.TotalBudget(2L * b.k))
      rows += Table1Row("PASS-BSS2x", cost, re)
    }
    locally {
      val (cost, re) = passVariant(b => PassBuilder.TotalBudget(10L * b.k))
      rows += Table1Row("PASS-BSS10x", cost, re)
    }

    val header = f"${"approach"}%-12s ${"cost"}%-16s " +
      aggs.flatMap(a => bs.map(b => f"${a.toString.toUpperCase}%s ${b.name}%s")).map(s => f"$s%-22s").mkString
    val lines = rows.map { r =>
      val (pCost, pRe) = paperTable1(r.approach)
      val cells = aggs.zipWithIndex.flatMap { case (a, ai) =>
        bs.zipWithIndex.map { case (b, bi) =>
          f"${r.re((a, b.name)) * 100}%.3f%% (${pRe(ai * bs.size + bi)}%.2f%%)"
        }
      }
      f"${r.approach}%-12s ${f"${r.costS}%.2fs ($pCost%.2fs)"}%-16s " + cells.map(s => f"$s%-22s").mkString
    }
    val text = ("Table 1 — median relative error, measured (paper)\n" + header + "\n" +
      lines.mkString("\n"))
    bs.foreach(_.df.unpersist())
    (rows.toSeq, text)
  }

  // ------------------------------------------------------------------ Table 2

  final case class Table2Row(approach: String, latencyMs: Double, storageMB: Double,
                             buildS: Double, re: Map[String, Double])

  /** Paper Table 2 reference: latency(ms), storage(MB), time(s), then RE (%)
    * for Intel, Insta, NYC, NYC-2D, NYC-3D, NYC-4D, NYC-5D.
    */
  val paperTable2: Map[String, (Double, Double, Double, Seq[Double])] = Map(
    "PASS-BSS1x"     -> (24.8, 0.5, 20.7, Seq(0.34, 0.4, 0.2, 0.68, 2.9, 3.4, 3.6)),
    "PASS-BSS2x"     -> (25.7, 1.4, 20.9, Seq(0.14, 0.29, 0.17, 0.48, 2.0, 2.1, 2.26)),
    "PASS-BSS10x"    -> (29.0, 5.9, 21.1, Seq(0.09, 0.12, 0.08, 0.24, 0.97, 0.9, 1.2)),
    "VerdictDB-10%"  -> (31.0, 17.8, 17.0, Seq(90.8, 90.8, 90.7, 90.9, 90.6, 90.7, 90.7)),
    "VerdictDB-100%" -> (842.0, 176.8, 49.0, Seq(0.09, 0.01, 0.07, 0.27, 0.46, 0.47, 0.48)),
    "DeepDB-10%"     -> (21.0, 21.2, 86.0, Seq(0.9, 65.8, 0.9, 5.2, 24.6, 24.8, 25.6)),
    "DeepDB-100%"    -> (22.0, 61.5, 154.0, Seq(1.1, 66.1, 1.1, 5.4, 24.7, 24.8, 25.4)),
  )

  val nycTemplateCols = Seq("pickup_time", "pickup_date", "PULocationID", "dropoff_date", "dropoff_time")

  /** All 7 Table-2 workloads: the three 1-D datasets plus NYC-2D..5D. */
  def bundlesTable2(spark: SparkSession, queries: Int): Seq[Bundle] = {
    val oneD = bundles1D(spark, queries)
    val nyc  = Datasets.nycLite(spark, sf).persist()
    nyc.count()
    val gtAll = GroundTruth.collect(nyc, nycTemplateCols, "trip_distance")
    val multi = (2 to 5).map { d =>
      val cols = nycTemplateCols.take(d)
      val gt   = new GroundTruth(gtAll.coords.take(d), gtAll.values)
      Bundle(s"NYC-${d}D", nyc, cols, "trip_distance", gt,
             Workloads.rects(gt, queries, minCount = math.max(50L, gt.n / 1000), seed + d))
    }
    oneD ++ multi
  }

  def table2(spark: SparkSession): (Seq[Table2Row], String) = {
    val queries = math.max(100, nQ * 5 / 8)
    val bs      = bundlesTable2(spark, queries)
    val kdLeaves = math.max(64, math.min(1024, (bs.last.n / 3000L).toInt))

    def evalAll(build: Bundle => (Rect => Estimate, Double, Double)): (Double, Double, Double, Map[String, Double]) = {
      var lat = 0.0; var stor = 0.0; var cost = 0.0
      val re = bs.map { b =>
        val (answer, mb, sec) = build(b)
        stor += mb; cost += sec
        val m = Harness.evaluate((q, _) => answer(q), b.gt, b.queries, Agg.Sum)
        lat += m.meanLatencyMs
        b.name -> m.medianRelErr
      }.toMap
      (lat / bs.size, stor / bs.size, cost / bs.size, re)
    }

    def passRow(name: String, mult: Long): Table2Row = {
      val (lat, stor, cost, re) = evalAll { b =>
        val part: PassBuilder.Partitioner =
          if (b.predCols.length == 1) PassBuilder.Adp1D(partitions, Agg.Sum)
          else PassBuilder.KdGreedy(kdLeaves, Agg.Sum)
        val r = PassBuilder.build(b.df, b.predCols, b.aggCol, part,
          PassBuilder.TotalBudget(mult * b.k), lambda = lambda, seed = seed)
        (q => r.synopsis.answer(q, Agg.Sum), r.synopsis.storageBytes / 1048576.0, r.buildMillis / 1000.0)
      }
      Table2Row(name, lat, stor, cost, re)
    }

    def verdictRow(name: String, ratio: Double): Table2Row = {
      val (lat, stor, cost, re) = evalAll { b =>
        val (syn, ms) = VerdictLite.build(b.df, b.predCols, b.aggCol, ratio, lambda, seed)
        (q => syn.answer(q, Agg.Sum), syn.storageBytes / 1048576.0, ms / 1000.0)
      }
      Table2Row(name, lat, stor, cost, re)
    }

    def deepdbRow(name: String, ratio: Double): Table2Row = {
      val (lat, stor, cost, re) = evalAll { b =>
        // cap the training matrix so structure learning stays tractable at bench scale
        val capRatio = math.min(ratio, 120000.0 / b.n)
        val (syn, ms) = DeepDbLite.build(b.df, b.predCols, b.aggCol, capRatio, seed)
        (q => syn.answer(q, Agg.Sum), syn.storageBytes / 1048576.0, ms / 1000.0)
      }
      Table2Row(name, lat, stor, cost, re)
    }

    val rows = Seq(
      passRow("PASS-BSS1x", 1L),
      passRow("PASS-BSS2x", 2L),
      passRow("PASS-BSS10x", 10L),
      verdictRow("VerdictDB-10%", 0.10),
      verdictRow("VerdictDB-100%", 1.0),
      deepdbRow("DeepDB-10%", 0.10),
      deepdbRow("DeepDB-100%", 1.0),
    )

    val names  = bs.map(_.name)
    val header = f"${"approach"}%-15s ${"latency"}%-18s ${"storage"}%-18s ${"build"}%-16s " +
      names.map(s => f"$s%-20s").mkString
    val lines = rows.map { r =>
      val (pLat, pStor, pCost, pRe) = paperTable2(r.approach)
      val cells = names.zipWithIndex.map { case (nm, i) =>
        f"${r.re(nm) * 100}%.3f%% (${pRe(i)}%.2f%%)"
      }
      f"${r.approach}%-15s ${f"${r.latencyMs}%.2fms ($pLat%.0fms)"}%-18s " +
        f"${f"${r.storageMB}%.2fMB ($pStor%.1fMB)"}%-18s ${f"${r.buildS}%.1fs ($pCost%.0fs)"}%-16s " +
        cells.map(s => f"$s%-20s").mkString
    }
    val text = ("Table 2 — end-to-end comparison, measured (paper)\n" + header + "\n" +
      lines.mkString("\n"))
    bs.foreach(_.df.unpersist())
    (rows, text)
  }

  // ------------------------------------------------------------------ Table 3

  final case class Table3Row(k: Int, costS: Double, latencyMs: Double,
                             maxLatencyMs: Double, medianRE: Double)

  /** Paper Table 3 reference: k -> (cost s, latency ms, max latency ms, RE %). */
  val paperTable3: Map[Int, (Double, Double, Double, Double)] = Map(
    4   -> (16.0, 14.6, 29.2, 0.55),
    8   -> (18.0, 13.0, 26.0, 0.32),
    16  -> (20.0, 11.6, 23.3, 0.18),
    32  -> (22.0, 10.7, 21.4, 0.11),
    64  -> (25.0, 8.9, 17.8, 0.04),
    128 -> (50.0, 6.4, 12.9, 0.03),
  )

  def table3(spark: SparkSession): (Seq[Table3Row], String) = {
    val b = bundle1D("NYC", Datasets.nycLite(spark, sf), "pickup_datetime", "trip_distance", nQ)
    val rows = Seq(4, 8, 16, 32, 64, 128).map { k =>
      val r = PassBuilder.build(b.df, b.predCols, b.aggCol,
        PassBuilder.Adp1D(k, Agg.Sum), PassBuilder.Rate(sampleRate), lambda = lambda, seed = seed)
      val m = Harness.evaluate(r.synopsis.answer, b.gt, b.queries, Agg.Sum)
      Table3Row(k, r.buildMillis / 1000.0, m.meanLatencyMs, m.maxLatencyMs, m.medianRelErr)
    }
    val header = f"${"k"}%-5s ${"cost"}%-18s ${"latency"}%-22s ${"max latency"}%-22s ${"median RE"}%-20s"
    val lines = rows.map { r =>
      val (pc, pl, pml, pre) = paperTable3(r.k)
      f"${r.k}%-5d ${f"${r.costS}%.1fs ($pc%.0fs)"}%-18s ${f"${r.latencyMs}%.3fms ($pl%.1fms)"}%-22s " +
        f"${f"${r.maxLatencyMs}%.3fms ($pml%.1fms)"}%-22s ${f"${r.medianRE * 100}%.3f%% ($pre%.2f%%)"}%-20s"
    }
    val text = ("Table 3 — preprocessing cost / latency / accuracy vs k, measured (paper)\n" +
      header + "\n" + lines.mkString("\n"))
    b.df.unpersist()
    (rows, text)
  }
}

package repro.baselines

import org.apache.spark.sql.DataFrame
import repro.core._

/** AQP++ [Peng et al. 2018] and the paper's KD-US baseline share one shape:
  * exact pre-computed partition aggregates to cover the bulk of a predicate,
  * plus a single *global uniform* sample to estimate the residual "gap" — in
  * contrast to PASS, which keeps a stratified sample per leaf. The two
  * baselines differ only in how partitions are chosen: AQP++ runs the paper's
  * hill-climbing heuristic in 1-D; KD-US expands a balanced kd-tree.
  */
final class PrecompUniformSynopsis(
    val root: TreeNode,
    val sampleCoords: Array[Array[Double]],
    val sampleValues: Array[Double],
    val totalRows: Long,
    val lambda: Double = 2.576,
) extends Serializable {
  def k: Int = sampleValues.length
  def storageBytes: Long =
    root.preorder.size.toLong * (2L * root.bounds.dims + 4L) * 8L +
      k.toLong * (root.bounds.dims + 1L) * 8L

  /** Moments of the uniform sample restricted to the gap `q \ cover`. */
  private def gapMoments(q: Rect, cover: Seq[TreeNode]): SampleStats.Moments = {
    var i = 0; var kM = 0; var s1 = 0.0; var s2 = 0.0
    var mn = Double.PositiveInfinity; var mx = Double.NegativeInfinity
    while (i < sampleValues.length) {
      val pt = sampleCoords(i)
      if (q.contains(pt) && !cover.exists(_.bounds.contains(pt))) {
        val a = sampleValues(i)
        kM += 1; s1 += a; s2 += a * a
        if (a < mn) mn = a
        if (a > mx) mx = a
      }
      i += 1
    }
    SampleStats.Moments(sampleValues.length, kM, s1, s2, mn, mx)
  }

  def answer(q: Rect, agg: Agg): Estimate = {
    val f = PartitionTree.mcf(root, q)
    val coverSum = f.cover.iterator.map(_.sum).sum
    val coverCnt = f.cover.iterator.map(_.count).sum
    val partialRows = f.partial.iterator.map(_.count).sum
    val skipRate = if (totalRows == 0) 1.0 else 1.0 - partialRows.toDouble / totalRows
    val m = gapMoments(q, f.cover.toSeq)

    def scaled(s1: Double, s2: Double): (Double, Double) = {
      if (m.ki == 0) (0.0, 0.0)
      else {
        val mean   = s1 / m.ki
        val varPhi = math.max(0.0, s2 / m.ki - mean * mean)
        val est    = totalRows.toDouble / m.ki * s1
        val se2 = SampleStats.fpc(totalRows, m.ki) *
          totalRows.toDouble * totalRows * varPhi / m.ki
        (est, se2)
      }
    }

    agg match {
      case Agg.Sum =>
        val (gapEst, se2) = scaled(m.s1, m.s2)
        Estimate(coverSum + gapEst, lambda * math.sqrt(se2), processedSamples = m.ki.toLong.max(k))
      case Agg.Count =>
        val (gapEst, se2) = scaled(m.kMatch.toDouble, m.kMatch.toDouble)
        Estimate(coverCnt + gapEst, lambda * math.sqrt(se2), processedSamples = k)
      case Agg.Avg =>
        val gapCnt = if (m.ki == 0) 0.0 else totalRows.toDouble * m.kMatch / m.ki
        val estCnt = coverCnt + gapCnt
        if (estCnt == 0) Estimate(Double.NaN, Double.NaN, processedSamples = k)
        else {
          val gapMean = if (m.kMatch == 0) 0.0 else m.s1 / m.kMatch
          val value   = (coverSum + gapCnt * gapMean) / estCnt
          val varM =
            if (m.kMatch == 0) 0.0
            else math.max(0.0, m.s2 / m.kMatch - gapMean * gapMean)
          val w   = gapCnt / estCnt
          val se2 = if (m.kMatch == 0) 0.0 else w * w * varM / m.kMatch
          Estimate(value, lambda * math.sqrt(se2), processedSamples = k)
        }
      case Agg.Min =>
        val cm  = f.cover.iterator.map(_.min).foldLeft(Double.PositiveInfinity)(math.min)
        val est = if (m.kMatch > 0) math.min(cm, m.mn) else cm
        Estimate(est, Double.NaN, processedSamples = k)
      case Agg.Max =>
        val cm  = f.cover.iterator.map(_.max).foldLeft(Double.NegativeInfinity)(math.max)
        val est = if (m.kMatch > 0) math.max(cm, m.mx) else cm
        Estimate(est, Double.NaN, processedSamples = k)
    }
  }
}

object AqpPlusPlus {

  /** The iterative hill-climbing partition selection described in the AQP++
    * paper (Sec 5.1.3 here): starting from equal-depth cuts, repeatedly move
    * each interior boundary to the candidate position minimizing the maximum
    * gap variance over a probe workload of random intervals. The gap of a
    * probe is the part of its range not covered by whole buckets — exactly
    * what the uniform sample must estimate at query time.
    */
  def hillClimbCuts(s: SortedSample1D, k: Int, nProbes: Int = 200, passes: Int = 3,
                    candidatesPerMove: Int = 8, seed: Long = 7): Array[Double] = {
    val m = s.n
    if (m == 0 || k <= 1) return Array.empty
    val rnd    = new scala.util.Random(seed)
    val minLen = math.max(1, m / (4 * k))
    val probes = Array.fill(nProbes) {
      val a = rnd.nextInt(m)
      val b = math.min(m, a + minLen + rnd.nextInt(math.max(1, m - minLen)))
      (math.min(a, b), math.max(math.min(a, b) + 1, math.max(a, b)))
    }
    // gap variance of probe [q1,q2) under boundaries b (sorted, 0 and m at ends)
    def gapVar(b: Array[Int], q1: Int, q2: Int): Double = {
      // whole buckets inside [q1,q2): those j with q1 <= b(j) and b(j+1) <= q2
      var j = 0
      var lo = q2; var hi = q1 // covered span [lo, hi); empty if lo >= hi
      while (j < b.length - 1) {
        if (q1 <= b(j) && b(j + 1) <= q2) { lo = math.min(lo, b(j)); hi = math.max(hi, b(j + 1)) }
        j += 1
      }
      def v(g1: Int, g2: Int): Double =
        if (g2 <= g1) 0.0 else s.vSum(g1, g2, math.max(1, m))
      if (lo >= hi) v(q1, q2) else v(q1, lo) + v(hi, q2)
    }
    def objective(b: Array[Int]): Double = probes.iterator.map { case (q1, q2) => gapVar(b, q1, q2) }.max

    val bounds = Array.tabulate(k + 1)(j => (j.toLong * m / k).toInt)
    var best   = objective(bounds)
    var pass   = 0
    while (pass < passes) {
      var improved = false
      var j = 1
      while (j < k) {
        val lo = bounds(j - 1) + 1; val hi = bounds(j + 1) - 1
        if (hi > lo) {
          var c = 0
          while (c < candidatesPerMove) {
            val cand = lo + ((hi - lo).toLong * c / math.max(1, candidatesPerMove - 1)).toInt
            val old  = bounds(j)
            if (cand != old) {
              bounds(j) = cand
              val v = objective(bounds)
              if (v < best) { best = v; improved = true } else bounds(j) = old
            }
            c += 1
          }
        }
        j += 1
      }
      pass += 1
      if (!improved) pass = passes
    }
    bounds.slice(1, k).map(s.cs)
  }

  /** Builds the 1-D AQP++ baseline: hill-climbed partition aggregates plus a
    * global uniform sample of `totalSamples` tuples.
    */
  def build(df: DataFrame, predCols: Seq[String], aggCol: String, partitions: Int,
            totalSamples: Long, optSampleSize: Int = 4096, lambda: Double = 2.576,
            seed: Long = 42): (PrecompUniformSynopsis, Long) = {
    require(predCols.length == 1, "AQP++ baseline here is 1-D; use buildKdUs for d>1")
    val t0 = System.nanoTime()
    val p  = PassBuilder.prepare(df, predCols, aggCol)
    val sm = PassBuilder.optSample(p, optSampleSize, seed)
    val s  = SortedSample1D(sm.map(_.getDouble(0)), sm.map(_.getDouble(1)))
    val cuts = hillClimbCuts(s, partitions, seed = seed)
    val r = PassBuilder.build(df, predCols, aggCol,
      PassBuilder.Cuts1D(cuts), PassBuilder.PerLeaf(0), optSampleSize, lambda, seed)
    val (us, _) = UniformSampling.build(df, predCols, aggCol, totalSamples.toInt, lambda, seed + 13)
    val syn = new PrecompUniformSynopsis(r.synopsis.root, us.coords, us.values, p.totalRows, lambda)
    (syn, (System.nanoTime() - t0) / 1000000L)
  }

  /** Builds KD-US (Sec 5.4): balanced kd-tree aggregates + global uniform sample. */
  def buildKdUs(df: DataFrame, predCols: Seq[String], aggCol: String, leaves: Int,
                totalSamples: Long, optSampleSize: Int = 4096, lambda: Double = 2.576,
                seed: Long = 42): (PrecompUniformSynopsis, Long) = {
    val t0 = System.nanoTime()
    val r = PassBuilder.build(df, predCols, aggCol,
      PassBuilder.KdBalanced(leaves), PassBuilder.PerLeaf(0), optSampleSize, lambda, seed)
    val (us, _) = UniformSampling.build(df, predCols, aggCol, totalSamples.toInt, lambda, seed + 13)
    val syn = new PrecompUniformSynopsis(r.synopsis.root, us.coords, us.values, r.synopsis.totalRows, lambda)
    (syn, (System.nanoTime() - t0) / 1000000L)
  }
}

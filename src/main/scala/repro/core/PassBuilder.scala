package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.DoubleType

import scala.collection.mutable

/** Builds a [[PassSynopsis]] from a DataFrame with Spark doing all full-data
  * passes, per the construction pipeline of Sec 3.2/4:
  *
  *  1. one pass for cardinality and per-column extrema,
  *  2. a small uniform *optimization sample* collected to the driver, over
  *     which the partitioning optimizer (ADP / equal-depth / kd) runs,
  *  3. one `groupBy(leafId).agg(sum,count,min,max)` shuffle for the exact
  *     partition aggregates,
  *  4. one `stat.sampleBy(leafId, fractions)` pass for the per-leaf stratified
  *     samples.
  *
  * The leaf-id assignment is a deterministic UDF over the predicate columns
  * (broadcast cut table / kd skeleton).
  */
object PassBuilder {

  /** Which partitioning optimizer shapes the leaves. */
  sealed trait Partitioner extends Product with Serializable
  /** The paper's ADP (sampling + discretization DP) in one dimension. */
  final case class Adp1D(k: Int, agg: Agg = Agg.Sum, deltaM: Int = 0) extends Partitioner
  /** Equal-depth strata (the EQ baseline; optimal for COUNT). */
  final case class EqualDepth1D(k: Int) extends Partitioner
  /** Externally supplied interior cut points (e.g. AQP++ hill climbing). */
  final case class Cuts1D(cuts: Array[Double]) extends Partitioner
  /** KD-PASS greedy max-variance expansion for d > 1. */
  final case class KdGreedy(k: Int, agg: Agg = Agg.Sum, maxDepthSkew: Int = 2) extends Partitioner
  /** Balanced kd expansion (the KD-US baseline's partitioning). */
  final case class KdBalanced(k: Int) extends Partitioner

  /** How many stratified samples each leaf receives. */
  sealed trait Allocation extends Product with Serializable
  /** ESS-style: a fixed count per leaf (the per-query processed-tuple control). */
  final case class PerLeaf(n: Int) extends Allocation
  /** BSS-style: a total budget split equally across leaves. */
  final case class TotalBudget(total: Long) extends Allocation
  /** Proportional: uniform within-stratum sampling rate. */
  final case class Rate(rate: Double) extends Allocation

  /** Construction output plus cost accounting for the paper's tables. */
  final case class BuildResult(
      synopsis: PassSynopsis,
      buildMillis: Long,
      optSampleSize: Int,
      partitioningValue: Double,
  )

  private[repro] final case class Prepared(
      projected: DataFrame,
      totalRows: Long,
      dataRect: Rect,
  )

  /** Casts the relevant columns to double and computes N and the per-dimension
    * data bounding box (hi edges nudged up so the box is half-open-inclusive).
    */
  private[repro] def prepare(df: DataFrame, predCols: Seq[String], aggCol: String): Prepared = {
    val cols      = (predCols :+ aggCol).map(c => col(c).cast(DoubleType).as(c))
    val projected = df.select(cols: _*)
    val aggs = predCols.flatMap(c => Seq(min(col(c)).as(s"min_$c"), max(col(c)).as(s"max_$c"))) :+
      count(lit(1)).as("n")
    val row = projected.agg(aggs.head, aggs.tail: _*).collect()(0)
    val n   = row.getAs[Long]("n")
    val lo  = predCols.map(c => row.getAs[Double](s"min_$c")).toArray
    val hi  = predCols.map(c => Math.nextUp(row.getAs[Double](s"max_$c"))).toArray
    Prepared(projected, n, Rect(lo, hi))
  }

  /** Collects a uniform optimization sample of ~`target` rows to the driver.
    * Oversampled collections are thinned by stride, not prefix — collect order
    * follows the data order, so `take(target)` would drop the range's tail and
    * bias every downstream cut.
    */
  private[repro] def optSample(p: Prepared, target: Int, seed: Long): Array[Row] = {
    val frac = if (p.totalRows == 0) 1.0 else math.min(1.0, target * 1.2 / p.totalRows)
    val rows = p.projected.sample(withReplacement = false, frac, seed).collect()
    if (rows.length <= target) rows
    else {
      val step = rows.length.toDouble / target
      Array.tabulate(target)(i => rows((i * step).toInt))
    }
  }

  /** Interior cuts -> leaf rectangles clamped to the data bounding box. */
  private[repro] def leafRects1D(cuts: Array[Double], dataRect: Rect): Array[Rect] = {
    val edges = dataRect.lo(0) +: cuts :+ dataRect.hi(0)
    Array.tabulate(cuts.length + 1)(j => Rect.range(edges(j), edges(j + 1)))
  }

  /** leaf id = number of cuts <= x (binary search over the broadcast cut table). */
  private[repro] def cutAssigner(cuts: Array[Double]): Array[Double] => Int = { x =>
    var lo = 0; var hi = cuts.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (cuts(mid) <= x(0)) lo = mid + 1 else hi = mid
    }
    lo
  }

  def build(
      df: DataFrame,
      predCols: Seq[String],
      aggCol: String,
      partitioner: Partitioner,
      alloc: Allocation,
      optSampleSize: Int = 4096,
      lambda: Double = 2.576,
      seed: Long = 42,
      zeroVarRule: Boolean = true,
  ): BuildResult = {
    val t0 = System.nanoTime()
    val p  = prepare(df, predCols, aggCol)
    require(p.totalRows > 0, "cannot build a synopsis over an empty table")
    val sampleRows = optSample(p, optSampleSize, seed)
    val d          = predCols.length

    // ---- partitioning optimization (driver, over the optimization sample) ----
    val (leafSkeletons, assignFn, kdBuilt, partValue):
        (Array[TreeNode], Array[Double] => Int, Option[KdTree.Built], Double) = partitioner match {
      case p1: Partitioner if d == 1 && !p1.isInstanceOf[KdGreedy] && !p1.isInstanceOf[KdBalanced] =>
        val cs = sampleRows.map(_.getDouble(0))
        val as = sampleRows.map(_.getDouble(1))
        val s  = SortedSample1D(cs, as)
        val part = p1 match {
          case Adp1D(k, agg, dm)  => Dp1D.adp(s, k, agg, dm)
          case EqualDepth1D(k)    => Dp1D.equalDepth(s, k)
          case Cuts1D(cuts)       => Dp1D.Partitioning1D(Array.empty, cuts, Double.NaN)
          case other              => throw new IllegalArgumentException(s"$other is not 1-D")
        }
        val rects  = leafRects1D(part.cuts, p.dataRect)
        val leaves = rects.zipWithIndex.map { case (r, i) => PartitionTree.leaf(r, i) }
        (leaves, cutAssigner(part.cuts), None, part.value)
      case KdGreedy(k, agg, skew) =>
        val pts   = sampleRows.map(r => Array.tabulate(d)(r.getDouble))
        val vals  = sampleRows.map(_.getDouble(d))
        val built = KdTree.buildGreedy(pts, vals, k, agg, p.dataRect, skew)
        (null, built.assign _, Some(built), Double.NaN)
      case KdBalanced(k) =>
        val pts   = sampleRows.map(r => Array.tabulate(d)(r.getDouble))
        val vals  = sampleRows.map(_.getDouble(d))
        val built = KdTree.buildBalanced(pts, vals, k, p.dataRect)
        (null, built.assign _, Some(built), Double.NaN)
      case other =>
        throw new IllegalArgumentException(s"partitioner $other incompatible with d=$d")
    }

    // ---- full-data passes: aggregates + stratified samples --------------------
    val assignUdf = udf((xs: Seq[Double]) => assignFn(xs.toArray))
    val withLeaf = p.projected
      .withColumn("__leaf", assignUdf(array(predCols.map(col): _*)))
      .persist()
    try {
      val statRows = withLeaf
        .groupBy("__leaf")
        .agg(
          count(col(aggCol)).as("cnt"),
          sum(col(aggCol)).as("sm"),
          min(col(aggCol)).as("mn"),
          max(col(aggCol)).as("mx"),
        )
        .collect()
      val statMap = statRows.map(r =>
        r.getAs[Int]("__leaf") ->
          (r.getAs[Long]("cnt"), r.getAs[Double]("sm"), r.getAs[Double]("mn"), r.getAs[Double]("mx"))
      ).toMap

      val (root, leaves): (TreeNode, Array[TreeNode]) = kdBuilt match {
        case Some(built) => built.toTreeNodes
        case None        => (null, leafSkeletons) // tree built after stats below
      }
      for (l <- leaves) statMap.get(l.leafId).foreach { case (c, s, mn, mx) =>
        l.count = c; l.sum = s; l.min = mn; l.max = mx
      }
      val tree = kdBuilt match {
        case Some(_) => PartitionTree.rollUpTree(root); root
        case None    => PartitionTree.build1D(leaves)
      }

      val targets: Map[Int, Long] = alloc match {
        case PerLeaf(n)        => leaves.map(l => l.leafId -> n.toLong).toMap
        case TotalBudget(t)    => leaves.map(l => l.leafId -> math.max(1L, t / leaves.length)).toMap
        case Rate(r)           => leaves.map(l => l.leafId -> math.max(1L, math.round(r * l.count))).toMap
      }
      val fractions: Map[Int, Double] = leaves.map { l =>
        val ni = l.count
        l.leafId -> (if (ni == 0) 0.0 else math.min(1.0, targets(l.leafId).toDouble / ni))
      }.toMap

      val sampledRows = withLeaf.stat.sampleBy("__leaf", fractions, seed + 1).collect()
      val byLeaf = mutable.Map.empty[Int, (mutable.ArrayBuffer[Array[Double]], mutable.ArrayBuffer[Double])]
      for (r <- sampledRows) {
        val id  = r.getAs[Int]("__leaf")
        val buf = byLeaf.getOrElseUpdate(id, (mutable.ArrayBuffer.empty, mutable.ArrayBuffer.empty))
        buf._1 += Array.tabulate(d)(r.getDouble)
        buf._2 += r.getDouble(d)
      }
      val samples = Array.tabulate(leaves.length) { id =>
        byLeaf.get(id)
          .map { case (cs, vs) => LeafSample(cs.toArray, vs.toArray) }
          .getOrElse(LeafSample.empty)
      }

      val synopsis = new PassSynopsis(tree, leaves, samples, p.totalRows, lambda, zeroVarRule)
      BuildResult(synopsis, (System.nanoTime() - t0) / 1000000L, sampleRows.length, partValue)
    } finally withLeaf.unpersist()
  }
}

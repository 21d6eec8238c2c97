package repro.bench

import repro.core.{Agg, Estimate, Rect}

/** Scores one approach over one workload: the paper's metrics (Sec 5.1.2) —
  * median relative error, median CI ratio, latency, skip rate — plus the
  * effective-sample-size numerator.
  */
object Harness {

  final case class RunMetrics(
      medianRelErr: Double,
      medianCiRatio: Double,
      meanLatencyMs: Double,
      maxLatencyMs: Double,
      meanSkipRate: Double,
      meanProcessed: Double,
      ciCoverage: Double, // fraction of queries whose CI contains the truth
  )

  def median(xs: Seq[Double]): Double = {
    val v = xs.filterNot(_.isNaN).sorted
    if (v.isEmpty) Double.NaN
    else if (v.length % 2 == 1) v(v.length / 2)
    else (v(v.length / 2 - 1) + v(v.length / 2)) / 2
  }

  def evaluate(answer: (Rect, Agg) => Estimate, gt: GroundTruth,
               queries: Array[Rect], agg: Agg): RunMetrics = {
    val relErrs  = Array.newBuilder[Double]
    val ciRatios = Array.newBuilder[Double]
    var latSum   = 0.0
    var latMax   = 0.0
    var skipSum  = 0.0
    var procSum  = 0.0
    var covered  = 0
    var ciTotal  = 0
    var scored   = 0
    // JIT warmup so the first measured query does not carry compilation cost
    for (q <- queries.take(10)) answer(q, agg)
    for (q <- queries) {
      val truth = gt.answer(q, agg)
      val t0    = System.nanoTime()
      val est   = answer(q, agg)
      val ms    = (System.nanoTime() - t0) / 1e6
      latSum += ms
      latMax = math.max(latMax, ms)
      skipSum += est.skipRate
      procSum += est.processedSamples.toDouble
      if (!truth.isNaN && truth != 0.0) {
        scored += 1
        relErrs += math.abs(est.value - truth) / math.abs(truth)
        if (!est.ciHalf.isNaN) {
          ciRatios += est.ciHalf / math.abs(truth)
          ciTotal += 1
          if (math.abs(est.value - truth) <= est.ciHalf + 1e-9 * math.abs(truth)) covered += 1
        }
      }
    }
    RunMetrics(
      medianRelErr = median(relErrs.result().toSeq),
      medianCiRatio = median(ciRatios.result().toSeq),
      meanLatencyMs = latSum / math.max(1, queries.length),
      maxLatencyMs = latMax,
      meanSkipRate = skipSum / math.max(1, queries.length),
      meanProcessed = procSum / math.max(1, queries.length),
      ciCoverage = if (ciTotal == 0) Double.NaN else covered.toDouble / ciTotal,
    )
  }
}

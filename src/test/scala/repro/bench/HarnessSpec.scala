package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Agg, Estimate, Rect}

/** Pure tests of the benchmark harness arithmetic. */
class HarnessSpec extends AnyFunSuite {

  private val gt = {
    val cs = Array.tabulate(1000)(_.toDouble)
    new GroundTruth(Array(cs), cs.map(_ * 2))
  }
  private val queries = Array.tabulate(20)(i => Rect.range(i * 40.0, i * 40.0 + 100.0))

  test("median of odd/even/empty sequences") {
    assert(Harness.median(Seq(3.0, 1.0, 2.0)) == 2.0)
    assert(Harness.median(Seq(1.0, 2.0, 3.0, 4.0)) == 2.5)
    assert(Harness.median(Seq.empty).isNaN)
    assert(Harness.median(Seq(Double.NaN, 5.0)) == 5.0)
  }

  test("perfect estimator scores zero error and full coverage") {
    val m = Harness.evaluate((q, a) => Estimate(gt.answer(q, a), 0.0), gt, queries, Agg.Sum)
    assert(m.medianRelErr == 0.0)
    assert(m.ciCoverage == 1.0)
    assert(m.medianCiRatio == 0.0)
  }

  test("biased estimator scores its bias") {
    val m = Harness.evaluate((q, a) => Estimate(gt.answer(q, a) * 1.10, 0.0), gt, queries, Agg.Sum)
    assert(math.abs(m.medianRelErr - 0.10) < 1e-9)
    assert(m.ciCoverage == 0.0)
  }

  test("NaN CIs are excluded from coverage, not counted against it") {
    val m = Harness.evaluate((q, a) => Estimate(gt.answer(q, a), Double.NaN), gt, queries, Agg.Sum)
    assert(m.ciCoverage.isNaN)
    assert(m.medianRelErr == 0.0)
  }

  test("latency, skip rate and processed-samples are averaged") {
    val m = Harness.evaluate(
      (q, a) => Estimate(gt.answer(q, a), 0.0, processedSamples = 7, skipRate = 0.5),
      gt, queries, Agg.Sum)
    assert(m.meanProcessed == 7.0)
    assert(m.meanSkipRate == 0.5)
    assert(m.meanLatencyMs >= 0.0 && m.maxLatencyMs >= m.meanLatencyMs)
  }

  test("zero-truth queries are excluded from relative error") {
    val zeroGt = new GroundTruth(Array(Array.tabulate(100)(_.toDouble)), Array.fill(100)(0.0))
    val m = Harness.evaluate((_, _) => Estimate(1.0, 0.0), zeroGt,
                             Array(Rect.range(0, 50)), Agg.Sum)
    assert(m.medianRelErr.isNaN)
  }
}

package repro.bench

import repro.SparkSpec

/** Reproduces paper Table 3: as the partition count k grows, accuracy improves
  * and per-query latency (samples processed / partial strata) falls, at a
  * growing preprocessing cost.
  */
class Table3Bench extends SparkSpec {

  private lazy val result = Tables.table3(spark)

  test("table 3 renders for k in {4..128}") {
    val (rows, text) = result
    println(text)
    assert(rows.map(_.k) == Seq(4, 8, 16, 32, 64, 128))
    assert(rows.forall(r => !r.medianRE.isNaN && r.costS >= 0))
  }

  test("accuracy improves from k=4 to k=128") {
    val (rows, _) = result
    val byK = rows.map(r => r.k -> r).toMap
    assert(byK(128).medianRE < byK(4).medianRE,
           s"k=128 RE ${byK(128).medianRE} should beat k=4 RE ${byK(4).medianRE}")
    assert(byK(64).medianRE < byK(4).medianRE)
  }

  test("finer partitioning reduces per-query latency (more skipping)") {
    val (rows, _) = result
    val byK = rows.map(r => r.k -> r).toMap
    assert(byK(128).latencyMs <= byK(4).latencyMs * 1.2,
           s"k=128 ${byK(128).latencyMs}ms vs k=4 ${byK(4).latencyMs}ms")
  }

  test("max latency bounds mean latency") {
    val (rows, _) = result
    assert(rows.forall(r => r.maxLatencyMs >= r.latencyMs))
  }
}

package repro.baselines

import repro.SparkSpec
import repro.core.{Agg, Rect}
import repro.bench.GroundTruth
import repro.data.Datasets

/** US and ST baselines against driver-side ground truth on a small synthetic
  * dataset built through the real Spark pipeline.
  */
class UniformStratifiedSpec extends SparkSpec {

  private lazy val df = Datasets.intelLite(spark, sf = 0.004, seed = 3).persist()
  private lazy val gt = GroundTruth.collect(df, Seq("time"), "light")

  private def queries(seed: Long, n: Int = 30): Seq[Rect] = {
    val rnd = new scala.util.Random(seed)
    val cs  = gt.coords(0).sorted
    Seq.fill(n) {
      val i = rnd.nextInt(cs.length / 2)
      val j = i + cs.length / 10 + rnd.nextInt(cs.length / 3)
      Rect.range(cs(i), Math.nextUp(cs(math.min(j, cs.length - 1))))
    }
  }

  test("US build draws approximately K samples") {
    val (syn, _) = UniformSampling.build(df, Seq("time"), "light", k = 2000, seed = 5)
    assert(math.abs(syn.k - 2000) < 400, s"got ${syn.k}")
    assert(syn.totalRows == gt.n)
  }

  for (agg <- Seq(Agg.Sum, Agg.Count, Agg.Avg)) {
    test(s"US median relative error is small on wide queries ($agg)") {
      val (syn, _) = UniformSampling.build(df, Seq("time"), "light", k = 3000, seed = 11)
      val errs = queries(1).flatMap { q =>
        val truth = gt.answer(q, agg)
        if (truth.isNaN || truth == 0) None
        else Some(math.abs(syn.answer(q, agg).value - truth) / math.abs(truth))
      }.sorted
      assert(errs(errs.length / 2) < 0.15, s"median RE ${errs(errs.length / 2)}")
    }
  }

  test("US CI covers the truth for most queries at 99%") {
    val (syn, _) = UniformSampling.build(df, Seq("time"), "light", k = 3000, seed = 13)
    var cov = 0; var tot = 0
    for (q <- queries(2, 60)) {
      val truth = gt.answer(q, Agg.Sum)
      if (!truth.isNaN && truth != 0) {
        val est = syn.answer(q, Agg.Sum)
        tot += 1
        if (math.abs(est.value - truth) <= est.ciHalf) cov += 1
      }
    }
    assert(cov.toDouble / tot >= 0.9, s"coverage ${cov.toDouble / tot}")
  }

  test("US MIN/MAX return observed extrema within the true range") {
    val (syn, _) = UniformSampling.build(df, Seq("time"), "light", k = 3000, seed = 17)
    for (q <- queries(3, 10)) {
      val tMin = gt.answer(q, Agg.Min); val tMax = gt.answer(q, Agg.Max)
      if (!tMin.isNaN) {
        assert(syn.answer(q, Agg.Min).value >= tMin - 1e-9)
        assert(syn.answer(q, Agg.Max).value <= tMax + 1e-9)
      }
    }
  }

  test("ST build creates the requested strata with roughly equal sample shares") {
    val (syn, _) = StratifiedSampling.build(df, Seq("time"), "light",
      strata = 16, totalSamples = 1600, seed = 19)
    assert(syn.storedSamples > 800 && syn.storedSamples < 2400, s"got ${syn.storedSamples}")
  }

  for (agg <- Seq(Agg.Sum, Agg.Count, Agg.Avg)) {
    test(s"ST is at least as accurate as US at equal budget on range queries ($agg)") {
      val budget  = 2000
      val (us, _) = UniformSampling.build(df, Seq("time"), "light", budget, seed = 23)
      val (st, _) = StratifiedSampling.build(df, Seq("time"), "light", 16, budget, seed = 23)
      def medianRe(answer: (Rect, Agg) => repro.core.Estimate): Double = {
        val errs = queries(4, 60).flatMap { q =>
          val truth = gt.answer(q, agg)
          if (truth.isNaN || truth == 0) None
          else Some(math.abs(answer(q, agg).value - truth) / math.abs(truth))
        }.sorted
        errs(errs.length / 2)
      }
      // allow some slack — both are unbiased, ST should not be dramatically worse
      assert(medianRe(st.answer) <= medianRe(us.answer) * 2.5 + 0.02)
    }
  }

  test("ST answers exact zero for disjoint predicates") {
    val (st, _) = StratifiedSampling.build(df, Seq("time"), "light", 8, 800, seed = 29)
    val est = st.answer(Rect.range(1e12, 2e12), Agg.Sum)
    assert(est.value == 0.0)
  }

  test("ST rejects multi-dimensional predicate columns") {
    intercept[IllegalArgumentException] {
      StratifiedSampling.build(df, Seq("time", "light"), "light", 4, 100)
    }
  }
}

package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** Schema/range/determinism checks for the synthetic dataset substitutes. */
class DatasetsSpec extends SparkSpec {

  test("intelLite schema and value ranges") {
    val df = Datasets.intelLite(spark, sf = 0.003)
    assert(df.columns.toSeq == Seq("time", "light"))
    val r = df.agg(min("time"), max("time"), min("light"), count(lit(1))).collect()(0)
    assert(r.getDouble(0) >= 0.0)
    assert(r.getDouble(1) <= 36.0 * 86400 + 1)
    assert(r.getDouble(2) >= 0.0, "light must be non-negative")
    assert(r.getLong(3) >= 1000)
  }

  test("intelLite time column is monotonically dense (ordered predicate)") {
    val times = Datasets.intelLite(spark, sf = 0.002).select("time").collect().map(_.getDouble(0))
    // generated as id * step + jitter: sorting changes little
    val sorted   = times.sorted
    val disorder = times.zip(sorted).count { case (a, b) => math.abs(a - b) > 100 }
    assert(disorder < times.length / 10)
  }

  test("instacartLite reordered is a {0,1} column with product-dependent rate") {
    val df = Datasets.instacartLite(spark, sf = 0.01)
    assert(df.columns.toSeq == Seq("product_id", "reordered"))
    val vals = df.select("reordered").distinct().collect().map(_.getDouble(0)).toSet
    assert(vals.subsetOf(Set(0.0, 1.0)))
    // popular (low-id) products reorder more than unpopular ones
    val lowRate = df.filter(col("product_id") <= 100)
      .agg(avg("reordered")).collect()(0).getDouble(0)
    val highRate = df.filter(col("product_id") > 10000)
      .agg(avg("reordered")).collect()(0).getDouble(0)
    assert(lowRate > highRate + 0.1, s"low=$lowRate high=$highRate")
  }

  test("instacartLite product ids are skewed (Zipf-ish)") {
    val df  = Datasets.instacartLite(spark, sf = 0.01)
    val n   = df.count()
    val top = df.filter(col("product_id") <= 10).count()
    assert(top.toDouble / n > 0.2, s"top-10 products carry ${top.toDouble / n} of rows")
  }

  test("nycLite schema, ranges, and derived-column consistency") {
    val df = Datasets.nycLite(spark, sf = 0.002)
    assert(df.columns.toSeq == Seq("pickup_datetime", "pickup_time", "pickup_date",
                                   "PULocationID", "dropoff_date", "dropoff_time", "trip_distance"))
    val r = df.agg(
      min("trip_distance"), max("trip_distance"),
      min("pickup_time"), max("pickup_time"),
      min("PULocationID"), max("PULocationID")).collect()(0)
    assert(r.getDouble(0) >= 0.1 && r.getDouble(1) <= 60.0)
    assert(r.getDouble(2) >= 0.0 && r.getDouble(3) < 86400.0)
    assert(r.getDouble(4) >= 1.0 && r.getDouble(5) <= 265.0)
    // pickup_datetime decomposes into date and time
    val bad = df.filter(
      abs(col("pickup_datetime") - (col("pickup_date") * 86400 + col("pickup_time"))) > 1e-6).count()
    assert(bad == 0)
    // dropoff never precedes pickup
    val neg = df.filter(col("dropoff_date") * 86400 + col("dropoff_time") <
                        col("pickup_date") * 86400 + col("pickup_time") - 1e-6).count()
    assert(neg == 0)
  }

  test("nycLite trip distance is heavy-tailed") {
    val d = Datasets.nycLite(spark, sf = 0.002).select("trip_distance").collect().map(_.getDouble(0))
    val mean   = d.sum / d.length
    val median = d.sorted.apply(d.length / 2)
    assert(mean > median, s"mean $mean should exceed median $median for a right-skewed law")
  }

  test("adversarial dataset matches the Sec 5.3 construction") {
    val df = Datasets.adversarial(spark, sf = 0.01)
    val n  = df.count()
    val zeros = df.filter(col("a") === 0.0).count()
    assert(math.abs(zeros.toDouble / n - 0.875) < 0.01)
  }

  test("generators are deterministic within a session") {
    val a = Datasets.instacartLite(spark, sf = 0.002).agg(sum("product_id")).collect()(0).getDouble(0)
    val b = Datasets.instacartLite(spark, sf = 0.002).agg(sum("product_id")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("scale factor controls row counts") {
    val small = Datasets.intelLite(spark, sf = 0.001).count()
    val large = Datasets.intelLite(spark, sf = 0.004).count()
    assert(large > small * 3 && large < small * 5)
  }
}

package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic substitutes for the paper's three real datasets (Sec 5.1.1); the
  * originals cannot be downloaded in this sealed image. Each generator is a
  * deterministic-within-session Spark expression pipeline (seeded `rand`)
  * whose predicate/aggregate correlation structure preserves the behaviour the
  * experiments exercise — see DESIGN.md §3 for the substitution rationale.
  *
  * Scale factors: sf = 1.0 reproduces the papers' row counts (3M / 1.4M /
  * 7.7M); tests use sf ≈ 0.01 and benchmarks sf = 0.1.
  */
object Datasets {

  private def n(base: Long, sf: Double): Long = math.max(1000L, (base * sf).toLong)

  /** Intel Wireless stand-in: `time` (seconds over ~36 days, ordered) as the
    * predicate column, `light` as the aggregation column. Light combines a
    * day-night sinusoid, a weekday lamp regime, multiplicative noise, and rare
    * bursts, clipped non-negative — smooth stretches punctuated by
    * high-variance regions, which is what partitioning optimizers must find.
    */
  def intelLite(spark: SparkSession, sf: Double = 0.01, seed: Long = 11): DataFrame = {
    val rows    = n(3_000_000L, sf)
    val horizon = 36.0 * 86400
    spark.range(rows).select(
      (col("id") * (horizon / rows) + rand(seed) * (horizon / rows)).as("time")
    ).select(
      col("time"),
      {
        val tod      = pmod(col("time"), lit(86400.0))
        val day      = floor(col("time") / 86400.0)
        val daylight = greatest(lit(0.0), sin((tod / 86400.0 - 0.25) * 2 * math.Pi)) * 500.0
        val weekday  = (pmod(day, lit(7.0)) < 5).cast(DoubleType)
        val workHrs  = (tod > 9.0 * 3600) && (tod < 18.0 * 3600)
        val lamps    = weekday * when(workHrs, 220.0).otherwise(0.0)
        val noise    = exp(randn(seed + 1) * 0.4) * 15.0
        val burst    = when(rand(seed + 2) < 0.01, rand(seed + 3) * 1500.0).otherwise(0.0)
        round(greatest(lit(0.0), daylight + lamps + noise + burst), 2).as("light")
      },
    )
  }

  /** Instacart order_product stand-in: Zipf-skewed `product_id` as the
    * predicate, Bernoulli `reordered` as the aggregate. The reorder rate mixes
    * a popularity decay (popular products reorder more) with an idiosyncratic
    * per-product-block component (a hash, not a smooth function of the id) —
    * real per-product rates are idiosyncratic, which is precisely what
    * histogram/independence models like DeepDB cannot capture while unbiased
    * sampling remains unaffected.
    */
  def instacartLite(spark: SparkSession, sf: Double = 0.01, seed: Long = 23): DataFrame = {
    val rows     = n(1_400_000L, sf)
    val products = 49688L
    val base = spark.range(rows).select(
      least(lit(products.toDouble),
            greatest(lit(1.0),
                     floor(pow(lit(1.0) / (rand(seed) + 1e-9), lit(1.0 / 1.05))))).as("product_id"),
      rand(seed + 1).as("u"),
    )
    val block     = floor(col("product_id") / 400.0) + 1.0
    val blockHash = abs(sin(block * 12.9898) * 43758.5453) % 1.0 // deterministic per-block noise
    val p = greatest(lit(0.02), least(lit(0.95),
      lit(0.15) + lit(0.5) * exp(-col("product_id") / 3000.0) + (blockHash - 0.5) * 0.7))
    base.select(
      col("product_id"),
      (col("u") < p).cast(DoubleType).as("reordered"),
    )
  }

  /** NYC Taxi Jan-2019 stand-in. Aggregation column `trip_distance` is
    * log-normal with zone and time-of-day effects; predicate columns are
    * `pickup_datetime` (1-D experiments) and the multi-dimensional template
    * attributes `pickup_time`, `pickup_date`, `PULocationID`, `dropoff_date`,
    * `dropoff_time` — dropoffs are derived from pickups so the dimensions are
    * genuinely correlated, which the KD-PASS / workload-shift experiments rely
    * on.
    */
  def nycLite(spark: SparkSession, sf: Double = 0.01, seed: Long = 37): DataFrame = {
    val rows = n(7_700_000L, sf)
    val base = spark.range(rows).select(
      floor(rand(seed) * 31).cast(DoubleType).as("pickup_date"),
      pmod(lit(14.0 * 3600) + randn(seed + 1) * 6.5 * 3600, lit(86400.0)).as("pickup_time"),
      least(lit(265.0),
            greatest(lit(1.0),
                     floor(pow(lit(1.0) / (rand(seed + 2) + 1e-9), lit(1.0 / 1.0))))).as("PULocationID"),
      exp(randn(seed + 3) * 0.8 + 0.7).as("dist0"),
      (rand(seed + 4) * 20.0 + 8.0).as("speed_mph"),
    )
    val withDist = base.select(
      col("pickup_date"), col("pickup_time"), col("PULocationID"), col("speed_mph"),
      {
        val airport = when(col("PULocationID") === 2.0, 3.2).otherwise(1.0)
        val night   = when(col("pickup_time") < 6.0 * 3600, 1.5).otherwise(1.0)
        round(least(lit(60.0), greatest(lit(0.1), col("dist0") * airport * night)), 2).as("trip_distance")
      },
    )
    withDist.select(
      (col("pickup_date") * 86400 + col("pickup_time")).as("pickup_datetime"),
      col("pickup_time"),
      col("pickup_date"),
      col("PULocationID"),
      {
        val dropTs = col("pickup_date") * 86400 + col("pickup_time") +
          col("trip_distance") / col("speed_mph") * 3600.0
        floor(dropTs / 86400.0).cast(DoubleType).as("dropoff_date")
      },
      {
        val dropTs = col("pickup_date") * 86400 + col("pickup_time") +
          col("trip_distance") / col("speed_mph") * 3600.0
        pmod(dropTs, lit(86400.0)).as("dropoff_time")
      },
      col("trip_distance"),
    )
  }

  /** The Sec 5.3 synthetic adversarial dataset: 1M × sf tuples whose first
    * 87.5% have aggregate value 0 and whose last 12.5% are N(500, 100) — the
    * regime where equal-depth partitioning wastes buckets on the flat prefix.
    */
  def adversarial(spark: SparkSession, sf: Double = 1.0, seed: Long = 53): DataFrame = {
    val rows = n(1_000_000L, sf)
    spark.range(rows).select(
      col("id").cast(DoubleType).as("c"),
      when(col("id") < math.ceil(rows * 0.875), 0.0)
        .otherwise(randn(seed) * 100.0 + 500.0).as("a"),
    )
  }
}

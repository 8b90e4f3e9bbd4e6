package repro.core

import repro.SparkSpec
import repro.core.baselines.Baselines
import repro.core.reptile._

class BaselinesSpec extends SparkSpec {
  import spark.implicits._

  private def cand(g: String, stats: GroupStats, predicted: Double, residual: Double): Candidate =
    Candidate(Map("g" -> g), stats, stats, Map("count" -> predicted), 0.0, residual)

  private val res = DimRankResult("dim", "g", Vector(
    cand("a", GroupStats(100, 10, 1), 100, 0.5),
    cand("b", GroupStats(300, 12, 1), 290, 10),
    cand("c", GroupStats(50, 9, 1), 120, -70),
  ), 0.0)

  test("sensitivity picks the group whose deletion best resolves the complaint") {
    // "count too high": deleting the largest group reduces the count most.
    val high = Baselines.sensitivity(res, Complaint(AggType.Count, Direction.TooHigh))
    assert(high.values("g") == "b")
    // "count too low": deletion can only hurt; the least bad is the smallest.
    val low = Baselines.sensitivity(res, Complaint(AggType.Count, Direction.TooLow))
    assert(low.values("g") == "c")
  }

  test("support picks the densest group") {
    assert(Baselines.support(res).values("g") == "b")
  }

  test("support can use measure mass for pre-aggregated data") {
    val r2 = DimRankResult("dim", "g", Vector(
      cand("a", GroupStats(1, 500, 0), 0, 0),
      cand("b", GroupStats(1, 900, 0), 0, 0),
    ), 0.0)
    assert(Baselines.support(r2, useSum = true).values("g") == "b")
  }

  test("outlier picks the largest absolute model residual, ignoring direction") {
    assert(Baselines.outlier(res).values("g") == "c")
  }

  test("rawWinsor repairs drifted groups but cannot see missing rows") {
    val rng = new scala.util.Random(4)
    val rows =
      (0 until 50).map(_ => ("good", 100.0 + rng.nextGaussian())) ++
        (0 until 50).map(_ => ("skewed", 100.0 + rng.nextGaussian())) ++
        (0 until 5).map(_ => ("skewed", 400.0)) // heavy upper outliers
    val fact = rows.toDF("g", "v")
    // complaint: mean too high -> clipping the outliers in `skewed` helps most
    val best = Baselines.rawWinsor(spark, fact, Seq("g"), "v", Complaint(AggType.Mean, Direction.TooHigh))
    assert(best("g") == "skewed")
  }

  test("rawWinsor respects provenance filters") {
    val rows = Seq(("x", "a", 1.0), ("x", "a", 100.0), ("y", "b", 5.0))
    val fact = rows.toDF("part", "g", "v")
    val best = Baselines.rawWinsor(spark, fact, Seq("g"), "v",
      Complaint(AggType.Mean, Direction.TooHigh), Map("part" -> "x"))
    assert(best("g") == "a")
  }
}

package repro.core

import repro.{Oracle, SparkSpec}
import repro.core.reptile._
import scala.util.Random

class StatsSpec extends SparkSpec {

  test("ofValues computes sample statistics") {
    val g = GroupStats.ofValues(Seq(2.0, 4.0, 6.0))
    assert(g.count == 3.0 && g.mean == 4.0)
    assert(math.abs(g.std - 2.0) < 1e-12)
    assert(g.sum == 12.0)
  }

  test("ofValues edge cases") {
    assert(GroupStats.ofValues(Nil) == GroupStats.empty)
    val one = GroupStats.ofValues(Seq(5.0))
    assert(one.count == 1.0 && one.mean == 5.0 && one.std == 0.0)
  }

  test("combine equals direct computation on a partition (property)") {
    val rng = new Random(1)
    for (_ <- 0 until 20) {
      val parts = Vector.fill(1 + rng.nextInt(5))(Vector.fill(rng.nextInt(20))(rng.nextDouble() * 100))
      val combined = GroupStats.combine(parts.map(GroupStats.ofValues))
      val direct = GroupStats.ofValues(parts.flatten)
      assert(math.abs(combined.count - direct.count) < 1e-9)
      assert(math.abs(combined.mean - direct.mean) < 1e-9 || direct.count == 0)
      assert(math.abs(combined.std - direct.std) < 1e-9)
    }
  }

  test("combine ignores empty groups") {
    val g = GroupStats.combine(Seq(GroupStats.empty, GroupStats(2, 10, 0), GroupStats.empty))
    assert(g.count == 2.0 && g.mean == 10.0)
  }

  test("combine of nothing is empty") {
    assert(GroupStats.combine(Nil) == GroupStats.empty)
  }

  test("combine matches DuckDB aggregate over the union (oracle)") {
    import spark.implicits._
    val rng = new Random(2)
    val rows = (0 until 200).map(i => (s"g${i % 5}", rng.nextDouble() * 50))
    val df = rows.toDF("g", "v")
    // Spark side: recombine per-group stats via GroupStats.combine.
    val perGroup = df.groupBy($"g").agg(
      org.apache.spark.sql.functions.count("*").cast("double").as("c"),
      org.apache.spark.sql.functions.avg("v").as("m"),
      org.apache.spark.sql.functions.stddev_samp("v").as("s"),
    ).collect().map(r => GroupStats(r.getDouble(1), r.getDouble(2), r.getDouble(3)))
    val combined = GroupStats.combine(perGroup.toSeq)
    val summary = Seq((combined.count, combined.mean, combined.std))
      .toDF("total_count", "total_mean", "total_std")
    Oracle.assertEquivalent(
      summary,
      "SELECT count(*)::DOUBLE AS total_count, avg(v::DOUBLE) AS total_mean, stddev_samp(v::DOUBLE) AS total_std FROM t",
      "t" -> df,
    )
  }

  test("AggType.of projects the right statistic") {
    val g = GroupStats(4, 2.5, 1.0)
    assert(AggType.Count.of(g) == 4.0)
    assert(AggType.Mean.of(g) == 2.5)
    assert(AggType.Sum.of(g) == 10.0)
    assert(AggType.Std.of(g) == 1.0)
  }

  test("Direction scores express the complaint") {
    assert(Direction.TooHigh.score(5.0) > Direction.TooHigh.score(3.0))
    assert(Direction.TooLow.score(5.0) < Direction.TooLow.score(3.0))
    assert(Direction.ShouldBe(4.0).score(4.0) == 0.0)
    assert(Direction.ShouldBe(4.0).score(6.0) == 2.0)
  }

  test("Complaint.score composes aggregate and direction") {
    val c = Complaint(AggType.Sum, Direction.TooLow)
    assert(c.score(GroupStats(2, 5, 0)) == -10.0)
  }

  test("repairing one group moves the combined statistic as expected (Example 8)") {
    // Ofla 1986: count complaint "should be 70"; current districts sum to 62.
    val groups = Vector(
      GroupStats(5, 8.1, 1.8), GroupStats(10, 1.8, 1.5), GroupStats(6, 7.7, 1.5),
      GroupStats(11, 7.3, 1.3), GroupStats(9, 2.2, 1.9), GroupStats(21, 6.0, 2.0))
    val c = Complaint(AggType.Count, Direction.ShouldBe(70))
    val before = c.score(GroupStats.combine(groups))
    // repairing the 9-count group to 17 gets the total to 70
    val repaired = groups.updated(4, groups(4).copy(count = 17))
    assert(c.score(GroupStats.combine(repaired)) == 0.0)
    assert(before == 8.0)
  }
}

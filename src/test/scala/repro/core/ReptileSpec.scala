package repro.core

import repro.SparkSpec
import repro.core.reptile._
import scala.util.Random

/** End-to-end behaviour of the complaint-based drill-down engine on small
  * planted-error scenarios, including the paper's running FIST example.
  */
class ReptileSpec extends SparkSpec {
  import spark.implicits._

  private val cfg = ReptileConfig(emIters = 8)

  /** years x districts x villages panel with a known (mostly flat)
    * measure. Enough parallel clusters that the multi-level model's shared
    * covariance is estimated from clean groups (as in the paper's setup).
    */
  private def panel(seed: Long = 0, perGroup: Int = 20): Vector[(String, String, String, Double)] = {
    val rng = new Random(seed)
    for {
      y <- Vector("1984", "1985", "1986", "1987", "1988")
      d <- Vector("alaje", "bora", "ofla", "raya")
      v <- (0 until 4).toVector.map(i => s"$d-v$i")
      _ <- 0 until perGroup
    } yield (y, d, v, 7.0 + rng.nextGaussian() * 0.5)
  }

  private val dims = Vector(
    Dimension("time", Vector("year")),
    Dimension("geo", Vector("district", "village")),
  )

  test("recommend surfaces a village whose values collapsed (FIST example)") {
    // Zata-like error: one village's 1986 severities are far too low.
    val rows = panel(1).map {
      case (y, d, v, m) if y == "1986" && v == "ofla-v2" => (y, d, v, m - 5.0)
      case r                                             => r
    }
    val fact = rows.toDF("year", "district", "village", "sev")
    val res = Reptile.recommend(spark, fact, dims,
      drilled = Map("time" -> 1, "geo" -> 1),
      filters = Map("year" -> "1986", "district" -> "ofla"),
      complaint = Complaint(AggType.Mean, Direction.TooLow),
      measure = "sev", cfg = cfg)
    val best = res.head
    assert(best.dim == "geo" && best.attr == "village")
    assert(best.best.values("village") == "ofla-v2")
    // repairing the bad village raises the district mean
    assert(best.best.repaired.mean > best.best.observed.mean)
  }

  test("an auxiliary signal explains away a would-be outlier (Darube vs Zata)") {
    // Two low villages; rainfall explains v1's low severity but not v2's.
    val rng = new Random(7)
    val villages = (0 until 6).map(i => s"ofla-v$i")
    // severity tracks (inverse) rainfall; v2 breaks the relationship
    val rain = villages.map(v => v -> (if (v == "ofla-v1") 600.0 else 150.0 + rng.nextDouble() * 80)).toMap
    val rows = for {
      v <- villages
      _ <- 0 until 30
    } yield {
      val base = if (v == "ofla-v1") 2.0 else if (v == "ofla-v2") 2.2 else 7.5
      ("1986", "ofla", v, base + rng.nextGaussian() * 0.4)
    }
    val fact = rows.toDF("year", "district", "village", "sev")
    val aux = AuxDataset("rain", rain.toSeq.toDF("village", "rainfall"), "village", "rainfall")
    val res = Reptile.rankDim(spark, fact, dims,
      drilled = Map("time" -> 1, "geo" -> 1),
      filters = Map("year" -> "1986", "district" -> "ofla"),
      complaint = Complaint(AggType.Mean, Direction.TooLow),
      measure = "sev", targetDim = "geo", aux = Seq(aux), cfg = cfg)
    // v1 (high rainfall -> low severity expected) should rank below v2.
    val ranked = res.ranked.map(_.values("village"))
    assert(ranked.head == "ofla-v2", s"got $ranked")
  }

  test("count complaints find groups with missing records") {
    val rng = new Random(2)
    val rows = panel(2, perGroup = 30).filterNot { case (y, _, v, _) =>
      y == "1986" && v == "raya-v1" && rng.nextDouble() < 0.8 // drop ~80% of one group
    }
    val fact = rows.toDF("year", "district", "village", "sev")
    val res = Reptile.rankDim(spark, fact, dims,
      drilled = Map("time" -> 1, "geo" -> 1),
      filters = Map("year" -> "1986", "district" -> "raya"),
      complaint = Complaint(AggType.Count, Direction.TooLow),
      measure = "sev", targetDim = "geo", cfg = cfg)
    assert(res.best.values("village") == "raya-v1")
    assert(res.best.repaired.count > res.best.observed.count)
  }

  test("std complaints are repaired through the mean (Figure 1 scenario)") {
    val rows = panel(3).map {
      case (y, d, v, m) if y == "1986" && v == "ofla-v3" => (y, d, v, m - 5.0)
      case r                                             => r
    }
    val fact = rows.toDF("year", "district", "village", "sev")
    val res = Reptile.rankDim(spark, fact, dims,
      drilled = Map("time" -> 1, "geo" -> 1),
      filters = Map("year" -> "1986", "district" -> "ofla"),
      complaint = Complaint(AggType.Std, Direction.TooHigh),
      measure = "sev", targetDim = "geo", cfg = cfg)
    assert(res.best.values("village") == "ofla-v3")
  }

  test("recommend ranks hierarchies by best repair score") {
    val rows = panel(4)
    val fact = rows.toDF("year", "district", "village", "sev")
    val res = Reptile.recommend(spark, fact, dims,
      drilled = Map("time" -> 1, "geo" -> 1),
      filters = Map("year" -> "1986", "district" -> "ofla"),
      complaint = Complaint(AggType.Mean, Direction.TooLow),
      measure = "sev", cfg = cfg)
    // both remaining drill-downs evaluated: geo -> village only (time is exhausted)
    assert(res.map(_.dim) == Vector("geo"))
  }

  test("drill-down candidates respect the provenance filters") {
    val fact = panel(5).toDF("year", "district", "village", "sev")
    val res = Reptile.rankDim(spark, fact, dims,
      drilled = Map("time" -> 1, "geo" -> 1),
      filters = Map("year" -> "1985", "district" -> "raya"),
      complaint = Complaint(AggType.Mean, Direction.TooHigh),
      measure = "sev", targetDim = "geo", cfg = cfg)
    assert(res.candidates.size == 4)
    assert(res.candidates.forall(_.values("district") == "raya"))
    assert(res.candidates.forall(_.values("year") == "1985"))
  }

  test("sum complaints repair count and mean jointly") {
    val rng = new Random(6)
    val rows = panel(6, perGroup = 30).flatMap {
      case (y, d, v, m) if y == "1986" && v == "ofla-v0" =>
        if (rng.nextDouble() < 0.5) None else Some((y, d, v, m - 3.0)) // missing + decrease
      case r => Some(r)
    }
    val fact = rows.toDF("year", "district", "village", "sev")
    val res = Reptile.rankDim(spark, fact, dims,
      drilled = Map("time" -> 1, "geo" -> 1),
      filters = Map("year" -> "1986", "district" -> "ofla"),
      complaint = Complaint(AggType.Sum, Direction.TooLow),
      measure = "sev", targetDim = "geo", cfg = cfg)
    assert(res.best.values("village") == "ofla-v0")
    assert(res.best.repaired.sum > res.best.observed.sum)
  }

  test("missing filters for drilled attributes are rejected") {
    val fact = panel(8).toDF("year", "district", "village", "sev")
    intercept[IllegalArgumentException] {
      Reptile.rankDim(spark, fact, dims, drilled = Map("time" -> 1, "geo" -> 1),
        filters = Map("district" -> "ofla"), // year missing
        complaint = Complaint(AggType.Mean, Direction.TooLow),
        measure = "sev", targetDim = "geo", cfg = cfg)
    }
  }

  test("fully drilled dimensions cannot be drilled further") {
    val fact = panel(9).toDF("year", "district", "village", "sev")
    intercept[IllegalArgumentException] {
      Reptile.rankDim(spark, fact, dims, drilled = Map("time" -> 1, "geo" -> 2),
        filters = Map("year" -> "1985", "district" -> "ofla", "village" -> "ofla-v0"),
        complaint = Complaint(AggType.Mean, Direction.TooLow),
        measure = "sev", targetDim = "geo", cfg = cfg)
    }
  }

  test("repair substitutes predicted statistics") {
    val obs = GroupStats(10, 5.0, 1.0)
    val r1 = Reptile.repair(obs, Map("count" -> 20.0), Seq(StatKind.CountStat))
    assert(r1 == obs.copy(count = 20.0))
    val r2 = Reptile.repair(obs, Map("mean" -> 7.0), Seq(StatKind.MeanStat))
    assert(r2 == obs.copy(mean = 7.0))
    val r3 = Reptile.repair(obs, Map("sum" -> 80.0), Seq(StatKind.SumStat))
    assert(math.abs(r3.sum - 80.0) < 1e-9)
    val r4 = Reptile.repair(GroupStats.empty, Map("sum" -> 12.0), Seq(StatKind.SumStat))
    assert(math.abs(r4.sum - 12.0) < 1e-9)
    val r5 = Reptile.repair(obs, Map("count" -> -3.0), Seq(StatKind.CountStat))
    assert(r5.count == 0.0) // clamped
  }

  test("linear-model configuration also runs") {
    val fact = panel(10).toDF("year", "district", "village", "sev")
    val res = Reptile.rankDim(spark, fact, dims,
      drilled = Map("time" -> 1, "geo" -> 1),
      filters = Map("year" -> "1986", "district" -> "ofla"),
      complaint = Complaint(AggType.Mean, Direction.TooLow),
      measure = "sev", targetDim = "geo", cfg = cfg.copy(multiLevel = false))
    assert(res.candidates.size == 4)
  }
}

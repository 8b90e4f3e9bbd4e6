package repro.synth

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.fmatrix.{FactorizedMatrix, FeatureColumn}
import repro.core.frep.{HierChain, HierRelation}
import scala.util.Random

/** Synthetic datasets for the performance and model-quality experiments.
  *
  * The real Absentee / COMPAS / FIST / Vote datasets are not available
  * offline, so each generator reproduces the published row counts, the
  * hierarchy structure, and the attribute cardinalities (the drivers of
  * runtime/model shape), with uniform-ish value draws. Substitutions are
  * documented in DESIGN.md.
  */
object DatasetSynth {

  /** North Carolina absentee-like data: 179K rows, 4 one-attribute
    * hierarchies — county (100), party (6), week (53), gender (3).
    */
  def absenteeLike(spark: SparkSession, rows: Int = 179000, seed: Long = 7): DataFrame = {
    import spark.implicits._
    val rng = new Random(seed)
    (0 until rows).map { _ =>
      (f"c${rng.nextInt(100)}%03d", s"p${rng.nextInt(6)}", f"w${rng.nextInt(53)}%02d",
        s"g${rng.nextInt(3)}", rng.nextDouble() * 10)
    }.toDF("county", "party", "week", "gender", "v")
  }

  /** COMPAS-like data: 60,843 rows; time hierarchy year/month/day (~704
    * distinct days) plus age (3), race (6), charge degree (3).
    */
  def compasLike(spark: SparkSession, rows: Int = 60843, seed: Long = 8): DataFrame = {
    import spark.implicits._
    val rng = new Random(seed)
    (0 until rows).map { _ =>
      val y = rng.nextInt(2); val mth = rng.nextInt(12); val d = rng.nextInt(30)
      (s"y$y", f"y$y-m$mth%02d", f"y$y-m$mth%02d-d$d%02d",
        s"a${rng.nextInt(3)}", s"r${rng.nextInt(6)}", s"ch${rng.nextInt(3)}", rng.nextDouble() * 10)
    }.toDF("year", "month", "day", "age", "race", "charge", "v")
  }

  /** FIST-like drought survey: time=[year] (36), geo=[region, district,
    * village] (4 x 4 x 10 = 160 villages); several farmer reports per
    * (village, year); severity has additive region/village/year structure
    * plus a village-level rainfall signal (the auxiliary dataset).
    */
  def fistLike(spark: SparkSession, seed: Long = 9): (DataFrame, DataFrame) = {
    import spark.implicits._
    val rng = new Random(seed)
    val years = (0 until 36).map(y => f"y$y%02d")
    val villages = for {
      r <- 0 until 4; d <- 0 until 4; v <- 0 until 10
    } yield (s"R$r", f"R$r-D$d", f"R$r-D$d-V$v%02d")
    val rain = villages.map { case (_, _, v) => v -> rng.nextGaussian() }.toMap
    val regionEff = (0 until 4).map(r => s"R$r" -> rng.nextGaussian() * 0.8).toMap
    val villageEffs = villages.map { case (_, _, v) =>
      v -> (-0.9 * rain(v) + 0.4 * rng.nextGaussian())
    }.toMap
    val yearEff = years.map(y => y -> rng.nextGaussian() * 1.2).toMap
    // year x district interaction: districts respond to a drought year
    // differently — the cluster-level effect multi-level models capture.
    val ydEff = (for { y <- years; (_, d, _) <- villages } yield (y, d))
      .distinct.map(k => k -> rng.nextGaussian() * 0.7).toMap
    val rows = for {
      (reg, dis, vil) <- villages
      y <- years
      _ <- 0 until 5
    } yield {
      val sev = 5.0 + regionEff(reg) + villageEffs(vil) + yearEff(y) + ydEff((y, dis)) +
        0.5 * rng.nextGaussian()
      (y, reg, dis, vil, math.max(1.0, math.min(10.0, sev)))
    }
    val fact = rows.toDF("year", "region", "district", "village", "severity")
    val auxDf = rain.toSeq.toDF("village", "rainfall")
    (fact, auxDf)
  }

  /** Vote-like data: geo=[state, county] (30 x 60), one record per county;
    * 2020 share driven by a state effect plus the 2016 share (auxiliary).
    */
  def voteLike(spark: SparkSession, seed: Long = 10): (DataFrame, DataFrame) = {
    import spark.implicits._
    val rng = new Random(seed)
    val counties = for { s <- 0 until 30; c <- 0 until 60 } yield (f"s$s%02d", f"s$s%02d-c$c%02d")
    val stateEff = (0 until 30).map(s => f"s$s%02d" -> rng.nextGaussian() * 0.05).toMap
    // the 2016 -> 2020 swing varies BY STATE (a random slope): the
    // cluster-level structure that favors the multi-level model.
    val stateSlope = (0 until 30).map(s => f"s$s%02d" -> (0.9 + rng.nextGaussian() * 0.3)).toMap
    val p16 = counties.map { case (s, c) => c -> clamp01(0.5 + stateEff(s) + 0.12 * rng.nextGaussian()) }.toMap
    val rows = counties.map { case (s, c) =>
      val p20 = clamp01(0.5 + stateEff(s) * 0.3 + stateSlope(s) * (p16(c) - 0.5) + 0.02 * rng.nextGaussian())
      (s, c, p20)
    }
    (rows.toDF("state", "county", "pct2020"), p16.toSeq.toDF("county", "pct2016"))
  }

  private def clamp01(v: Double): Double = math.max(0.02, math.min(0.98, v))

  // ------------------------------------------------- micro-bench fixtures

  /** Figure 7/15 fixture: `d` single-attribute hierarchies of cardinality
    * `w` each, with `colsPerAttr` pseudo-random feature columns per
    * attribute. X shape: w^d x (colsPerAttr * d).
    */
  def benchMatrix(d: Int, w: Int = 10, colsPerAttr: Int = 3, seed: Long = 11): FactorizedMatrix = {
    val hiers = (0 until d).toVector.map { h =>
      HierRelation(s"H$h", Seq(s"a$h"), (0 until w).map(v => Seq(f"h$h-v$v%03d")))
    }
    val cols = (for { h <- 0 until d; c <- 0 until colsPerAttr } yield {
      val salt = seed + h * 131 + c * 17
      FeatureColumn(s"f$h-$c", h, 0, v => pseudo(v.hashCode.toLong ^ salt))
    }).toVector
    new FactorizedMatrix(hiers, cols)
  }

  /** Figure 15 needs clusters of width w: same as benchMatrix but the last
    * hierarchy has two attributes (parent of cardinality 1 per w leaves),
    * clusters = 10^(d-1) blocks of w rows — matching the paper's setup.
    */
  def pseudo(x: Long): Double = {
    var z = x + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    ((z ^ (z >>> 31)) & 0xffffff).toDouble / 0xffffff.toDouble - 0.5
  }

  /** Figure 8 fixture: a hierarchy chain with `t` levels; level k has
    * `leaves / branch^(t-1-k)` distinct values; the leaf table carries
    * `leafRows` rows (multiplicity spread uniformly).
    */
  def benchChain(spark: SparkSession, t: Int, leaves: Int, leafRows: Int, branch: Int = 10, seed: Long = 12): HierChain = {
    import spark.implicits._
    val attrs = (0 until t).map(k => s"a$k").toVector
    val cards = (0 until t).map(k => math.max(1, leaves / math.pow(branch, (t - 1 - k).toDouble).toInt))
    // edges(k): maps a_{k+1} -> a_k  (child of level k+1 to parent level k)
    val edges = (0 until t - 1).toVector.map { k =>
      val parentCard = cards(k); val childCard = cards(k + 1)
      (0 until childCard).map(c => (f"L${k + 1}%d-${c}%07d", f"L$k%d-${c % parentCard}%07d"))
        .toDF(attrs(k + 1), attrs(k))
    }
    val rng = new Random(seed)
    val leafCard = cards(t - 1)
    val leafDf = (0 until leafRows).map(_ => f"L${t - 1}%d-${rng.nextInt(leafCard)}%07d").toDF(attrs(t - 1))
    HierChain(attrs, leafDf, edges)
  }
}

package repro.synth

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.reptile.GroupStats
import scala.util.Random

/** Synthetic data for the explanation-accuracy study (Section 5.2).
  *
  * One dimension attribute with `nGroups` values; per group the row count
  * is drawn from N(100, 20) and each measure from N(100, 20). Auxiliary
  * tables carry one measure correlated (rho) with a chosen *true* group
  * statistic; the paper induces rank correlation via Iman-Conover — we use
  * the Gaussian mixing construction `rho * z(stat) + sqrt(1-rho^2) * eps`,
  * which induces the same Pearson correlation in expectation (documented
  * substitution in DESIGN.md).
  */
object GroupSynth {

  final case class Dataset(
      rows: Vector[(String, Double)],
      trueStats: Map[String, GroupStats],
      groups: Vector[String],
  )

  def groupName(i: Int): String = f"g$i%03d"

  def generate(nGroups: Int = 100, seed: Long = 0): Dataset = {
    val rng = new Random(seed)
    val groups = (0 until nGroups).toVector.map(groupName)
    val rows = Vector.newBuilder[(String, Double)]
    val stats = Map.newBuilder[String, GroupStats]
    groups.foreach { g =>
      val n = math.max(10, math.round(100 + 20 * rng.nextGaussian()).toInt)
      val vs = Vector.fill(n)(100.0 + 20.0 * rng.nextGaussian())
      vs.foreach(v => rows += ((g, v)))
      stats += g -> GroupStats.ofValues(vs)
    }
    Dataset(rows.result(), stats.result(), groups)
  }

  /** Auxiliary measure correlated `rho` with the given true statistic. */
  def aux(trueVals: Map[String, Double], rho: Double, seed: Long): Map[String, Double] = {
    val rng = new Random(seed)
    val vs = trueVals.values.toSeq
    val mu = vs.sum / vs.size
    val sd = math.max(math.sqrt(vs.map(v => (v - mu) * (v - mu)).sum / vs.size), 1e-9)
    trueVals.map { case (g, v) =>
      val z = (v - mu) / sd
      g -> (rho * z + math.sqrt(math.max(1 - rho * rho, 0.0)) * rng.nextGaussian())
    }
  }

  /** The error classes of Section 5.2.1. */
  sealed trait ErrKind
  object ErrKind {
    /** Delete half of the group's rows. */
    case object Missing extends ErrKind
    /** Duplicate half of the group's rows. */
    case object Dup extends ErrKind
    /** Systematic value drift: all measures +5. */
    case object Inc extends ErrKind
    /** Systematic value drift: all measures -5. */
    case object Dec extends ErrKind
  }

  /** Applies error kinds to one group's rows. */
  def corrupt(rows: Vector[(String, Double)], group: String, kinds: Seq[ErrKind], seed: Long): Vector[(String, Double)] = {
    val rng = new Random(seed)
    var inGroup = rows.filter(_._1 == group)
    val outGroup = rows.filterNot(_._1 == group)
    kinds.foreach {
      case ErrKind.Missing =>
        inGroup = rng.shuffle(inGroup).drop(inGroup.size / 2)
      case ErrKind.Dup =>
        inGroup = inGroup ++ rng.shuffle(inGroup).take(inGroup.size / 2)
      case ErrKind.Inc =>
        inGroup = inGroup.map { case (g, v) => (g, v + 5.0) }
      case ErrKind.Dec =>
        inGroup = inGroup.map { case (g, v) => (g, v - 5.0) }
    }
    outGroup ++ inGroup
  }

  def toDF(spark: SparkSession, rows: Seq[(String, Double)]): DataFrame = {
    import spark.implicits._
    rows.toDF("g", "v")
  }

  def auxDF(spark: SparkSession, m: Map[String, Double]): DataFrame = {
    import spark.implicits._
    m.toSeq.toDF("g", "aux_m")
  }
}

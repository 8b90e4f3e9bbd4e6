package repro.core.reptile

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.fmatrix.FactorizedMatrix
import repro.core.frep.HierRelation
import repro.core.model.{FactorizedBackend, DenseBackend, LinearModel, MLBackend, MultiLevelEM}

/** A hierarchical dimension: attributes ordered least to most specific. */
final case class Dimension(name: String, attrs: Vector[String])

/** Which group statistic a model predicts. */
sealed trait StatKind { def col: String; def name: String }
object StatKind {
  case object CountStat extends StatKind { val col = "stat_count"; val name = "count" }
  case object MeanStat  extends StatKind { val col = "stat_mean";  val name = "mean"  }
  case object SumStat   extends StatKind { val col = "stat_sum";   val name = "sum"   }
}

final case class ReptileConfig(
    emIters: Int = 20,
    multiLevel: Boolean = true,
    /** Model log1p-transformed statistics (variance stabilization for
      * count-like measures with multiplicative structure, e.g. COVID).
      */
    logTransform: Boolean = false,
    /** For SUM complaints: model the SUM statistic directly (appropriate
      * when groups are pre-aggregated, one record per group) instead of
      * separate COUNT and MEAN models.
      */
    sumDirect: Boolean = false,
    ridge: Double = 1e-8,
    /** Random-effect matrix Z (Section 3.3.4): "all" uses Z_i = X_i (the
      * paper's default); "intercept" keeps only the intercept column
      * (random intercepts), the robust choice when clusters are small
      * relative to the feature count.
      */
    randomEffects: String = "all",
    /** Main-effect features need at least this many matrix rows per
      * distinct attribute value (else the feature leaks the target).
      */
    minParallel: Double = 2.0,
)

/** One ranked drill-down group. */
final case class Candidate(
    values: Map[String, String],
    observed: GroupStats,
    repaired: GroupStats,
    predicted: Map[String, Double],
    score: Double,
    /** observed - predicted on the primary modeled statistic. */
    residual: Double,
)

/** Ranking of the groups produced by drilling down one hierarchy. */
final case class DimRankResult(
    dim: String,
    attr: String,
    candidates: Vector[Candidate],
    /** complaint value before any repair, for reference. */
    baselineScore: Double,
) {
  def ranked: Vector[Candidate] = candidates.sortBy(_.score)
  def best: Candidate = ranked.head
}

/** The complaint-based drill-down engine (Problem 1).
  *
  * Data-side work (drill-down group statistics over all parallel groups,
  * main-effect featurization, hierarchy relation extraction) runs as Spark
  * DataFrame aggregation jobs; the multi-level model is then trained on
  * the driver over the factorised representation of the feature matrix.
  */
object Reptile {

  /** Group statistics for a drill-down: one Spark groupBy over the fact
    * table computing the whole distributive set (count / mean / std / sum).
    */
  def drilldownStats(fact: DataFrame, attrs: Seq[String], measure: String): DataFrame =
    fact
      .groupBy(attrs.map(col): _*)
      .agg(
        count(lit(1)).cast("double").as("stat_count"),
        avg(col(measure)).as("stat_mean"),
        coalesce(stddev_samp(col(measure)), lit(0.0)).as("stat_std"),
        sum(col(measure)).cast("double").as("stat_sum"),
      )

  /** Ranks the drill-down groups of one target hierarchy. */
  def rankDim(
      spark: SparkSession,
      fact: DataFrame,
      dims: Vector[Dimension],
      drilled: Map[String, Int],
      filters: Map[String, String],
      complaint: Complaint,
      measure: String,
      targetDim: String,
      aux: Seq[AuxDataset] = Nil,
      cfg: ReptileConfig = ReptileConfig(),
  ): DimRankResult = {
    val target = dims.find(_.name == targetDim)
      .getOrElse(throw new IllegalArgumentException(s"unknown dimension $targetDim"))
    val tDepth = drilled.getOrElse(targetDim, 0) + 1
    require(tDepth <= target.attrs.size, s"dimension $targetDim fully drilled")

    // Hierarchy order: drilled non-target dims first, the drill-down
    // hierarchy last (Section 3.4's attribute-ordering restriction).
    val others = dims.filter(d => d.name != targetDim && drilled.getOrElse(d.name, 0) > 0)
    val used: Vector[(Dimension, Int)] =
      (others.map(d => (d, drilled(d.name))) :+ ((target, tDepth))).toVector
    val hiers = used.map { case (d, dep) => HierRelation.fromDataFrame(fact, d.name, d.attrs.take(dep)) }
    val allAttrs: Vector[String] = used.flatMap { case (d, dep) => d.attrs.take(dep).toVector }

    val statsDf = drilldownStats(fact, allAttrs, measure).cache()

    val kinds: Seq[StatKind] = complaint.agg match {
      case AggType.Count => Seq(StatKind.CountStat)
      case AggType.Mean  => Seq(StatKind.MeanStat)
      case AggType.Std   => Seq(StatKind.MeanStat)
      case AggType.Sum =>
        if (cfg.sumDirect) Seq(StatKind.SumStat) else Seq(StatKind.CountStat, StatKind.MeanStat)
    }

    // Observed group statistics, keyed by the attr-value tuple.
    val observed: Map[Vector[String], GroupStats] = statsDf.collect().map { r =>
      val key = allAttrs.indices.map(i => String.valueOf(r.get(i))).toVector
      val base = allAttrs.size
      key -> GroupStats(r.getDouble(base), r.getDouble(base + 1), r.getDouble(base + 2))
    }.toMap

    // One model per statistic kind, all over the same hierarchies.
    val perKind: Map[StatKind, (FactorizedMatrix, Array[Double])] = kinds.map { kind =>
      val tCol = s"y_${kind.name}"
      val withY =
        if (cfg.logTransform) statsDf.withColumn(tCol, log1p(greatest(col(kind.col), lit(0.0))))
        else statsDf.withColumn(tCol, col(kind.col))
      val fcols = Featurizer.build(withY, hiers, tCol, aux, cfg.minParallel)
      val fm = new FactorizedMatrix(hiers, fcols)
      val y = buildY(fm, hiers, allAttrs, observed, kind, cfg)
      kind -> (fm, predictions(fm, y, cfg))
    }.toMap

    // Candidate groups: siblings under the complaint tuple.
    val fm0 = perKind(kinds.head)._1
    val fixedRows: Vector[Int] = used.dropRight(1).zipWithIndex.map { case ((d, dep), h) =>
      val tuple = d.attrs.take(dep).map(a =>
        filters.getOrElse(a, throw new IllegalArgumentException(s"filter missing for drilled attr $a")))
      hiers(h).rowIndexOf(tuple)
    }
    val parentPrefix = target.attrs.take(tDepth - 1).map(a =>
      filters.getOrElse(a, throw new IllegalArgumentException(s"filter missing for drilled attr $a")))
    val tHier = hiers.last
    val (cStart, cEnd) = tHier.blockOfPrefix(parentPrefix)

    val candidateRows = (cStart until cEnd).toVector
    val candidates = candidateRows.map { r =>
      val idx = fm0.indexOf(fixedRows :+ r)
      val key = (used.dropRight(1).zipWithIndex.flatMap { case ((d, dep), h) => hiers(h).rows(fixedRows(h)) } ++
        tHier.rows(r)).toVector
      val obs = observed.getOrElse(key, GroupStats.empty)
      val preds: Map[String, Double] = kinds.map(k => k.name -> perKind(k)._2(idx)).toMap
      val rep = repair(obs, preds, kinds)
      val values = allAttrs.zip(key).toMap
      (values, obs, rep, preds, idx)
    }

    val obsAll = candidates.map(_._2)
    val baselineScore = complaint.score(GroupStats.combine(obsAll))
    val primary = kinds.head
    val scored = candidates.zipWithIndex.map { case ((values, obs, rep, preds, idx), ci) =>
      val combined = GroupStats.combine(obsAll.updated(ci, rep))
      val residual =
        if (kinds.size == 2) obs.sum - preds("count") * preds("mean") // SUM via count x mean
        else primary match {
          case StatKind.CountStat => obs.count - preds("count")
          case StatKind.MeanStat  => obs.mean - preds("mean")
          case StatKind.SumStat   => obs.sum - preds("sum")
        }
      Candidate(values, obs, rep, preds, complaint.score(combined), residual)
    }
    statsDf.unpersist()
    DimRankResult(targetDim, target.attrs(tDepth - 1), scored, baselineScore)
  }

  /** Ranks every candidate drill-down hierarchy and orders them by how
    * much their best group repair resolves the complaint.
    */
  def recommend(
      spark: SparkSession,
      fact: DataFrame,
      dims: Vector[Dimension],
      drilled: Map[String, Int],
      filters: Map[String, String],
      complaint: Complaint,
      measure: String,
      aux: Seq[AuxDataset] = Nil,
      cfg: ReptileConfig = ReptileConfig(),
  ): Vector[DimRankResult] = {
    val eligible = dims.filter(d => drilled.getOrElse(d.name, 0) < d.attrs.size)
    require(eligible.nonEmpty, "no hierarchy left to drill down")
    eligible
      .map(d => rankDim(spark, fact, dims, drilled, filters, complaint, measure, d.name, aux, cfg))
      .sortBy(_.best.score)
      .toVector
  }

  // ------------------------------------------------------------ internals

  /** y over the full cartesian product of parallel groups (the paper's
    * worst case, Section 5.1.4: even empty groups participate). Empty
    * groups default to 0 for count/sum and to the global mean for mean.
    */
  def buildY(
      fm: FactorizedMatrix,
      hiers: Vector[HierRelation],
      allAttrs: Vector[String],
      observed: Map[Vector[String], GroupStats],
      kind: StatKind,
      cfg: ReptileConfig,
  ): Array[Double] = {
    val stat: GroupStats => Double = kind match {
      case StatKind.CountStat => _.count
      case StatKind.MeanStat  => _.mean
      case StatKind.SumStat   => _.sum
    }
    val xform: Double => Double = if (cfg.logTransform) v => math.log1p(math.max(v, 0.0)) else identity
    val default = kind match {
      case StatKind.MeanStat =>
        if (observed.isEmpty) 0.0
        else xform(observed.values.map(_.mean).sum / observed.size)
      case _ => xform(0.0)
    }
    val y = Array.fill(fm.n)(default)
    // Attribute offsets of each hierarchy inside the flat key.
    val offsets = hiers.scanLeft(0)((acc, h) => acc + h.depth)
    observed.foreach { case (key, gs) =>
      val rowIdxs = hiers.indices.map { h =>
        hiers(h).rowIndexOf(key.slice(offsets(h), offsets(h + 1)))
      }
      y(fm.indexOf(rowIdxs)) = xform(stat(gs))
    }
    y
  }

  /** Random-effect column subset per the config. */
  private def reColsFor(fm: FactorizedMatrix, cfg: ReptileConfig): Option[Array[Int]] =
    cfg.randomEffects match {
      case "all"       => None
      case "intercept" => Some(Array(fm.cols.indexWhere(_.label == "intercept") max 0))
      case other       => throw new IllegalArgumentException(s"unknown randomEffects mode $other")
    }

  private def predictions(fm: FactorizedMatrix, y: Array[Double], cfg: ReptileConfig): Array[Double] = {
    val bk: MLBackend = new FactorizedBackend(fm)
    val raw =
      if (cfg.multiLevel)
        MultiLevelEM.predict(bk, MultiLevelEM.fit(bk, y, cfg.emIters, cfg.ridge, reColsFor(fm, cfg)))
      else LinearModel.predict(bk, LinearModel.fit(bk, y, cfg.ridge))
    if (cfg.logTransform) raw.map(v => math.max(math.expm1(v), 0.0)) else raw
  }

  /** Applies the model's expected statistics to a group (f_repair). */
  def repair(obs: GroupStats, preds: Map[String, Double], kinds: Seq[StatKind]): GroupStats = {
    var g = obs
    kinds.foreach {
      case StatKind.CountStat => g = g.copy(count = math.max(preds("count"), 0.0))
      case StatKind.MeanStat  => g = g.copy(mean = preds("mean"))
      case StatKind.SumStat =>
        val s = preds("sum")
        g = if (g.count > 0) g.copy(mean = s / g.count) else GroupStats(1.0, s, 0.0)
    }
    g
  }

  /** The dense "materialize everything" pipeline used by the Figure 10
    * baseline: identical model, but the feature matrix is materialized and
    * every matrix operation runs over the dense representation.
    */
  def densePredictions(fm: FactorizedMatrix, y: Array[Double], cfg: ReptileConfig): Array[Double] = {
    val bk: MLBackend = new DenseBackend(fm.materialize, fm.clusterRanges)
    val raw =
      if (cfg.multiLevel)
        MultiLevelEM.predict(bk, MultiLevelEM.fit(bk, y, cfg.emIters, cfg.ridge, reColsFor(fm, cfg)))
      else LinearModel.predict(bk, LinearModel.fit(bk, y, cfg.ridge))
    if (cfg.logTransform) raw.map(v => math.max(math.expm1(v), 0.0)) else raw
  }
}

package repro.core.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.reptile.{Candidate, Complaint, DimRankResult, GroupStats}

/** The comparison approaches of Section 5.2 / 5.3.
  *
  * Sensitivity, Support and Outlier re-rank the same candidate set Reptile
  * produced (they are ranking metrics, not different search spaces); Raw is
  * a record-level Spark job that winsorizes each group's raw measures.
  */
object Baselines {

  /** Scorpion-style sensitivity: the group whose *deletion* best resolves
    * the complaint.
    */
  def sensitivity(res: DimRankResult, complaint: Complaint): Candidate = {
    val obs = res.candidates.map(_.observed)
    res.candidates.zipWithIndex.minBy { case (_, i) =>
      val remaining = obs.indices.filter(_ != i).map(obs)
      complaint.score(GroupStats.combine(remaining))
    }._1
  }

  /** Density-based support: the highest-count group. For pre-aggregated
    * inputs (one record per group carrying a count-like measure), density
    * is the measure mass, i.e. the group SUM — set `useSum`.
    */
  def support(res: DimRankResult, useSum: Boolean = false): Candidate =
    res.candidates.maxBy(c => if (useSum) c.observed.sum else c.observed.count)

  /** Outlier: largest deviation from the model's expectation, ignoring the
    * complaint (the Figure 12 ablation).
    */
  def outlier(res: DimRankResult): Candidate =
    res.candidates.maxBy(c => math.abs(c.residual))

  /** Raw (winsorization): clip each record's measure to one within-group
    * standard deviation of its group mean, and recommend the group whose
    * clipped statistics best resolve the complaint.
    */
  def rawWinsor(
      spark: SparkSession,
      fact: DataFrame,
      attrs: Seq[String],
      measure: String,
      complaint: Complaint,
      filters: Map[String, String] = Map.empty,
  ): Map[String, String] = {
    val prov = filters.foldLeft(fact) { case (df, (a, v)) => df.filter(col(a) === lit(v)) }
    val gstats = prov
      .groupBy(attrs.map(col): _*)
      .agg(avg(col(measure)).as("g_mean"), coalesce(stddev_samp(col(measure)), lit(0.0)).as("g_std"))
    val clipped = prov
      .join(gstats, attrs)
      .withColumn("clipped",
        least(greatest(col(measure), col("g_mean") - col("g_std")), col("g_mean") + col("g_std")))
    val repairedStats = clipped
      .groupBy(attrs.map(col): _*)
      .agg(
        count(lit(1)).cast("double").as("r_count"),
        avg(col("clipped")).as("r_mean"),
        coalesce(stddev_samp(col("clipped")), lit(0.0)).as("r_std"),
        avg(col(measure)).as("o_mean"),
        coalesce(stddev_samp(col(measure)), lit(0.0)).as("o_std"),
      )
      .collect()
      .map { r =>
        val key = attrs.indices.map(i => String.valueOf(r.get(i))).toVector
        val base = attrs.size
        val repaired = GroupStats(r.getDouble(base), r.getDouble(base + 1), r.getDouble(base + 2))
        val observed = GroupStats(r.getDouble(base), r.getDouble(base + 3), r.getDouble(base + 4))
        (key, observed, repaired)
      }
      .toVector

    val obsAll = repairedStats.map(_._2)
    val best = repairedStats.zipWithIndex.minBy { case ((_, _, rep), i) =>
      complaint.score(GroupStats.combine(obsAll.updated(i, rep)))
    }._1
    attrs.zip(best._1).toMap
  }
}

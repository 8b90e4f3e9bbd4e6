package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.reptile._
import repro.synth.CovidSynth
import repro.synth.CovidSynth.CovidIssue

/** The COVID-19 case study (Section 5.3, Tables 1 and 2, Figure 13).
  *
  * For each GitHub issue we corrupt the synthetic panel, submit the
  * aggregate complaint one geographic level above the erroneous location
  * on the issue day, and check whether each approach's top recommendation
  * is the ground-truth location. Reptile drills the geography hierarchy
  * (region then country for the global dataset); Sensitivity and Support
  * rank the flat location list, as they do not exploit the hierarchy.
  */
object CovidExp {

  final case class IssueResult(
      issue: CovidIssue,
      reptile: Boolean,
      sensitivity: Boolean,
      support: Boolean,
      reptileMs: Double,
      baselineMs: Double,
  )

  private val cfg = ReptileConfig(emIters = 12, logTransform = true, sumDirect = true, randomEffects = "intercept")

  def runIssue(spark: SparkSession, issue: CovidIssue, seed: Long = 42): IssueResult = {
    if (issue.scope == "us") runUs(spark, issue, seed) else runGlobal(spark, issue, seed)
  }

  private def runUs(spark: SparkSession, issue: CovidIssue, seed: Long): IssueResult = {
    val fact = CovidSynth.corruptedUs(spark, issue, seed).cache()
    fact.count()
    val dims = Vector(Dimension("time", Vector("day")), Dimension("geo", Vector("state")))
    val filters = Map("day" -> CovidSynth.dayKey(issue.day))
    val complaint = Complaint(AggType.Sum, issue.dir)
    val (res, rMs) = Timing.ms {
      Reptile.rankDim(spark, fact, dims, Map("time" -> 1), filters, complaint, "value", "geo", Nil, cfg)
    }
    val top = res.best.values("state")
    val ((sens, supp), bMs) = Timing.ms {
      flatBaselines(fact, "state", filters("day"), issue.dir)
    }
    fact.unpersist()
    IssueResult(issue, top == issue.location, sens == issue.location, supp == issue.location, rMs, bMs)
  }

  private def runGlobal(spark: SparkSession, issue: CovidIssue, seed: Long): IssueResult = {
    val fact = CovidSynth.corruptedGlobal(spark, issue, seed).cache()
    fact.count()
    val dims = Vector(Dimension("time", Vector("day")), Dimension("geo", Vector("region", "country")))
    val day = CovidSynth.dayKey(issue.day)
    val complaint = Complaint(AggType.Sum, issue.dir)
    val (top, rMs) = Timing.ms {
      // Step 1: drill geography to region level.
      val res1 = Reptile.rankDim(spark, fact, dims, Map("time" -> 1),
        Map("day" -> day), complaint, "value", "geo", Nil, cfg)
      val region = res1.best.values("region")
      // Step 2: continue the drill-down into the recommended region.
      val res2 = Reptile.rankDim(spark, fact, dims, Map("time" -> 1, "geo" -> 1),
        Map("day" -> day, "region" -> region), complaint, "value", "geo", Nil, cfg)
      res2.best.values("country")
    }
    val ((sens, supp), bMs) = Timing.ms {
      flatBaselines(fact, "country", day, issue.dir)
    }
    fact.unpersist()
    IssueResult(issue, top == issue.location, sens == issue.location, supp == issue.location, rMs, bMs)
  }

  /** Sensitivity (deletion) and Support (density) over the flat location
    * list on the complaint day, from one Spark aggregation.
    */
  private def flatBaselines(fact: DataFrame, locAttr: String, day: String,
                            dir: Direction): (String, String) = {
    val sums = fact.filter(col("day") === lit(day))
      .groupBy(col(locAttr)).agg(sum(col("value")).as("s"))
      .collect().map(r => String.valueOf(r.get(0)) -> r.getDouble(1)).toVector
    val total = sums.map(_._2).sum
    // Deleting location c leaves total - s_c; pick the best post-deletion score.
    val sens = sums.minBy { case (_, s) => dir.score(total - s) }._1
    val supp = sums.maxBy(_._2)._1
    (sens, supp)
  }

  def runAll(spark: SparkSession, issues: Seq[CovidIssue] = CovidSynth.allIssues, seed: Long = 42): Vector[IssueResult] =
    issues.toVector.map(i => runIssue(spark, i, seed))

  def printResults(results: Seq[IssueResult]): Unit = {
    def mark(b: Boolean) = if (b) "Y" else "."
    def table(scope: String, title: String): Unit = {
      val rs = results.filter(_.issue.scope == scope)
      Timing.printTable(title,
        Seq("ID", "issue", "RP", "ST", "SP", "paperRP", "paperST", "paperSP"),
        rs.map { r =>
          val star = if (r.issue.prevalentStar) "*" else ""
          Seq(r.issue.id, star + r.issue.title, mark(r.reptile), mark(r.sensitivity), mark(r.support),
            mark(r.issue.paperReptile), mark(r.issue.paperSensitivity), mark(r.issue.paperSupport))
        })
      val n = rs.size
      println(f"$scope totals: Reptile ${rs.count(_.reptile)}/$n  Sensitivity ${rs.count(_.sensitivity)}/$n  " +
        f"Support ${rs.count(_.support)}/$n  (paper: ${rs.count(_.issue.paperReptile)}/" +
        f"${rs.count(_.issue.paperSensitivity)}/${rs.count(_.issue.paperSupport)})")
    }
    table("us", "Table 1: COVID-19 issues in the US")
    table("global", "Table 2: global COVID-19 issues")
    val n = results.size
    println(f"\nFigure 13 (accuracy): Reptile ${results.count(_.reptile) * 100.0 / n}%.1f%%  " +
      f"Sensitivity ${results.count(_.sensitivity) * 100.0 / n}%.1f%%  " +
      f"Support ${results.count(_.support) * 100.0 / n}%.1f%%  (paper: 70.0%% / 6.6%% / 3.3%%)")
    println(f"Figure 13 (runtime/complaint): Reptile ${results.map(_.reptileMs).sum / n}%.0f ms  " +
      f"baselines ${results.map(_.baselineMs).sum / n}%.0f ms")
  }
}

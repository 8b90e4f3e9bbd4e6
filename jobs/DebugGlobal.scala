package repro.jobs

import repro.core.reptile._
import repro.synth.CovidSynth

object DebugGlobal {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("debug-global")
    val issue = CovidSynth.allIssues.find(_.id == args.headOption.getOrElse("3567")).get
    val useML = args.lift(1).forall(_ == "ml")
    val fact = CovidSynth.corruptedGlobal(spark, issue).cache()
    val dims = Vector(Dimension("time", Vector("day")), Dimension("geo", Vector("region", "country")))
    val day = CovidSynth.dayKey(issue.day)
    val complaint = Complaint(AggType.Sum, issue.dir)
    val cfg = ReptileConfig(emIters = 12, logTransform = true, sumDirect = true, multiLevel = useML, randomEffects = "intercept")
    val res2 = Reptile.rankDim(spark, fact, dims, Map("time" -> 1, "geo" -> 1),
      Map("day" -> day, "region" -> "Asia"), complaint, "value", "geo", Nil, cfg)
    println(s"== step2 countries in Asia (multiLevel=$useML) ==")
    res2.ranked.foreach(c => println(f"${c.values("country")}%15s obs=${c.observed.sum}%10.1f pred=${c.predicted("sum")}%10.1f score=${c.score}%12.2f"))
    spark.stop()
  }
}

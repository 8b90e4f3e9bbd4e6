package repro.synth

import repro.SparkSpec
import repro.core.reptile.Direction
import repro.synth.CovidSynth.IssueKind

class SynthSpec extends SparkSpec {

  // ------------------------------------------------------------ GroupSynth

  test("GroupSynth generates the configured number of groups with ~100 rows") {
    val ds = GroupSynth.generate(100, seed = 1)
    assert(ds.groups.size == 100)
    assert(ds.trueStats.size == 100)
    val counts = ds.trueStats.values.map(_.count)
    val meanCount = counts.sum / counts.size
    assert(meanCount > 80 && meanCount < 120, s"mean count $meanCount")
    val means = ds.trueStats.values.map(_.mean)
    assert(means.sum / means.size > 90 && means.sum / means.size < 110)
  }

  test("GroupSynth is deterministic in the seed") {
    assert(GroupSynth.generate(50, 7).rows == GroupSynth.generate(50, 7).rows)
    assert(GroupSynth.generate(50, 7).rows != GroupSynth.generate(50, 8).rows)
  }

  test("aux correlation tracks rho") {
    val ds = GroupSynth.generate(200, seed = 2)
    val truth = ds.trueStats.map { case (g, s) => g -> s.mean }
    def corr(rho: Double): Double = {
      val aux = GroupSynth.aux(truth, rho, seed = 3)
      val xs = ds.groups.map(truth); val ys = ds.groups.map(aux)
      val mx = xs.sum / xs.size; val my = ys.sum / ys.size
      val cov = xs.zip(ys).map { case (x, y) => (x - mx) * (y - my) }.sum
      val sx = math.sqrt(xs.map(x => (x - mx) * (x - mx)).sum)
      val sy = math.sqrt(ys.map(y => (y - my) * (y - my)).sum)
      cov / (sx * sy)
    }
    assert(math.abs(corr(1.0) - 1.0) < 1e-9)
    val c06 = corr(0.6)
    assert(c06 > 0.4 && c06 < 0.8, s"corr at rho=0.6 was $c06")
  }

  test("corrupt Missing halves the group; Dup adds half") {
    val ds = GroupSynth.generate(20, seed = 4)
    val g = ds.groups.head
    val before = ds.rows.count(_._1 == g)
    val missing = GroupSynth.corrupt(ds.rows, g, Seq(GroupSynth.ErrKind.Missing), 5)
    assert(missing.count(_._1 == g) == before - before / 2)
    val dup = GroupSynth.corrupt(ds.rows, g, Seq(GroupSynth.ErrKind.Dup), 5)
    assert(dup.count(_._1 == g) == before + before / 2)
    assert(missing.count(_._1 != g) == ds.rows.count(_._1 != g))
  }

  test("corrupt Inc/Dec shift all values by 5") {
    val ds = GroupSynth.generate(20, seed = 6)
    val g = ds.groups.head
    val inc = GroupSynth.corrupt(ds.rows, g, Seq(GroupSynth.ErrKind.Inc), 5)
    val origMean = ds.trueStats(g).mean
    val newMean = inc.filter(_._1 == g).map(_._2).sum / inc.count(_._1 == g)
    assert(math.abs(newMean - origMean - 5.0) < 1e-9)
  }

  // ------------------------------------------------------------ CovidSynth

  test("issue catalog has the paper's table sizes and totals") {
    assert(CovidSynth.usIssues.size == 16)
    assert(CovidSynth.globalIssues.size == 14)
    assert(CovidSynth.usIssues.count(_.paperReptile) == 12)     // Table 1: 12/16
    assert(CovidSynth.globalIssues.count(_.paperReptile) == 9)  // Table 2: 9/14
    assert(CovidSynth.allIssues.count(_.paperReptile) == 21)    // 21/30 overall
    assert(CovidSynth.allIssues.count(_.paperSensitivity) == 2)
    assert(CovidSynth.allIssues.count(_.paperSupport) == 1)
  }

  test("issue locations exist in the location tables") {
    CovidSynth.usIssues.foreach(i => assert(CovidSynth.usStates.exists(_._1 == i.location), i.id))
    CovidSynth.globalIssues.foreach(i => assert(CovidSynth.globalCountries.exists(_._2 == i.location), i.id))
  }

  test("applyIssue only touches the target location") {
    val base = Vector.tabulate(CovidSynth.Days)(d => 100.0 + d)
    val issue = CovidSynth.usIssues.find(_.id == "3572").get
    assert(CovidSynth.applyIssue(base, issue, "California") == base)
    val hit = CovidSynth.applyIssue(base, issue, issue.location)
    assert(hit(issue.day) < base(issue.day) * 0.1)
    assert(hit.zipWithIndex.filter(_._2 != issue.day).forall { case (v, d) => v == base(d) })
  }

  test("prevalent issues scale the whole series") {
    val base = Vector.tabulate(CovidSynth.Days)(d => 100.0 + d)
    val issue = CovidSynth.usIssues.find(_.id == "3476").get
    val hit = CovidSynth.applyIssue(base, issue, issue.location)
    hit.zip(base).foreach { case (h, b) => assert(math.abs(h - b * 0.85) < 1e-9) }
  }

  test("day shift moves the series by one day") {
    val base = Vector.tabulate(CovidSynth.Days)(d => 100.0 + d * 3)
    val issue = CovidSynth.usIssues.find(_.id == "3441").get
    val hit = CovidSynth.applyIssue(base, issue, issue.location)
    assert(hit(1) == base(0) && hit(CovidSynth.Days - 1) == base(CovidSynth.Days - 2))
  }

  test("corruptedUs produces a dense state x day panel") {
    val issue = CovidSynth.usIssues.head
    val df = CovidSynth.corruptedUs(spark, issue)
    assert(df.count() == CovidSynth.usStates.size.toLong * CovidSynth.Days)
    assert(df.select("state").distinct().count() == CovidSynth.usStates.size)
  }

  test("corruptedGlobal respects the region -> country hierarchy") {
    val issue = CovidSynth.globalIssues.head
    val df = CovidSynth.corruptedGlobal(spark, issue)
    assert(df.count() == CovidSynth.globalCountries.size.toLong * CovidSynth.Days)
    val pairs = df.select("region", "country").distinct().count()
    assert(pairs == CovidSynth.globalCountries.size) // each country in exactly one region
  }

  test("issue directions are consistent with their kinds") {
    CovidSynth.allIssues.foreach { i =>
      i.kind match {
        case IssueKind.MissingDay(_) | IssueKind.Nullify => assert(i.dir == Direction.TooLow, i.id)
        case IssueKind.Spike(f) => assert(f > 1 && i.dir == Direction.TooHigh, i.id)
        case IssueKind.Prevalent(f) => assert(f < 1 && i.dir == Direction.TooLow, i.id)
        case _ => // subtle / shift: direction chosen per the report
      }
    }
  }

  // ---------------------------------------------------------- DatasetSynth

  test("absenteeLike has the published shape") {
    val df = DatasetSynth.absenteeLike(spark, rows = 5000)
    assert(df.count() == 5000)
    assert(df.select("county").distinct().count() <= 100)
    assert(df.select("party").distinct().count() <= 6)
  }

  test("compasLike day determines month determines year") {
    val df = DatasetSynth.compasLike(spark, rows = 5000)
    import org.apache.spark.sql.functions._
    val viol = df.groupBy("day").agg(countDistinct("month").as("m"), countDistinct("year").as("y"))
      .filter(col("m") > 1 || col("y") > 1).count()
    assert(viol == 0)
  }

  test("fistLike severity stays in [1, 10] and joins its aux") {
    val (fact, aux) = DatasetSynth.fistLike(spark)
    import org.apache.spark.sql.functions._
    val mm = fact.agg(min("severity"), max("severity")).collect()(0)
    assert(mm.getDouble(0) >= 1.0 && mm.getDouble(1) <= 10.0)
    assert(aux.count() == 160)
    assert(fact.join(aux, "village").count() == fact.count()) // every village has rainfall
  }

  test("voteLike county determines state") {
    val (fact, aux) = DatasetSynth.voteLike(spark)
    import org.apache.spark.sql.functions._
    assert(fact.groupBy("county").agg(countDistinct("state").as("s")).filter(col("s") > 1).count() == 0)
    assert(aux.count() == fact.count())
  }

  test("benchMatrix has shape w^d x 3d") {
    val fm = DatasetSynth.benchMatrix(3)
    assert(fm.n == 1000 && fm.m == 9)
    assert(fm.numClusters == 100)
  }

  test("benchChain edges form a function child -> parent") {
    val chain = DatasetSynth.benchChain(spark, t = 3, leaves = 100, leafRows = 500)
    import org.apache.spark.sql.functions._
    chain.edges.foreach { e =>
      val child = e.columns.head
      assert(e.groupBy(child).count().filter(col("count") > 1).count() == 0)
    }
  }

  test("pseudo is deterministic and bounded") {
    assert(DatasetSynth.pseudo(42L) == DatasetSynth.pseudo(42L))
    (0 until 100).foreach { i =>
      val v = DatasetSynth.pseudo(i.toLong)
      assert(v >= -0.5 && v <= 0.5)
    }
  }
}

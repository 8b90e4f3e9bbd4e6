package repro.bench

import repro.SparkSpec
import repro.exp.CovidExp
import repro.synth.CovidSynth

/** Tables 1 and 2 + Figure 13: the full 30-issue COVID-19 case study.
  *
  * Paper:  Reptile 21/30 (70%), Sensitivity 2/30 (6.6%), Support 1/30 (3.3%).
  */
class CovidBench extends SparkSpec {

  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.shuffle.partitions", "8")
  }

  test("Tables 1 and 2: COVID-19 issue detection") {
    val results = CovidExp.runAll(spark)
    CovidExp.printResults(results)

    val rp = results.count(_.reptile)
    val st = results.count(_.sensitivity)
    val sp = results.count(_.support)
    assert(rp >= 18, s"Reptile detected $rp/30; paper reports 21/30")
    assert(st <= 5, s"Sensitivity detected $st/30; paper reports 2/30")
    assert(sp <= 3, s"Support detected $sp/30; paper reports 1/30")
    assert(rp > st && rp > sp, "Reptile should dominate both baselines")

    // prevalent errors are missed by design (paper's error analysis)
    results.filter(_.issue.prevalentStar).foreach(r =>
      assert(!r.reptile, s"prevalent issue ${r.issue.id} should not be detected"))

    // per-issue agreement with the paper's checkmarks
    val agree = results.count(r => r.reptile == r.issue.paperReptile)
    println(f"\nper-issue agreement with paper (Reptile column): $agree/30")
    assert(agree >= 24, s"per-issue agreement $agree/30 too low")
  }
}

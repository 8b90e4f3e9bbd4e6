package repro.bench

import repro.SparkSpec
import repro.exp.AccuracyExp

/** Figure 11: explanation accuracy vs Raw / Sensitivity / Support on
  * synthetic single-hierarchy data, varying the auxiliary correlation.
  *
  * Paper shape: Reptile is consistently most accurate (70-100%) and
  * improves with rho; Sensitivity/Support are flat (high only under
  * Duplication); Raw fails on missing/duplicate errors.
  */
class AccuracyBench extends SparkSpec {

  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.shuffle.partitions", "8")
  }

  private val trials = sys.env.getOrElse("REPRO_TRIALS", "15").toInt

  test("Figure 11: accuracy comparison across error types and rho") {
    val rows = AccuracyExp.runFig11(spark, trials, rhos = Seq(0.6, 0.8, 1.0))
    AccuracyExp.printRows("Figure 11: accuracy comparison (paper: Reptile 70-100%, baselines 0-<60%)", rows)

    def acc(approach: String, rho: Double): Double = {
      val rs = rows.filter(r => r.approach == approach && r.rho == rho)
      rs.map(_.accuracy).sum / rs.size
    }
    assert(acc("Reptile", 1.0) >= 0.8, s"Reptile at rho=1: ${acc("Reptile", 1.0)}")
    assert(acc("Reptile", 0.6) >= 0.5, s"Reptile at rho=0.6: ${acc("Reptile", 0.6)}")
    assert(acc("Reptile", 1.0) >= acc("Reptile", 0.6) - 0.05, "accuracy should improve with rho")
    // baselines cannot use the auxiliary data: flat and lower on average
    Seq("Raw", "Sensitivity", "Support").foreach { b =>
      assert(acc("Reptile", 1.0) > acc(b, 1.0), s"$b should lose at rho=1")
    }
    // Support only performs well under duplication (count too high)
    val supDup = rows.filter(r => r.approach == "Support" && r.condition.startsWith("Dup(")).map(_.accuracy).max
    val supMiss = rows.filter(r => r.approach == "Support" && r.condition.startsWith("Missing(")).map(_.accuracy).max
    assert(supDup > supMiss, "Support is density-based: strong on Dup, useless on Missing")
  }

  test("Figure 12: complaint ablation vs Outlier") {
    val rows = AccuracyExp.runFig12(spark, trials, rhos = Seq(0.6, 0.8, 1.0))
    AccuracyExp.printRows("Figure 12: complaint ablation (paper: Outlier capped near 66%)", rows)

    def acc(approach: String): Double = {
      val rs = rows.filter(r => r.approach == approach && r.rho == 1.0)
      rs.map(_.accuracy).sum / rs.size
    }
    assert(acc("Reptile") >= 0.75, s"Reptile: ${acc("Reptile")}")
    assert(acc("Reptile") > acc("Outlier"),
      s"complaint direction should beat direction-blind outliers (${acc("Reptile")} vs ${acc("Outlier")})")
  }
}

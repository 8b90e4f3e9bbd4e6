package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.baselines.Baselines
import repro.core.reptile._
import repro.synth.GroupSynth
import repro.synth.GroupSynth.ErrKind
import scala.util.Random

/** Explanation accuracy on synthetic data: Figure 11 (vs Raw, Sensitivity,
  * Support) and Figure 12 (complaint ablation vs Outlier).
  */
object AccuracyExp {

  /** One Figure 11 error condition: the error kinds injected into a single
    * group, and the complaint submitted about the aggregate.
    */
  final case class Condition(name: String, kinds: Seq[ErrKind], complaint: Complaint)

  import Direction.{TooHigh, TooLow}
  val fig11Conditions: Vector[Condition] = Vector(
    Condition("Missing(COUNT)", Seq(ErrKind.Missing), Complaint(AggType.Count, TooLow)),
    Condition("Dup(COUNT)", Seq(ErrKind.Dup), Complaint(AggType.Count, TooHigh)),
    Condition("Increase(MEAN)", Seq(ErrKind.Inc), Complaint(AggType.Mean, TooHigh)),
    Condition("Decrease(MEAN)", Seq(ErrKind.Dec), Complaint(AggType.Mean, TooLow)),
    Condition("Missing+Dec(SUM)", Seq(ErrKind.Missing, ErrKind.Dec), Complaint(AggType.Sum, TooLow)),
    Condition("Dup+Inc(SUM)", Seq(ErrKind.Dup, ErrKind.Inc), Complaint(AggType.Sum, TooHigh)),
  )

  final case class AccRow(condition: String, rho: Double, approach: String, accuracy: Double, trials: Int)

  private val dims = Vector(Dimension("dim", Vector("g")))
  private val cfg = ReptileConfig(emIters = 8)

  /** Auxiliary tables correlated with the TRUE group statistics, one per
    * statistic used by the complaint (Section 5.2.1).
    */
  private def auxFor(spark: SparkSession, ds: GroupSynth.Dataset, complaint: Complaint,
                     rho: Double, seed: Long): Seq[AuxDataset] = {
    def mk(name: String, vals: Map[String, Double], s: Long) =
      AuxDataset(name, GroupSynth.auxDF(spark, GroupSynth.aux(vals, rho, s)), "g", "aux_m")
    complaint.agg match {
      case AggType.Count => Seq(mk("auxCount", ds.trueStats.map { case (g, s) => g -> s.count }, seed))
      case AggType.Mean  => Seq(mk("auxMean", ds.trueStats.map { case (g, s) => g -> s.mean }, seed + 1))
      case AggType.Sum =>
        Seq(mk("auxCount", ds.trueStats.map { case (g, s) => g -> s.count }, seed),
          mk("auxMean", ds.trueStats.map { case (g, s) => g -> s.mean }, seed + 1))
      case AggType.Std => Seq(mk("auxStd", ds.trueStats.map { case (g, s) => g -> s.std }, seed + 2))
    }
  }

  /** Figure 11: accuracy of the top recommended group per approach. */
  def runFig11(spark: SparkSession, trials: Int, rhos: Seq[Double],
               nGroups: Int = 100, seed: Long = 1000): Vector[AccRow] = {
    val approaches = Seq("Reptile", "Raw", "Sensitivity", "Support")
    val rows = for {
      cond <- fig11Conditions
      rho <- rhos.toVector
    } yield {
      val hits = scala.collection.mutable.Map(approaches.map(_ -> 0): _*)
      for (t <- 0 until trials) {
        val tSeed = seed + t * 37
        val ds = GroupSynth.generate(nGroups, tSeed)
        val rng = new Random(tSeed ^ 0x5ca1ab1e)
        val errGroup = ds.groups(rng.nextInt(nGroups))
        val fact = GroupSynth.toDF(spark, GroupSynth.corrupt(ds.rows, errGroup, cond.kinds, tSeed + 7))
        val aux = auxFor(spark, ds, cond.complaint, rho, tSeed + 13)
        val res = Reptile.rankDim(spark, fact, dims, Map.empty, Map.empty,
          cond.complaint, "v", "dim", aux, cfg)
        def hit(name: String, g: String): Unit = if (g == errGroup) hits(name) += 1
        hit("Reptile", res.best.values("g"))
        hit("Sensitivity", Baselines.sensitivity(res, cond.complaint).values("g"))
        hit("Support", Baselines.support(res).values("g"))
        hit("Raw", Baselines.rawWinsor(spark, fact, Seq("g"), "v", cond.complaint)("g"))
      }
      approaches.map(a => AccRow(cond.name, rho, a, hits(a).toDouble / trials, trials))
    }
    rows.flatten
  }

  /** Figure 12 conditions: two groups whose error matches the complaint
    * direction (true errors) and one whose error does not (false positive).
    */
  final case class AblCondition(name: String, trueKinds: Seq[ErrKind], fpKinds: Seq[ErrKind], complaint: Complaint)

  val fig12Conditions: Vector[AblCondition] = Vector(
    AblCondition("Missing+Duplication(COUNT)", Seq(ErrKind.Missing), Seq(ErrKind.Dup), Complaint(AggType.Count, TooLow)),
    AblCondition("Dec+Inc(MEAN)", Seq(ErrKind.Dec), Seq(ErrKind.Inc), Complaint(AggType.Mean, TooLow)),
    AblCondition("All(SUM)", Seq(ErrKind.Missing, ErrKind.Dec), Seq(ErrKind.Dup, ErrKind.Inc), Complaint(AggType.Sum, TooLow)),
  )

  def runFig12(spark: SparkSession, trials: Int, rhos: Seq[Double],
               nGroups: Int = 100, seed: Long = 2000): Vector[AccRow] = {
    val approaches = Seq("Reptile", "Outlier")
    val rows = for {
      cond <- fig12Conditions
      rho <- rhos.toVector
    } yield {
      val hits = scala.collection.mutable.Map(approaches.map(_ -> 0): _*)
      for (t <- 0 until trials) {
        val tSeed = seed + t * 41
        val ds = GroupSynth.generate(nGroups, tSeed)
        val rng = new Random(tSeed ^ 0xfeed)
        val picked = rng.shuffle(ds.groups).take(3)
        val trueGroups = picked.take(2).toSet
        val fpGroup = picked(2)
        var rowsC = ds.rows
        trueGroups.foreach(g => rowsC = GroupSynth.corrupt(rowsC, g, cond.trueKinds, tSeed + g.hashCode))
        rowsC = GroupSynth.corrupt(rowsC, fpGroup, cond.fpKinds, tSeed + 91)
        val fact = GroupSynth.toDF(spark, rowsC)
        val aux = auxFor(spark, ds, cond.complaint, rho, tSeed + 17)
        val res = Reptile.rankDim(spark, fact, dims, Map.empty, Map.empty,
          cond.complaint, "v", "dim", aux, cfg)
        if (trueGroups.contains(res.best.values("g"))) hits("Reptile") += 1
        if (trueGroups.contains(Baselines.outlier(res).values("g"))) hits("Outlier") += 1
      }
      approaches.map(a => AccRow(cond.name, rho, a, hits(a).toDouble / trials, trials))
    }
    rows.flatten
  }

  def printRows(title: String, rows: Seq[AccRow]): Unit =
    Timing.printTable(title,
      Seq("condition", "rho", "approach", "accuracy", "trials"),
      rows.map(r => Seq(r.condition, Timing.f2(r.rho), r.approach, Timing.pct(r.accuracy), r.trials.toString)))
}

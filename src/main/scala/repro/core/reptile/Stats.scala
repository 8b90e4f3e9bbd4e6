package repro.core.reptile

/** Distributive aggregate statistics of a group of raw records.
  *
  * (count, mean, std) is the paper's distributive *set* of functions
  * (Appendix A): any of COUNT / MEAN / SUM / STD of a union of groups can
  * be recombined from the per-group triples via the combinator `G` below,
  * without touching raw records — which is exactly what lets Reptile score
  * a candidate repair by swapping one group's statistics.
  */
final case class GroupStats(count: Double, mean: Double, std: Double) {
  def sum: Double = count * mean
}

object GroupStats {
  val empty: GroupStats = GroupStats(0.0, 0.0, 0.0)

  /** The combinator G of Appendix A over a partition's statistics. */
  def combine(gs: Iterable[GroupStats]): GroupStats = {
    val nz = gs.filter(_.count > 0)
    val totalCount = nz.map(_.count).sum
    if (totalCount <= 0) return empty
    val totalMean = nz.map(g => g.count * g.mean).sum / totalCount
    val std =
      if (totalCount <= 1) 0.0
      else {
        val within = nz.map(g => math.max(g.count - 1, 0.0) * g.std * g.std).sum
        val between = nz.map(g => g.count * (totalMean - g.mean) * (totalMean - g.mean)).sum
        math.sqrt(math.max(within + between, 0.0) / (totalCount - 1))
      }
    GroupStats(totalCount, totalMean, std)
  }

  /** Direct computation from raw values (test oracle for `combine`). */
  def ofValues(vs: Iterable[Double]): GroupStats = {
    val n = vs.size
    if (n == 0) empty
    else {
      val mean = vs.sum / n
      val std = if (n <= 1) 0.0 else math.sqrt(vs.map(v => (v - mean) * (v - mean)).sum / (n - 1))
      GroupStats(n.toDouble, mean, std)
    }
  }
}

/** The aggregate the user complains about. */
sealed trait AggType { def of(g: GroupStats): Double; def name: String }
object AggType {
  case object Count extends AggType { def of(g: GroupStats): Double = g.count; val name = "count" }
  case object Mean  extends AggType { def of(g: GroupStats): Double = g.mean;  val name = "mean"  }
  case object Sum   extends AggType { def of(g: GroupStats): Double = g.sum;   val name = "sum"   }
  case object Std   extends AggType { def of(g: GroupStats): Double = g.std;   val name = "std"   }
}

/** Complaint direction; `score` is the paper's f_comp, to be minimized. */
sealed trait Direction { def score(v: Double): Double }
object Direction {
  /** "the aggregate is too high" — lower repaired values are better. */
  case object TooHigh extends Direction { def score(v: Double): Double = v }
  /** "the aggregate is too low" — higher repaired values are better. */
  case object TooLow extends Direction { def score(v: Double): Double = -v }
  /** "the aggregate should have been `target`". */
  final case class ShouldBe(target: Double) extends Direction {
    def score(v: Double): Double = math.abs(v - target)
  }
}

/** A user complaint over the current view's aggregate (Problem 1). */
final case class Complaint(agg: AggType, dir: Direction) {
  def score(g: GroupStats): Double = dir.score(agg.of(g))
}

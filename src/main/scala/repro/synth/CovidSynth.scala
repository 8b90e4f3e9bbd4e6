package repro.synth

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.reptile.Direction
import scala.util.Random

/** Synthetic stand-in for the JHU CSSE COVID-19 datasets (Section 5.3).
  *
  * The real corrupted snapshots are not redistributable, so we generate a
  * state x day (US) and region -> country x day (global) panel with the
  * same structure — multiplicative level x trend x noise — and re-inject
  * the 30 GitHub issues of Tables 1 and 2, typed by their root cause
  * (missing report, backlog spike, over-report, prevalent missing source,
  * day shift, subtle typo). Magnitude classes follow the issue reports:
  * sharp single-day errors are large relative to daily noise; "prevalent"
  * errors spread over the whole period; "subtle" ones sit below the noise
  * floor. Location weights are compressed (max/min ~ 8) so detectability
  * reflects error magnitude rather than population extremes.
  */
object CovidSynth {

  val Days = 56
  val NoiseSigma = 0.02

  def dayKey(d: Int): String = f"d$d%02d"

  /** Issue kinds; the multiplicative factor applies to the issue day
    * (or to all days for Prevalent / DayShift).
    */
  sealed trait IssueKind
  object IssueKind {
    final case class MissingDay(frac: Double) extends IssueKind
    final case class Spike(factor: Double) extends IssueKind
    final case class Prevalent(factor: Double) extends IssueKind
    case object DayShift extends IssueKind
    case object Nullify extends IssueKind
    final case class Subtle(factor: Double) extends IssueKind
  }
  import IssueKind._

  /** One GitHub issue: paper* columns are the checkmarks of Tables 1/2. */
  final case class CovidIssue(
      id: String,
      title: String,
      scope: String, // "us" | "global"
      location: String,
      measure: String, // confirmed | deaths | recovered
      day: Int,
      kind: IssueKind,
      dir: Direction,
      prevalentStar: Boolean,
      paperReptile: Boolean,
      paperSensitivity: Boolean,
      paperSupport: Boolean,
  )

  import Direction.{TooHigh, TooLow}

  /** Table 1 — US issues. */
  val usIssues: Vector[CovidIssue] = Vector(
    CovidIssue("3572", "Texas confirmed missing reports", "us", "Texas", "confirmed", 50, MissingDay(0.03), TooLow, false, true, false, false),
    CovidIssue("3521", "Arizona death methodology altered", "us", "Arizona", "deaths", 35, Spike(2.5), TooHigh, false, true, false, false),
    CovidIssue("3482", "Washington missing reports", "us", "Washington", "confirmed", 17, MissingDay(0.03), TooLow, false, true, false, false),
    CovidIssue("3476", "Utah missing source", "us", "Utah", "confirmed", 40, Prevalent(0.85), TooLow, true, false, false, false),
    CovidIssue("3468", "New York death missing reports", "us", "New York", "deaths", 30, MissingDay(0.03), TooLow, false, true, false, false),
    CovidIssue("3466", "Montana missing reports", "us", "Montana", "confirmed", 12, MissingDay(0.03), TooLow, false, true, false, false),
    CovidIssue("3456", "North Dakota confirmed backlog", "us", "North Dakota", "confirmed", 8, Spike(3.0), TooHigh, false, true, false, false),
    CovidIssue("3451", "Iowa death missing reports", "us", "Iowa", "deaths", 22, MissingDay(0.03), TooLow, false, true, false, false),
    CovidIssue("3449", "Arizona test over reported", "us", "Arizona", "confirmed", 40, Spike(2.2), TooHigh, false, true, false, false),
    CovidIssue("3448", "Washington death wrongly reported", "us", "Washington", "deaths", 18, Spike(2.5), TooHigh, false, true, false, false),
    CovidIssue("3441", "Albany confirmed day shift", "us", "New York", "confirmed", 31, DayShift, TooLow, true, false, false, false),
    CovidIssue("3438", "Ohio confirmed backlog", "us", "Ohio", "confirmed", 25, Spike(2.4), TooHigh, false, true, false, false),
    CovidIssue("3424", "Massachusetts confirmed backlog", "us", "Massachusetts", "confirmed", 17, Subtle(1.03), TooHigh, false, false, false, false),
    CovidIssue("3416", "Nevada death over reported", "us", "Nevada", "deaths", 44, Spike(2.5), TooHigh, false, true, false, false),
    CovidIssue("3414", "Eureka death over reported", "us", "Wyoming", "deaths", 28, Spike(3.0), TooHigh, false, true, false, false),
    CovidIssue("3402", "Washington confirmed typo", "us", "Washington", "confirmed", 46, Subtle(1.013), TooHigh, false, false, false, false),
  )

  /** Table 2 — global issues. Canadian-province issues (Quebec, Alberta)
    * are mapped to Canada: our global hierarchy stops at country level
    * (documented substitution).
    */
  val globalIssues: Vector[CovidIssue] = Vector(
    CovidIssue("3623", "Germany recovered over reported", "global", "Germany", "recovered", 20, Spike(2.4), TooHigh, false, true, false, false),
    CovidIssue("3618", "Quebec death missing source", "global", "Canada", "deaths", 30, Prevalent(0.88), TooLow, true, false, false, false),
    CovidIssue("3578", "US recovery nullified", "global", "US", "recovered", 33, Nullify, TooLow, false, true, true, false),
    CovidIssue("3567", "India confirmed missing reports", "global", "India", "confirmed", 15, MissingDay(0.03), TooLow, false, true, false, false),
    CovidIssue("3546", "Thailand confirmed missing source", "global", "Thailand", "confirmed", 25, Prevalent(0.8), TooLow, true, false, false, false),
    CovidIssue("3538a", "Mexico confirmed definition altered", "global", "Mexico", "confirmed", 10, Spike(2.3), TooHigh, false, true, false, false),
    CovidIssue("3538b", "Mexico confirmed missing reports", "global", "Mexico", "confirmed", 41, MissingDay(0.03), TooLow, false, true, false, false),
    CovidIssue("3518", "Sweden death missing source", "global", "Sweden", "deaths", 35, Prevalent(0.85), TooLow, true, false, false, false),
    CovidIssue("3498", "Alberta missing source", "global", "Canada", "confirmed", 20, Prevalent(0.9), TooLow, true, false, false, false),
    CovidIssue("3494", "UK death missing reports", "global", "United Kingdom", "deaths", 27, MissingDay(0.03), TooLow, false, true, false, false),
    CovidIssue("3471", "Turkey confirmed definition altered", "global", "Turkey", "confirmed", 30, Spike(4.0), TooHigh, false, true, true, true),
    CovidIssue("3423", "Afghanistan confirmed wrongly reported", "global", "Afghanistan", "confirmed", 3, Subtle(0.99), TooLow, false, false, false, false),
    CovidIssue("3413", "France missing reports", "global", "France", "confirmed", 36, MissingDay(0.03), TooLow, false, true, false, false),
    CovidIssue("3408", "Kazakhstan confirmed over reported", "global", "Kazakhstan", "confirmed", 21, Spike(2.5), TooHigh, false, true, false, false),
  )

  val allIssues: Vector[CovidIssue] = usIssues ++ globalIssues

  /** Synthetic US state weights (population-like, compressed range). */
  val usStates: Vector[(String, Double)] = Vector(
    "California" -> 8.0, "Texas" -> 6.5, "Florida" -> 5.0, "New York" -> 4.5,
    "Pennsylvania" -> 3.2, "Illinois" -> 3.2, "Ohio" -> 3.0, "Georgia" -> 2.7,
    "North Carolina" -> 2.6, "Michigan" -> 2.5, "New Jersey" -> 2.3, "Virginia" -> 2.2,
    "Washington" -> 2.0, "Arizona" -> 2.0, "Massachusetts" -> 1.8, "Tennessee" -> 1.8,
    "Indiana" -> 1.7, "Missouri" -> 1.6, "Maryland" -> 1.5, "Wisconsin" -> 1.5,
    "Colorado" -> 1.5, "Minnesota" -> 1.4, "Alabama" -> 1.3, "Louisiana" -> 1.2,
    "Kentucky" -> 1.2, "Oregon" -> 1.1, "Utah" -> 1.1, "Iowa" -> 1.1,
    "Nevada" -> 1.1, "Kansas" -> 1.0, "New Mexico" -> 1.0, "Nebraska" -> 1.0,
    "Idaho" -> 1.0, "Montana" -> 1.0, "North Dakota" -> 1.0, "Wyoming" -> 1.0,
    // near-zero reporters, as in the real JHU data (territories, cruise ships)
    "American Samoa" -> 0.01, "Northern Mariana Islands" -> 0.01,
    "Diamond Princess" -> 0.005, "Grand Princess" -> 0.005,
  )

  /** Global (region, country, weight) — regions cluster countries, per the
    * case study's setup (Appendix L).
    */
  val globalCountries: Vector[(String, String, Double)] = Vector(
    ("Americas", "US", 8.0), ("Americas", "Brazil", 4.5), ("Americas", "Mexico", 2.2),
    ("Americas", "Canada", 1.8), ("Americas", "Argentina", 1.6), ("Americas", "Colombia", 1.5),
    ("Europe", "United Kingdom", 3.0), ("Europe", "France", 3.0), ("Europe", "Germany", 2.6),
    ("Europe", "Italy", 2.5), ("Europe", "Spain", 2.4), ("Europe", "Sweden", 1.2),
    ("Europe", "Turkey", 2.5), ("Europe", "Poland", 1.8), ("Europe", "Netherlands", 1.4),
    ("Asia", "India", 6.0), ("Asia", "Indonesia", 1.8), ("Asia", "Iran", 1.7),
    ("Asia", "Japan", 1.4), ("Asia", "Thailand", 1.1), ("Asia", "Kazakhstan", 1.2),
    ("Asia", "Afghanistan", 1.0), ("Asia", "Philippines", 1.3), ("Asia", "Pakistan", 1.5),
    ("Africa", "South Africa", 1.8), ("Africa", "Egypt", 1.2), ("Africa", "Morocco", 1.2),
    ("Africa", "Nigeria", 1.1), ("Africa", "Ethiopia", 1.0), ("Africa", "Kenya", 1.0),
    // near-zero reporters, as in the real JHU data
    ("Others", "Holy See", 0.005), ("Others", "Micronesia", 0.005), ("Others", "Palau", 0.008),
  )

  private def measureScale(measure: String): Double = measure match {
    case "confirmed" => 100.0
    case "deaths"    => 2.0
    case "recovered" => 60.0
    case other       => throw new IllegalArgumentException(s"unknown measure $other")
  }

  /** National/global daily trend: smooth wave + mild drift. */
  private def curve(d: Int): Double = 1.0 + 0.4 * math.sin(2 * math.Pi * d / 40.0) + 0.01 * d

  /** Clean value for one (location, measure, day). Deterministic in seed. */
  private def baseValue(weight: Double, measure: String, d: Int, rng: Random): Double =
    weight * measureScale(measure) * curve(d) * math.exp(NoiseSigma * rng.nextGaussian())

  /** Generates a clean series per location, then applies the issue. Rows:
    * (day, [region], location, value).
    */
  def corruptedUs(spark: SparkSession, issue: CovidIssue, seed: Long = 42): DataFrame = {
    require(issue.scope == "us")
    import spark.implicits._
    val rows = usStates.flatMap { case (state, w) =>
      val series = cleanSeries(w, issue.measure, seed ^ state.hashCode.toLong)
      applyIssue(series, issue, state).zipWithIndex.map { case (v, d) => (dayKey(d), state, v) }
    }
    rows.toDF("day", "state", "value")
  }

  def corruptedGlobal(spark: SparkSession, issue: CovidIssue, seed: Long = 42): DataFrame = {
    require(issue.scope == "global")
    import spark.implicits._
    val rows = globalCountries.flatMap { case (region, country, w) =>
      val series = cleanSeries(w, issue.measure, seed ^ country.hashCode.toLong)
      applyIssue(series, issue, country).zipWithIndex.map { case (v, d) => (dayKey(d), region, country, v) }
    }
    rows.toDF("day", "region", "country", "value")
  }

  private def cleanSeries(weight: Double, measure: String, seed: Long): Vector[Double] = {
    val rng = new Random(seed)
    (0 until Days).toVector.map(d => baseValue(weight, measure, d, rng))
  }

  private[synth] def applyIssue(series: Vector[Double], issue: CovidIssue, location: String): Vector[Double] = {
    if (location != issue.location) series
    else issue.kind match {
      case MissingDay(frac) => series.updated(issue.day, series(issue.day) * frac)
      case Spike(factor)    => series.updated(issue.day, series(issue.day) * factor)
      case Subtle(factor)   => series.updated(issue.day, series(issue.day) * factor)
      case Nullify          => series.updated(issue.day, 0.0)
      case Prevalent(f)     => series.map(_ * f)
      case DayShift         => series.head +: series.dropRight(1)
    }
  }
}

package repro.core.frep

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel

/** A hierarchy stored in the normalized chain form the Factorizer uses
  * (Appendix C): `leaves(a_t)` enumerates the most specific values, and
  * `edges(k)` maps each `a_{k+1}` child value to its `a_k` parent.
  * Attribute names are `attrs(0) .. attrs(t-1)`, least to most specific.
  */
final case class HierChain(attrs: Vector[String], leaves: DataFrame, edges: Vector[DataFrame])

/** The decomposed aggregates COUNT / COF / TOTAL as Spark aggregation-join
  * jobs (Section 4.2.1 / 4.3).
  *
  * `serial` computes every aggregate independently — each one re-joins the
  * chain from the leaves up to its least specific attribute and then
  * aggregates (LMFAO-style one-query-at-a-time execution).
  *
  * `shared` is the multi-query optimized plan of Algorithm 10: aggregates
  * are computed in topological order, each reusing the previous one with
  * early marginalization, so each join input is an already-aggregated
  * (hence smaller) relation and no join is executed twice.
  */
object SparkAggregates {

  /** Result key: COUNT_i is ("count", i, i); COF_{i,j} is ("cof", i, j). */
  type AggKey = (String, Int, Int)

  def serial(h: HierChain): Map[AggKey, DataFrame] = {
    val t = h.attrs.size
    val out = Map.newBuilder[AggKey, DataFrame]
    // COUNT_{a_k}: join leaves up to level k, group by a_k.
    for (k <- (t - 1) to 0 by -1) {
      val joined = joinUpTo(h, k)
      out += (("count", k, k) -> joined.groupBy(col(h.attrs(k))).agg(sum("cnt").as("cnt")))
    }
    // COF_{a_i, a_j} for i more specific than j: join down to level j.
    for (i <- 1 until t; j <- 0 until i) {
      val joined = joinUpTo(h, j)
      out += (("cof", i, j) ->
        joined.groupBy(col(h.attrs(i)), col(h.attrs(j))).agg(sum("cnt").as("cnt")))
    }
    out.result()
  }

  /** Joins the chain from leaves (level t-1) up to `level`, preserving all
    * attributes in between; `cnt` carries leaf multiplicity (1).
    */
  private def joinUpTo(h: HierChain, level: Int): DataFrame = {
    val t = h.attrs.size
    var df = h.leaves.withColumn("cnt", lit(1L))
    var k = t - 1
    while (k > level) {
      df = df.join(h.edges(k - 1), h.attrs(k)) // edge k-1 maps a_k -> a_{k-1}
      k -= 1
    }
    df
  }

  def shared(h: HierChain): Map[AggKey, DataFrame] = {
    val t = h.attrs.size
    val out = scala.collection.mutable.Map.empty[AggKey, DataFrame]
    // C_{t-1} from the leaves.
    val cLeaf = h.leaves.groupBy(col(h.attrs(t - 1))).agg(count(lit(1)).cast("long").as("cnt"))
      .persist(StorageLevel.MEMORY_AND_DISK)
    out += (("count", t - 1, t - 1) -> cLeaf)
    // Walk each specific attribute i towards the root, reusing COF(i, j+1)
    // to build COF(i, j) with the intermediate attribute marginalized early.
    for (i <- (t - 1) to 1 by -1) {
      var cof = out(("count", i, i))
        .join(h.edges(i - 1), h.attrs(i))
        .groupBy(col(h.attrs(i)), col(h.attrs(i - 1)))
        .agg(sum("cnt").as("cnt"))
        .persist(StorageLevel.MEMORY_AND_DISK)
      out += (("cof", i, i - 1) -> cof)
      if (!out.contains(("count", i - 1, i - 1))) {
        out += (("count", i - 1, i - 1) ->
          cof.groupBy(col(h.attrs(i - 1))).agg(sum("cnt").as("cnt")).persist(StorageLevel.MEMORY_AND_DISK))
      }
      for (j <- (i - 2) to 0 by -1) {
        cof = cof
          .join(h.edges(j), h.attrs(j + 1))
          .groupBy(col(h.attrs(i)), col(h.attrs(j)))
          .agg(sum("cnt").as("cnt"))
          .persist(StorageLevel.MEMORY_AND_DISK)
        out += (("cof", i, j) -> cof)
      }
    }
    out.toMap
  }

  /** TOTAL is the marginalization of any COUNT (Section 4.3). */
  def total(countDf: DataFrame): Long =
    countDf.agg(sum("cnt")).collect()(0).getLong(0)

  /** Forces every aggregate (the benches time this). */
  def materializeAll(aggs: Map[AggKey, DataFrame]): Long =
    aggs.values.map(_.count()).sum

  def unpersistAll(aggs: Map[AggKey, DataFrame]): Unit =
    aggs.values.foreach(_.unpersist(blocking = false))
}

package repro.core

import repro.{Oracle, SparkSpec}
import repro.core.frep.SparkAggregates
import repro.synth.DatasetSynth

class SparkAggregatesSpec extends SparkSpec {

  private lazy val chain = DatasetSynth.benchChain(spark, t = 3, leaves = 200, leafRows = 2000, branch = 5, seed = 1)

  test("serial and shared plans agree on every aggregate") {
    val serial = SparkAggregates.serial(chain)
    val shared = SparkAggregates.shared(chain)
    assert(serial.keySet == shared.keySet)
    serial.keySet.foreach { k =>
      val a = serial(k).collect().map(_.toSeq.map(String.valueOf(_))).sortBy(_.mkString("|"))
      val b = shared(k).collect().map(_.toSeq.map(String.valueOf(_))).sortBy(_.mkString("|"))
      assert(a.toSeq == b.toSeq, s"aggregate $k differs")
    }
    SparkAggregates.unpersistAll(shared)
  }

  test("COUNT of the leaf attribute matches DuckDB") {
    val aggs = SparkAggregates.serial(chain)
    Oracle.assertEquivalent(
      aggs(("count", 2, 2)),
      "SELECT a2, count(*)::BIGINT AS cnt FROM leaves GROUP BY a2",
      "leaves" -> chain.leaves,
    )
  }

  test("COUNT of the root attribute matches DuckDB over the join") {
    val aggs = SparkAggregates.serial(chain)
    Oracle.assertEquivalent(
      aggs(("count", 0, 0)),
      """SELECT e1.a0 AS a0, count(*)::BIGINT AS cnt
        |FROM leaves l JOIN e2 ON l.a2 = e2.a2 JOIN e1 ON e2.a1 = e1.a1
        |GROUP BY e1.a0""".stripMargin,
      "leaves" -> chain.leaves, "e2" -> chain.edges(1), "e1" -> chain.edges(0),
    )
  }

  test("COF of leaf and root matches DuckDB over the join") {
    val aggs = SparkAggregates.shared(chain)
    Oracle.assertEquivalent(
      aggs(("cof", 2, 0)),
      """SELECT l.a2 AS a2, e1.a0 AS a0, count(*)::BIGINT AS cnt
        |FROM leaves l JOIN e2 ON l.a2 = e2.a2 JOIN e1 ON e2.a1 = e1.a1
        |GROUP BY l.a2, e1.a0""".stripMargin,
      "leaves" -> chain.leaves, "e2" -> chain.edges(1), "e1" -> chain.edges(0),
    )
    SparkAggregates.unpersistAll(aggs)
  }

  test("TOTAL is invariant across attributes") {
    val aggs = SparkAggregates.serial(chain)
    val totals = (0 until 3).map(k => SparkAggregates.total(aggs(("count", k, k))))
    assert(totals.distinct.size == 1)
    assert(totals.head == chain.leaves.count())
  }

  test("COUNT marginalizes COF (dependency edge of Figure 4)") {
    val aggs = SparkAggregates.shared(chain)
    import org.apache.spark.sql.functions._
    val viaCof = aggs(("cof", 2, 1)).groupBy(col("a1")).agg(sum("cnt").as("cnt"))
      .collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    val direct = aggs(("count", 1, 1)).collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(viaCof == direct)
    SparkAggregates.unpersistAll(aggs)
  }
}

package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.frep.SparkAggregates
import repro.synth.DatasetSynth

/** Figure 8: multi-query execution of the decomposed aggregates
  * (COUNT / COF / TOTAL) over a hierarchy chain, as Spark aggregation-join
  * jobs. `serial` is LMFAO-style one-aggregate-at-a-time execution that
  * re-joins the chain for every query; `shared` is the Algorithm-10 plan
  * with early marginalization and intermediate reuse.
  */
object MultiQueryExp {

  final case class MqRow(leafRows: Int, serialMs: Double, sharedMs: Double) {
    def speedup: Double = serialMs / sharedMs
  }

  def run(spark: SparkSession, t: Int = 3, leafRowsList: Seq[Int] = Seq(500000, 1000000, 2000000),
          seed: Long = 21): Vector[MqRow] = {
    leafRowsList.toVector.map { leafRows =>
      val chain = DatasetSynth.benchChain(spark, t, leaves = math.max(leafRows / 10, 100), leafRows, 10, seed)
      chain.leaves.cache().count()
      chain.edges.foreach(_.cache().count())

      val (_, serialMs) = Timing.ms {
        SparkAggregates.materializeAll(SparkAggregates.serial(chain))
      }
      val (sharedAggs, sharedMs) = Timing.ms {
        val aggs = SparkAggregates.shared(chain)
        SparkAggregates.materializeAll(aggs)
        aggs
      }
      SparkAggregates.unpersistAll(sharedAggs)
      chain.leaves.unpersist()
      chain.edges.foreach(_.unpersist())
      MqRow(leafRows, serialMs, sharedMs)
    }
  }

  def printRows(rows: Seq[MqRow]): Unit =
    Timing.printTable("Figure 8: multi-query execution (serial vs work-shared)",
      Seq("leafRows", "serial_ms", "shared_ms", "speedup"),
      rows.map(r => Seq(r.leafRows.toString, Timing.f1(r.serialMs), Timing.f1(r.sharedMs), Timing.f2(r.speedup) + "x")))
}

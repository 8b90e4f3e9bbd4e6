package repro.core.model

import org.apache.spark.sql.{Encoder, Encoders}
import org.apache.spark.sql.expressions.Aggregator
import repro.core.linalg.Mat

/** Partial-aggregation state: X^T X (row-major m x m), X^T y, and n. */
final case class GramBuffer(xtx: Array[Double], xty: Array[Double], n: Long)

/** Distributive gram-matrix computation as a typed Spark UDAF.
  *
  * The gram matrix is a distributive aggregate (a sum of per-row outer
  * products), so it maps onto Spark's partial aggregation: each partition
  * accumulates its own X^T X / X^T y and merge is element-wise addition.
  * This is the distributed counterpart of the driver-side factorised gram
  * — tests assert they agree — and powers learning over materialized
  * feature DataFrames when the factorised form is not available.
  */
final class GramAggregator(m: Int) extends Aggregator[(Array[Double], Double), GramBuffer, GramBuffer] {

  def zero: GramBuffer = GramBuffer(new Array[Double](m * m), new Array[Double](m), 0L)

  def reduce(b: GramBuffer, row: (Array[Double], Double)): GramBuffer = {
    val (x, y) = row
    require(x.length == m, s"feature row arity ${x.length} != $m")
    var i = 0
    while (i < m) {
      val xi = x(i)
      if (xi != 0.0) {
        var j = 0
        while (j < m) { b.xtx(i * m + j) += xi * x(j); j += 1 }
        b.xty(i) += xi * y
      }
      i += 1
    }
    GramBuffer(b.xtx, b.xty, b.n + 1)
  }

  def merge(a: GramBuffer, b: GramBuffer): GramBuffer = {
    var i = 0
    while (i < m * m) { a.xtx(i) += b.xtx(i); i += 1 }
    i = 0
    while (i < m) { a.xty(i) += b.xty(i); i += 1 }
    GramBuffer(a.xtx, a.xty, a.n + b.n)
  }

  def finish(b: GramBuffer): GramBuffer = b

  def bufferEncoder: Encoder[GramBuffer] = Encoders.product[GramBuffer]
  def outputEncoder: Encoder[GramBuffer] = Encoders.product[GramBuffer]
}

object GramAggregator {
  /** OLS from an aggregated buffer: beta = (X^T X)^-1 X^T y. */
  def solve(buf: GramBuffer, m: Int, ridge: Double = 1e-8): Array[Double] =
    Mat.ridgeInverse(new Mat(m, m, buf.xtx), ridge).mv(buf.xty)
}

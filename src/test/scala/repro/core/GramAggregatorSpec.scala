package repro.core

import repro.SparkSpec
import repro.core.linalg.Mat
import repro.core.model.{GramAggregator, GramBuffer}
import scala.util.Random

class GramAggregatorSpec extends SparkSpec {

  test("distributed gram matches the driver-side dense gram") {
    import spark.implicits._
    val rng = new Random(3)
    val m = 4
    val rows = Vector.fill(500)((Array.fill(m)(rng.nextDouble() * 2 - 1), rng.nextDouble()))
    val ds = rows.toDS().repartition(7)
    val buf = ds.select(new GramAggregator(m).toColumn).collect().head

    val x = new Mat(rows.size, m, rows.flatMap(_._1).toArray)
    val y = rows.map(_._2).toArray
    assert(new Mat(m, m, buf.xtx).maxAbsDiff(x.t * x) < 1e-8)
    x.tmv(y).zip(buf.xty).foreach { case (e, g) => assert(math.abs(e - g) < 1e-8) }
    assert(buf.n == rows.size)
  }

  test("merge is associative and order-insensitive") {
    val rng = new Random(5)
    val m = 3
    val agg = new GramAggregator(m)
    val rows = Vector.fill(60)((Array.fill(m)(rng.nextDouble()), rng.nextDouble()))
    def fold(rs: Seq[(Array[Double], Double)]): GramBuffer = rs.foldLeft(agg.zero)(agg.reduce)
    val whole = fold(rows)
    val (l, r) = rows.splitAt(23)
    val merged = agg.merge(fold(l), fold(r))
    whole.xtx.zip(merged.xtx).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9) }
    whole.xty.zip(merged.xty).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9) }
    assert(whole.n == merged.n)
  }

  test("solve recovers OLS coefficients") {
    val rng = new Random(7)
    val m = 3
    val beta = Array(2.0, -1.0, 0.5)
    val agg = new GramAggregator(m)
    var buf = agg.zero
    for (_ <- 0 until 400) {
      val x = Array(1.0, rng.nextGaussian(), rng.nextGaussian())
      val y = Mat.dot(x, beta) + rng.nextGaussian() * 0.01
      buf = agg.reduce(buf, (x, y))
    }
    val got = GramAggregator.solve(buf, m)
    beta.zip(got).foreach { case (b, g) => assert(math.abs(b - g) < 0.01) }
  }
}

package repro.core.fmatrix

import repro.core.frep.HierRelation
import repro.core.linalg.Mat

/** One column of the feature matrix.
  *
  * A column is bound to a single attribute of a single hierarchy (the
  * paper's default/auxiliary/custom single-attribute features, Section 3.3):
  * the cell value of a row is `f(value of that attribute in the row)`.
  * `hierIdx == -1` denotes the intercept column (constant 1).
  */
final case class FeatureColumn(label: String, hierIdx: Int, attrIdx: Int, f: String => Double)

object FeatureColumn {
  val Intercept: FeatureColumn = FeatureColumn("intercept", -1, -1, _ => 1.0)
}

/** Factorised feature matrix over a list of hierarchy relations.
  *
  * The (conceptual) matrix has one row per element of the cartesian product
  * of the hierarchies' rows, enumerated lexicographically with the LAST
  * hierarchy varying fastest — the paper's requirement that the drill-down
  * hierarchy is ordered last, so model "clusters" (parent groups of the
  * drill-down attribute) are contiguous row ranges.
  *
  * None of the matrix operations materialize the n x m matrix. They use the
  * decomposed aggregates (COUNT / COF / TOTAL, Section 4.2) which reduce to
  * per-hierarchy segment scans:
  *  - gram: per-hierarchy pair sums scaled by the other hierarchies' TOTALs
  *    (cross-hierarchy COF is a cartesian product and never materialized);
  *  - left multiplication (v^T X): prefix sums of v + range sums over the
  *    FD-induced contiguous segments;
  *  - right multiplication (X a): odometer row iteration updating only the
  *    hierarchies whose row changed (vertically adjacent rows overlap);
  *  - per-cluster variants: per-parent-block statistics are computed once
  *    and shared across all outer combinations (work sharing, Appendix F).
  */
final class FactorizedMatrix(val hiers: Vector[HierRelation], val cols: Vector[FeatureColumn]) {
  require(hiers.nonEmpty, "no hierarchies")
  cols.foreach { c =>
    require(c.hierIdx >= -1 && c.hierIdx < hiers.size, s"bad hierIdx in ${c.label}")
    if (c.hierIdx >= 0)
      require(c.attrIdx >= 0 && c.attrIdx < hiers(c.hierIdx).depth, s"bad attrIdx in ${c.label}")
  }

  val m: Int = cols.size
  val H: Int = hiers.size
  val totals: Vector[Int] = hiers.map(_.total)

  /** Rows of the conceptual matrix (cartesian product size). */
  val n: Int = {
    val p = totals.map(_.toLong).product
    require(p <= Int.MaxValue, s"matrix too tall: $p rows")
    p.toInt
  }

  /** Product of totals of hierarchies strictly after h (stride of h). */
  val innerSize: Vector[Int] = {
    val arr = new Array[Int](H)
    var acc = 1
    var h = H - 1
    while (h >= 0) { arr(h) = acc; acc *= totals(h); h -= 1 }
    arr.toVector
  }

  /** Product of totals of hierarchies strictly before h. */
  val outerSize: Vector[Int] = {
    val arr = new Array[Int](H)
    var acc = 1
    var h = 0
    while (h < H) { arr(h) = acc; acc *= totals(h); h += 1 }
    arr.toVector
  }

  /** Per column: the feature value for each row of its hierarchy relation
    * (null for the intercept). Isolates the attribute->feature mapping from
    * the matrix (Appendix B's attribute/feature isolation).
    */
  private val colVals: Array[Array[Double]] = cols.map { c =>
    if (c.hierIdx < 0) null
    else {
      val rel = hiers(c.hierIdx)
      Array.tabulate(rel.total)(r => c.f(rel.rows(r)(c.attrIdx)))
    }
  }.toArray

  /** Sum of the column's feature values over its hierarchy's rows. */
  private val sumF: Array[Double] = Array.tabulate(m) { j =>
    if (colVals(j) == null) Double.NaN else colVals(j).sum
  }

  private def pairSum(j: Int, k: Int): Double = {
    val a = colVals(j); val b = colVals(k)
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  // ---------------------------------------------------------------- gram

  /** X^T X without materializing X (Algorithm 2 generalization). */
  def gram: Mat = {
    val g = Mat.zeros(m, m)
    var j = 0
    while (j < m) {
      var k = j
      while (k < m) {
        val v = gramEntry(j, k)
        g(j, k) = v; g(k, j) = v
        k += 1
      }
      j += 1
    }
    g
  }

  private def gramEntry(j: Int, k: Int): Double = {
    val hj = cols(j).hierIdx; val hk = cols(k).hierIdx
    if (hj < 0 && hk < 0) n.toDouble
    else if (hj < 0) (n.toDouble / totals(hk)) * sumF(k)
    else if (hk < 0) (n.toDouble / totals(hj)) * sumF(j)
    else if (hj == hk) (n.toDouble / totals(hj)) * pairSum(j, k)
    else (n.toDouble / totals(hj) / totals(hk)) * sumF(j) * sumF(k)
  }

  // ------------------------------------------------- left multiplication

  /** X^T v for an n-vector v (the paper's left multiplication `v^T X`),
    * via prefix sums + FD-segment range sums (Algorithm 3).
    */
  def xtv(v: Array[Double]): Array[Double] = {
    require(v.length == n, s"xtv length mismatch: ${v.length} vs $n")
    val prefix = new Array[Double](n + 1)
    var i = 0
    while (i < n) { prefix(i + 1) = prefix(i) + v(i); i += 1 }
    val out = new Array[Double](m)
    var j = 0
    while (j < m) {
      val c = cols(j)
      if (c.hierIdx < 0) out(j) = prefix(n)
      else {
        val h = c.hierIdx
        val rel = hiers(h)
        val inner = innerSize(h); val th = totals(h); val outer = outerSize(h)
        val segs = rel.segments(c.attrIdx)
        val segVal = segs.map(s => c.f(s.value)).toArray
        var acc = 0.0
        var o = 0
        while (o < outer) {
          val base = o * th * inner
          var s = 0
          while (s < segs.length) {
            val seg = segs(s)
            acc += segVal(s) * (prefix(base + (seg.start + seg.len) * inner) - prefix(base + seg.start * inner))
            s += 1
          }
          o += 1
        }
        out(j) = acc
      }
      j += 1
    }
    out
  }

  // ------------------------------------------------ right multiplication

  /** X a for an m-vector a (right multiplication), via row-diff odometer
    * iteration (Algorithm 4): only hierarchies whose row pointer changed
    * have their contribution recomputed.
    */
  def xv(a: Array[Double]): Array[Double] = {
    require(a.length == m, s"xv length mismatch: ${a.length} vs $m")
    val out = new Array[Double](n)
    var const = 0.0
    var j = 0
    while (j < m) { if (cols(j).hierIdx < 0) const += a(j); j += 1 }
    val colsOf: Array[Array[Int]] = Array.tabulate(H)(h => cols.indices.filter(cols(_).hierIdx == h).toArray)
    val ptr = new Array[Int](H)
    val contrib = new Array[Double](H)
    def recompute(h: Int): Unit = {
      var s = 0.0
      val cj = colsOf(h); var x = 0
      while (x < cj.length) { val j = cj(x); s += a(j) * colVals(j)(ptr(h)); x += 1 }
      contrib(h) = s
    }
    var h = 0
    while (h < H) { recompute(h); h += 1 }
    var running = const; h = 0
    while (h < H) { running += contrib(h); h += 1 }
    var i = 0
    while (i < n) {
      out(i) = running
      // odometer increment: last hierarchy fastest
      var d = H - 1
      var carry = true
      while (carry && d >= 0) {
        ptr(d) += 1
        if (ptr(d) == totals(d)) { ptr(d) = 0; carry = true } else carry = false
        running -= contrib(d); recompute(d); running += contrib(d)
        d -= 1
      }
      i += 1
    }
    out
  }

  // ------------------------------------------------------------ clusters

  /** Clusters = parent groups of the last hierarchy's most specific
    * attribute, crossed with every combination of the outer hierarchies.
    * Cluster rows are contiguous (the drill-down hierarchy is last).
    */
  val lastHier: HierRelation = hiers(H - 1)
  val blocks: Vector[(Int, Int)] = lastHier.parentBlocks
  val numClusters: Int = outerSize(H - 1) * blocks.size

  /** (start, len) row ranges of each cluster, in row order. */
  lazy val clusterRanges: Array[(Int, Int)] = {
    val outer = outerSize(H - 1); val th = totals(H - 1)
    val out = new Array[(Int, Int)](numClusters)
    var i = 0
    var o = 0
    while (o < outer) {
      var b = 0
      while (b < blocks.size) { val (s, l) = blocks(b); out(i) = (o * th + s, l); i += 1; b += 1 }
      o += 1
    }
    out
  }

  /** Column classification for cluster ops: a column "varies" within a
    * cluster iff it is bound to the last hierarchy's most specific attr.
    */
  private val lastAttr = lastHier.depth - 1
  private val varyingCols: Array[Int] =
    cols.indices.filter(j => cols(j).hierIdx == H - 1 && cols(j).attrIdx == lastAttr).toArray
  private val constCols: Array[Int] = cols.indices.filterNot(varyingCols.contains(_)).toArray
  /** varIdxOf(j) = position of column j inside varyingCols, or -1. */
  private val varIdxOf: Array[Int] = {
    val arr = Array.fill(m)(-1)
    varyingCols.zipWithIndex.foreach { case (j, x) => arr(j) = x }
    arr
  }

  /** Per parent block: sums and pair sums of varying columns — computed
    * once and shared across all outer combinations (per-cluster work
    * sharing, Appendix F).
    */
  private lazy val blockSumF: Array[Array[Double]] = // [block][varIdx]
    blocks.toArray.map { case (s, l) =>
      varyingCols.map { j => var acc = 0.0; var r = s; while (r < s + l) { acc += colVals(j)(r); r += 1 }; acc }
    }
  private lazy val blockPairSum: Array[Array[Double]] = // [block][varIdx*nv + varIdx]
    blocks.toArray.map { case (s, l) =>
      val nv = varyingCols.length
      val out = new Array[Double](nv * nv)
      var x = 0
      while (x < nv) {
        var y = x
        while (y < nv) {
          var acc = 0.0; var r = s
          while (r < s + l) { acc += colVals(varyingCols(x))(r) * colVals(varyingCols(y))(r); r += 1 }
          out(x * nv + y) = acc; out(y * nv + x) = acc
          y += 1
        }
        x += 1
      }
      out
    }

  /** Primitive-signature callback for cluster iteration — a generic
    * Function5 would box four Ints per cluster, which dominates runtime
    * with tens of thousands of clusters per EM iteration.
    */
  private trait ClusterVisitor {
    def visit(ci: Int, b: Int, blockStart: Int, len: Int, constVals: Array[Double]): Unit
  }

  /** Iterates clusters in row order, supplying for each: the cluster index,
    * the block index, the block's (start,len) inside the last hierarchy,
    * and the constant column values for the current outer combination
    * (NaN at varying columns).
    */
  private def foreachCluster(fun: ClusterVisitor): Unit = {
    val outerH = H - 1 // number of outer hierarchies
    val ptr = new Array[Int](outerH)
    val constVals = new Array[Double](m)
    java.util.Arrays.fill(constVals, Double.NaN)
    val colsByHier: Array[Array[Int]] =
      Array.tabulate(H)(h => cols.indices.filter(cols(_).hierIdx == h).toArray)
    def setFor(h: Int): Unit = {
      val cj = colsByHier(h); var x = 0
      while (x < cj.length) { val j = cj(x); constVals(j) = colVals(j)(ptr(h)); x += 1 }
    }
    var j = 0
    while (j < m) { if (cols(j).hierIdx < 0) constVals(j) = 1.0; j += 1 }
    var h = 0
    while (h < outerH) { setFor(h); h += 1 }
    // const cols bound to the LAST hierarchy but NOT the last attr: their
    // value is fixed per block (parent prefix), set inside the loop.
    val lastConstCols = constCols.filter(cols(_).hierIdx == H - 1)
    var ci = 0
    val outer = outerSize(H - 1)
    var o = 0
    while (o < outer) {
      var b = 0
      while (b < blocks.size) {
        val (s, l) = blocks(b)
        var x = 0
        while (x < lastConstCols.length) { val j = lastConstCols(x); constVals(j) = colVals(j)(s); x += 1 }
        fun.visit(ci, b, s, l, constVals)
        ci += 1; b += 1
      }
      // odometer over outer hierarchies (last of them fastest)
      var d = outerH - 1
      var carry = true
      while (carry && d >= 0) {
        ptr(d) += 1
        if (ptr(d) == totals(d)) { ptr(d) = 0 } else carry = false
        setFor(d)
        d -= 1
      }
      o += 1
    }
  }

  /** Streams X_i^T X_i for every cluster i (Algorithm 5 equivalent). */
  def foreachClusterGram(fun: (Int, Mat) => Unit): Unit = {
    val nv = varyingCols.length
    foreachCluster(new ClusterVisitor {
      def visit(ci: Int, b: Int, blockStart: Int, len: Int, constVals: Array[Double]): Unit = {
        val g = Mat.zeros(m, m)
        var j = 0
        while (j < m) {
          var k = j
          while (k < m) {
            val vj = varIdxOf(j); val vk = varIdxOf(k)
            val v =
              if (vj < 0 && vk < 0) len * constVals(j) * constVals(k)
              else if (vj < 0) constVals(j) * blockSumF(b)(vk)
              else if (vk < 0) constVals(k) * blockSumF(b)(vj)
              else blockPairSum(b)(vj * nv + vk)
            g(j, k) = v; g(k, j) = v
            k += 1
          }
          j += 1
        }
        fun(ci, g)
      }
    })
  }

  /** X_i^T v_i for every cluster (per-cluster left multiplication). */
  def clusterXtv(v: Array[Double]): Array[Array[Double]] = {
    require(v.length == n, s"clusterXtv length mismatch")
    val prefix = new Array[Double](n + 1)
    var i = 0
    while (i < n) { prefix(i + 1) = prefix(i) + v(i); i += 1 }
    val out = new Array[Array[Double]](numClusters)
    val th = totals(H - 1)
    val nb = blocks.size
    foreachCluster(new ClusterVisitor {
      def visit(ci: Int, b: Int, bs: Int, len: Int, constVals: Array[Double]): Unit = {
        val o = ci / nb
        val start = o * th + bs
        val res = new Array[Double](m)
        val rangeSum = prefix(start + len) - prefix(start)
        var x = 0
        while (x < constCols.length) { val j = constCols(x); res(j) = constVals(j) * rangeSum; x += 1 }
        x = 0
        while (x < varyingCols.length) {
          val j = varyingCols(x)
          var acc = 0.0; var r = 0
          while (r < len) { acc += colVals(j)(bs + r) * v(start + r); r += 1 }
          res(j) = acc
          x += 1
        }
        out(ci) = res
      }
    })
    out
  }

  /** vertcat(X_1 a_1, ..., X_G a_G) (per-cluster right multiplication). */
  def clusterXa(as: Array[Array[Double]]): Array[Double] = {
    require(as.length == numClusters, s"clusterXa cluster count mismatch")
    val out = new Array[Double](n)
    val th = totals(H - 1)
    val nb = blocks.size
    foreachCluster(new ClusterVisitor {
      def visit(ci: Int, b: Int, bs: Int, len: Int, constVals: Array[Double]): Unit = {
        val a = as(ci)
        val o = ci / nb
        val start = o * th + bs
        var base = 0.0
        var x = 0
        while (x < constCols.length) { val j = constCols(x); base += constVals(j) * a(j); x += 1 }
        var r = 0
        while (r < len) {
          var v = base
          var y = 0
          while (y < varyingCols.length) { val j = varyingCols(y); v += colVals(j)(bs + r) * a(j); y += 1 }
          out(start + r) = v
          r += 1
        }
      }
    })
    out
  }

  /** Materializes cluster i as a dense len x m matrix (AIC / tests). */
  def clusterMat(i: Int): Mat = {
    val (start, len) = clusterRanges(i)
    val out = Mat.zeros(len, m)
    var r = 0
    while (r < len) {
      val row = rowOf(start + r)
      var j = 0
      while (j < m) { out(r, j) = row(j); j += 1 }
      r += 1
    }
    out
  }

  // -------------------------------------------------------------- helpers

  /** The per-hierarchy row indices making up global row `idx`. */
  def coords(idx: Int): Array[Int] = {
    val c = new Array[Int](H)
    var rem = idx
    var h = 0
    while (h < H) { c(h) = rem / innerSize(h); rem = rem % innerSize(h); h += 1 }
    c
  }

  def indexOf(hierRows: Seq[Int]): Int = {
    require(hierRows.size == H, "indexOf arity mismatch")
    var idx = 0
    var h = 0
    while (h < H) { idx += hierRows(h) * innerSize(h); h += 1 }
    idx
  }

  /** Feature row for global row idx (materializes one row). */
  def rowOf(idx: Int): Array[Double] = {
    val c = coords(idx)
    Array.tabulate(m) { j =>
      val col = cols(j)
      if (col.hierIdx < 0) 1.0 else colVals(j)(c(col.hierIdx))
    }
  }

  /** The attribute-value tuple of global row idx, in hierarchy order. */
  def tupleOf(idx: Int): Vector[String] = {
    val c = coords(idx)
    hiers.indices.flatMap(h => hiers(h).rows(c(h))).toVector
  }

  /** Fully materialized n x m matrix — only for tests and the naive
    * ("Matlab over Lapack") baseline; this is exactly the cost the
    * factorised representation avoids.
    */
  def materialize: Mat = {
    val out = Mat.zeros(n, m)
    var i = 0
    while (i < n) {
      val row = rowOf(i)
      var j = 0
      while (j < m) { out(i, j) = row(j); j += 1 }
      i += 1
    }
    out
  }
}

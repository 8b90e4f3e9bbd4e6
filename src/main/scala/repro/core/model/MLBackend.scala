package repro.core.model

import repro.core.fmatrix.FactorizedMatrix
import repro.core.linalg.Mat

/** The six matrix-operation primitives the EM loop needs (Appendix D):
  * gram `X^T X`, right multiplication `X a`, left multiplication `X^T v`,
  * and their per-cluster counterparts. Two implementations: the factorised
  * one (Reptile) and a dense one over the fully materialized matrix (the
  * Lapack/Matlab baseline). Tests assert both produce identical numbers.
  */
trait MLBackend {
  def n: Int
  def m: Int
  def gram: Mat
  def xv(a: Array[Double]): Array[Double]
  def xtv(v: Array[Double]): Array[Double]
  def numClusters: Int
  def clusterRanges: Array[(Int, Int)]
  def foreachClusterGram(f: (Int, Mat) => Unit): Unit
  def clusterXtv(v: Array[Double]): Array[Array[Double]]
  def clusterXa(as: Array[Array[Double]]): Array[Double]
  def clusterMat(i: Int): Mat
}

/** Reptile's backend: operations run on the f-representation directly. */
final class FactorizedBackend(val fm: FactorizedMatrix) extends MLBackend {
  def n: Int = fm.n
  def m: Int = fm.m
  def gram: Mat = fm.gram
  def xv(a: Array[Double]): Array[Double] = fm.xv(a)
  def xtv(v: Array[Double]): Array[Double] = fm.xtv(v)
  def numClusters: Int = fm.numClusters
  def clusterRanges: Array[(Int, Int)] = fm.clusterRanges
  def foreachClusterGram(f: (Int, Mat) => Unit): Unit = fm.foreachClusterGram(f)
  def clusterXtv(v: Array[Double]): Array[Array[Double]] = fm.clusterXtv(v)
  def clusterXa(as: Array[Array[Double]]): Array[Double] = fm.clusterXa(as)
  def clusterMat(i: Int): Mat = fm.clusterMat(i)
}

/** Naive backend over a fully materialized matrix — the "Matlab over
  * Lapack" comparison point of the paper's Figure 7/10 experiments.
  */
final class DenseBackend(x: Mat, val clusterRanges: Array[(Int, Int)]) extends MLBackend {
  require(clusterRanges.nonEmpty, "no clusters")
  def n: Int = x.rows
  def m: Int = x.cols
  def gram: Mat = x.t * x
  def xv(a: Array[Double]): Array[Double] = x.mv(a)
  def xtv(v: Array[Double]): Array[Double] = x.tmv(v)
  def numClusters: Int = clusterRanges.length

  def clusterMat(i: Int): Mat = {
    val (s, l) = clusterRanges(i)
    val out = Mat.zeros(l, m)
    var r = 0
    while (r < l) { var j = 0; while (j < m) { out(r, j) = x(s + r, j); j += 1 }; r += 1 }
    out
  }

  def foreachClusterGram(f: (Int, Mat) => Unit): Unit = {
    var i = 0
    while (i < numClusters) { val xi = clusterMat(i); f(i, xi.t * xi); i += 1 }
  }

  def clusterXtv(v: Array[Double]): Array[Array[Double]] = {
    val out = new Array[Array[Double]](numClusters)
    var i = 0
    while (i < numClusters) {
      val (s, l) = clusterRanges(i)
      val res = new Array[Double](m)
      var r = 0
      while (r < l) {
        val w = v(s + r)
        var j = 0
        while (j < m) { res(j) += w * x(s + r, j); j += 1 }
        r += 1
      }
      out(i) = res
      i += 1
    }
    out
  }

  def clusterXa(as: Array[Array[Double]]): Array[Double] = {
    val out = new Array[Double](n)
    var i = 0
    while (i < numClusters) {
      val (s, l) = clusterRanges(i)
      val a = as(i)
      var r = 0
      while (r < l) {
        var acc = 0.0
        var j = 0
        while (j < m) { acc += x(s + r, j) * a(j); j += 1 }
        out(s + r) = acc
        r += 1
      }
      i += 1
    }
    out
  }
}

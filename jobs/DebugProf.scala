package repro.jobs

import repro.core.fmatrix.FactorizedMatrix
import repro.core.model._
import repro.exp.Timing
import repro.core.linalg.Mat
import scala.util.Random

object DebugProf {
  def main(args: Array[String]): Unit = {
    // compas inv5 shape: hiers [time@3 (720), age(3), race(6)] -> n=12960, clusters=2160
    val time = repro.core.frep.HierRelation("time", Seq("y","m","d"),
      (for { y <- 0 until 2; mo <- 0 until 12; d <- 0 until 30 } yield
        Seq(s"y$y", f"y$y-m$mo%02d", f"y$y-m$mo%02d-d$d%02d")))
    val age = repro.core.frep.HierRelation("age", Seq("a"), (0 until 3).map(i => Seq(s"a$i")))
    val race = repro.core.frep.HierRelation("race", Seq("r"), (0 until 6).map(i => Seq(s"r$i")))
    val rng = new Random(1)
    def f(salt: Int) = (v: String) => repro.synth.DatasetSynth.pseudo(v.hashCode.toLong ^ salt)
    val cols = Vector(
      repro.core.fmatrix.FeatureColumn.Intercept,
      repro.core.fmatrix.FeatureColumn("y",0,0,f(1)), repro.core.fmatrix.FeatureColumn("m",0,1,f(2)),
      repro.core.fmatrix.FeatureColumn("d",0,2,f(3)), repro.core.fmatrix.FeatureColumn("a",1,0,f(4)),
      repro.core.fmatrix.FeatureColumn("r",2,0,f(5)))
    val fm = new FactorizedMatrix(Vector(time, age, race), cols)
    println(s"n=${fm.n} m=${fm.m} clusters=${fm.numClusters}")
    val y = Array.fill(fm.n)(rng.nextDouble()*10)
    val bk = new FactorizedBackend(fm)
    // warmup
    MultiLevelEM.fit(bk, y, 2)
    val (_, t1) = Timing.ms(MultiLevelEM.fit(bk, y, 20))
    println(f"factorized EM 20 iters: $t1%.1f ms")
    val dbk = new DenseBackend(fm.materialize, fm.clusterRanges)
    MultiLevelEM.fit(dbk, y, 2)
    val (_, t2) = Timing.ms(MultiLevelEM.fit(dbk, y, 20))
    println(f"dense EM 20 iters: $t2%.1f ms")
    // phase timings
    val (g1, tg) = Timing.ms(bk.gram)
    val gi = Mat.ridgeInverse(g1, 1e-8)
    val (_, txv) = Timing.ms(bk.xv(gi.mv(bk.xtv(y))))
    val cg = new Array[Mat](bk.numClusters)
    val (_, tcg) = Timing.ms(bk.foreachClusterGram((i, m) => cg(i) = m))
    val (_, tcx) = Timing.ms(bk.clusterXtv(y))
    val sInv = Mat.eye(bk.m)
    val (_, tvi) = Timing.ms {
      var i = 0
      while (i < bk.numClusters) { Mat.ridgeInverse(cg(i) * 2.0 + sInv, 1e-8); i += 1 }
    }
    println(f"gram=$tg%.2f xv-chain=$txv%.2f clusterGrams=$tcg%.2f clusterXtv=$tcx%.2f clusterInverses=$tvi%.2f ms")
  }
}

package repro.core

import repro.SparkSpec
import repro.core.frep._

class DrilldownSessionSpec extends SparkSpec {

  private def hier(name: String, leaves: Int, depth: Int = 4, branch: Int = 3): HierRelation = {
    val tuples = (0 until leaves).map { leaf =>
      (0 until depth).map { k =>
        val stride = math.pow(branch, (depth - 1 - k).toDouble).toLong
        f"$name$k-${leaf / stride}%05d"
      }
    }
    HierRelation(name, (0 until depth).map(k => s"$name$k"), tuples)
  }

  private val relA = hier("A", 200)
  private val relB = hier("B", 150)

  test("DimAggs.compute matches HierRelation counts and cofs") {
    val rel = relA.truncate(3)
    val aggs = DimAggs.compute(rel)
    assert(aggs.total == rel.total)
    (0 until 3).foreach { ai =>
      assert(aggs.counts(ai) == rel.countOf(ai).map { case (k, v) => k -> v.toLong })
    }
    assert(aggs.cofs((2, 0)) == rel.cofWithin(2, 0).map { case (k, v) => k -> v.toLong })
  }

  test("counts marginalize COFs (multi-query dependency graph)") {
    val aggs = DimAggs.compute(relA.truncate(3))
    // COUNT_{A_j} = sum over A_i of COF_{A_i, A_j}
    val viaCof = aggs.cofs((2, 1)).groupBy(_._1._2).map { case (v, m) => v -> m.values.sum }
    assert(viaCof == aggs.counts(1))
    assert(aggs.counts(0).values.sum == aggs.total) // TOTAL from COUNT
  }

  test("all strategies produce identical aggregates") {
    val results = Seq(DrillStrategy.Static, DrillStrategy.Dynamic, DrillStrategy.DynamicCached).map { s =>
      val session = new DrilldownSession(Vector(relA, relB), s, Map("A" -> 2, "B" -> 2))
      val r1 = session.evaluate("A")
      val rB = session.evaluate("B")
      session.commit("A")
      val r2 = session.evaluate("A")
      (r1, rB, r2)
    }
    results.sliding(2).foreach {
      case Seq(x, y) => assert(x == y)
      case _         =>
    }
  }

  test("zoom scalars are the product of the other hierarchies' totals") {
    val session = new DrilldownSession(Vector(relA, relB), DrillStrategy.Dynamic, Map("A" -> 2, "B" -> 3))
    val (aggs, zooms) = session.evaluate("A")
    assert(zooms("A") == aggs("B").total.toDouble)
    assert(zooms("B") == aggs("A").total.toDouble)
    // global COUNT of a B value = raw count * zoom
    val (v, raw) = aggs("B").counts(0).head
    assert(raw * zooms("B") == raw * aggs("A").total)
  }

  test("dynamic avoids recomputing the non-target hierarchy") {
    val dyn = new DrilldownSession(Vector(relA, relB), DrillStrategy.Dynamic, Map("A" -> 2, "B" -> 2))
    dyn.evaluate("A"); dyn.evaluate("B"); dyn.commit("A")
    val afterFirst = dyn.recomputations
    dyn.evaluate("A") // B reused from `current`
    assert(dyn.recomputations == afterFirst + 1)

    val static = new DrilldownSession(Vector(relA, relB), DrillStrategy.Static, Map("A" -> 2, "B" -> 2))
    static.evaluate("A"); static.evaluate("B"); static.commit("A")
    val afterFirstS = static.recomputations
    static.evaluate("A") // recomputes both A and B
    assert(static.recomputations == afterFirstS + 2)
  }

  test("cache eliminates repeat target evaluations across invocations") {
    val cached = new DrilldownSession(Vector(relA, relB), DrillStrategy.DynamicCached, Map("A" -> 2, "B" -> 2))
    cached.evaluate("B")
    val after1 = cached.recomputations
    cached.commit("A") // commit A; B stays at depth 2
    cached.evaluate("B") // B@3 cached from the first evaluation
    assert(cached.recomputations == after1 + 1) // only commit(A)'s recompute
  }

  test("commit advances depth") {
    val s = new DrilldownSession(Vector(relA, relB), DrillStrategy.Static, Map("A" -> 1))
    assert(s.depthOf("A") == 1 && s.depthOf("B") == 0)
    s.commit("A")
    assert(s.depthOf("A") == 2)
    s.commit("B")
    assert(s.depthOf("B") == 1)
  }
}

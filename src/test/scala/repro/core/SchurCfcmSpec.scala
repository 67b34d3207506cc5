package repro.core

import repro.SparkSpec
import repro.graph.{CsrGraph, GraphGen, GraphOps}
import repro.linalg.Dense

class SchurCfcmSpec extends SparkSpec {

  private lazy val karate = CsrGraph.fromDataFrame(GraphGen.karate(spark))
  private val cfg = ForestCfcm.Config(eps = 0.2, r0 = 8.0, seed = 13)

  test("selectT starts with the max-degree node and has no duplicates") {
    val t = SchurCfcm.selectT(karate)
    assert(t.head == karate.maxDegreeNode)
    assert(t.distinct.length == t.length)
  }

  test("exact Schur complement identity (Lemma 4.3) on karate") {
    // S_T(L_{-S}) computed directly equals the T-submatrix algebra
    val g = karate
    val s = Set(13); val t = Array(33, 0)
    val u = (0 until g.n).filterNot(v => s.contains(v) || t.contains(v)).toArray
    val lap = Dense.laplacian(g)
    val luu = Dense.inverse(Dense.submatrix(lap, g.n, u), u.length)
    // schur = L_TT − L_TU L_UU^{-1} L_UT
    val schur = Array.tabulate(t.length * t.length) { idx =>
      val i = idx / t.length; val j = idx % t.length
      var corr = 0.0
      for ((a, ai) <- u.zipWithIndex; (b, bi) <- u.zipWithIndex)
        corr += Dense.get(lap, g.n, t(i), a) * Dense.get(luu, u.length, ai, bi) * Dense.get(lap, g.n, b, t(j))
      Dense.get(lap, g.n, t(i), t(j)) - corr
    }
    // block identity: (L_{-S}^{-1})_TT = schur^{-1}
    val keep = (0 until g.n).filterNot(s.contains).toArray
    val invFull = Dense.inverse(Dense.submatrix(lap, g.n, keep), keep.length)
    val schurInv = Dense.inverse(schur, t.length)
    for (i <- t.indices; j <- t.indices) {
      val pi = keep.indexOf(t(i)); val pj = keep.indexOf(t(j))
      assert(math.abs(Dense.get(invFull, keep.length, pi, pj) - Dense.get(schurInv, t.length, i, j)) < 1e-8)
    }
  }

  test("schurDelta denominator matches exact diag of L_{-S}^{-1} (U and T nodes)") {
    val g = karate
    val s = Set(13)
    val t = SchurCfcm.selectT(g).filterNot(s.contains)
    val est = SchurCfcm.schurDelta(spark, g, s, t, cfg, iter = 1)
    val (keep, inv) = Dense.submatrixInverse(g, s)
    for ((u, i) <- keep.zipWithIndex) {
      val ex = Dense.get(inv, keep.length, i, i)
      assert(math.abs(est.den(u) - ex) < math.max(0.25 * ex, 0.15),
             s"den($u)=${est.den(u)} vs $ex (inT=${t.contains(u)})")
    }
  }

  test("schurDelta estimates track exact Δ(u,S) and argmax is near-optimal") {
    val g = karate
    val s = Set(33)
    val t = SchurCfcm.selectT(g).filterNot(s.contains)
    val est = SchurCfcm.schurDelta(spark, g, s, t, cfg, iter = 1)
    val exact = Cfcc.exactDelta(g, s)
    for ((u, d) <- exact) {
      assert(est.delta(u) > 0, s"Δ'($u) = ${est.delta(u)}")
      assert(math.abs(est.delta(u) - d) < 0.6 * d + 0.3, s"Δ($u): est=${est.delta(u)} exact=$d")
    }
    val pick = exact.keys.maxBy(est.delta)
    assert(exact(pick) >= 0.8 * exact.values.max)
  }

  test("schurDelta falls back to forestDelta when T ⊆ S") {
    val g = karate
    val t = Array(33, 0)
    val s = Set(33, 0, 5)
    val est = SchurCfcm.schurDelta(spark, g, s, t, cfg, iter = 1)
    val exact = Cfcc.exactDelta(g, s)
    val pick = exact.keys.maxBy(est.delta)
    assert(exact(pick) >= 0.7 * exact.values.max)
  }

  test("full run returns k distinct nodes with near-exact quality (karate, k=4)") {
    val g = karate
    val res = SchurCfcm.run(spark, g, 4, cfg)
    assert(res.picks.distinct.length == 4)
    val cSchur = Cfcc.exact(g, res.picks.toSet)
    val cExact = g.n / ExactGreedy.run(g, 4).traces.last
    assert(cSchur >= 0.9 * cExact, s"schur $cSchur vs exact $cExact")
  }

  test("Schur sampling needs fewer/equal walk steps: forests absorb faster with T") {
    // Proxy: with the same budget, sampling with roots S∪T must not be slower
    // in forest count; verify via the recorded forest totals on a BA graph.
    val g = GraphOps.largestComponent(GraphGen.barabasiAlbert(spark, 400, 3, 3))
    val s = Set(g.maxDegreeNode)
    val t = SchurCfcm.selectT(g).filterNot(s.contains)
    assert(t.nonEmpty)
    val est = SchurCfcm.schurDelta(spark, g, s, t, ForestCfcm.Config(0.3, r0 = 8.0, seed = 1), 1)
    val exact = Cfcc.exactDelta(g, s)
    val pick = exact.keys.maxBy(est.delta)
    // smoke threshold: Schur budgets are further scaled down by the
    // d_max(S∪T)/d_max(S) ratio (Lemma 4.5), so this is a coarse pick check
    assert(exact(pick) >= 0.5 * exact.values.max)
  }

  test("run works on the contUsa stand-in grid with k=3") {
    val g = GraphOps.largestComponent(GraphGen.contUsaLike(spark))
    val res = SchurCfcm.run(spark, g, 3, cfg)
    assert(res.picks.distinct.length == 3)
    val c = Cfcc.exact(g, res.picks.toSet)
    val cEx = g.n / ExactGreedy.run(g, 3).traces.last
    assert(c >= 0.9 * cEx, s"schur $c vs exact $cEx")
  }
}

package repro.core

import repro.SparkSpec
import repro.graph.{CsrGraph, GraphGen, GraphOps}

class ExhaustiveSpec extends SparkSpec {

  private lazy val karate = CsrGraph.fromDataFrame(GraphGen.karate(spark))

  test("optimum k=1 equals argmin over all single-node traces") {
    val g = karate
    val res = Exhaustive.optimum(g, 1)
    val best = (0 until g.n).minBy(u => Cfcc.traceInvExact(g, Set(u)))
    assert(res.best == Set(best))
    assert(math.abs(res.trace - Cfcc.traceInvExact(g, Set(best))) < 1e-9)
  }

  test("optimum trace is a lower bound for any same-size set (spot check)") {
    val g = karate
    val res = Exhaustive.optimum(g, 2)
    val rng = new java.util.SplittableRandom(8)
    for (_ <- 0 until 20) {
      val a = rng.nextInt(g.n); var b = rng.nextInt(g.n)
      while (b == a) b = rng.nextInt(g.n)
      assert(res.trace <= Cfcc.traceInvExact(g, Set(a, b)) + 1e-9)
    }
  }

  test("optimum is monotone in k") {
    val g = GraphOps.largestComponent(GraphGen.zebraLike(spark))
    val t1 = Exhaustive.optimum(g, 1).trace
    val t2 = Exhaustive.optimum(g, 2).trace
    val t3 = Exhaustive.optimum(g, 3).trace
    assert(t2 < t1 && t3 < t2)
  }

  test("greedy EXACT is within the approximation band of the optimum on all tiny graphs") {
    for ((name, df) <- Seq(
      "zebraLike" -> GraphGen.zebraLike(spark),
      "karate" -> GraphGen.karate(spark),
      "contUsaLike" -> GraphGen.contUsaLike(spark),
      "dolphinsLike" -> GraphGen.dolphinsLike(spark),
    ); k <- Seq(2, 3)) {
      val g = GraphOps.largestComponent(df)
      val cGreedy = g.n / ExactGreedy.run(g, k).traces.last
      val cOpt = g.n / Exhaustive.optimum(g, k).trace
      assert(cGreedy <= cOpt + 1e-9, s"$name k=$k: greedy above optimum?!")
      // greedy-vs-optimum gap: ~0.93 on grids at k=2; the theoretical bound
      // (1 − k/(k−1)·1/e) is far looser, so 0.9 is already a strong check
      assert(cGreedy >= 0.9 * cOpt, s"$name k=$k: greedy $cGreedy far from optimum $cOpt")
    }
  }

  test("k bounds are enforced") {
    intercept[IllegalArgumentException](Exhaustive.optimum(karate, 5))
    intercept[IllegalArgumentException](Exhaustive.optimum(karate, 0))
  }
}

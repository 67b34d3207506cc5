package repro.core

import repro.{Oracle, SparkSpec}
import repro.graph.{CsrGraph, GraphGen, GraphOps}

class HeuristicsSpec extends SparkSpec {

  private lazy val karateDf = GraphGen.karate(spark)
  private lazy val karate = CsrGraph.fromDataFrame(karateDf)

  test("degreeTopK matches DuckDB's ranking (Oracle)") {
    val k = 5
    val df = Heuristics.degreeTopKDf(karateDf, k)
    Oracle.assertEquivalent(
      df,
      s"""SELECT node, degree FROM (
         |  SELECT node::INT AS node, count(*)::BIGINT AS degree FROM (
         |    SELECT src AS node FROM edges UNION ALL SELECT dst AS node FROM edges
         |  ) GROUP BY node
         |) ORDER BY degree DESC, node ASC LIMIT $k""".stripMargin,
      "edges" -> karateDf,
    )
  }

  test("degreeTopK returns the known karate hubs") {
    val top2 = Heuristics.degreeTopK(karateDf, 2)
    assert(top2.toSet == Set(33, 0)) // degrees 17 and 16
  }

  test("degreeTopK agrees with CSR degrees for several k") {
    for (k <- Seq(1, 3, 7, 12)) {
      val byDf = Heuristics.degreeTopK(karateDf, k)
      val byCsr = (0 until karate.n).sortBy(u => (-karate.degree(u), u)).take(k)
      assert(byDf == byCsr, s"k=$k: $byDf vs $byCsr")
    }
  }

  test("topCfcc (exact path) ranks by L†_uu ascending") {
    val picks = Heuristics.topCfcc(spark, karate, 4)
    val diag = Cfcc.pseudoinverseDiag(karate)
    val expected = (0 until karate.n).sortBy(u => (diag(u), u)).take(4)
    assert(picks == expected)
  }

  test("topCfcc (estimated path) overlaps heavily with the exact ranking") {
    val g = karate
    val exact = Heuristics.topCfcc(spark, g, 6, denseLimit = 3000)
    val est = Heuristics.topCfcc(spark, g, 6, denseLimit = 1,
                                 ForestCfcm.Config(0.2, r0 = 8.0, seed = 3))
    assert(exact.toSet.intersect(est.toSet).size >= 4, s"exact=$exact est=$est")
  }

  test("greedy beats both heuristics on C(S) (karate, k=4) — the paper's Fig. 2 claim") {
    val g = karate
    val k = 4
    val cGreedy = g.n / ExactGreedy.run(g, k).traces.last
    val cDeg = Cfcc.exact(g, Heuristics.degreeTopK(karateDf, k).toSet)
    val cTop = Cfcc.exact(g, Heuristics.topCfcc(spark, g, k).toSet)
    assert(cGreedy >= cDeg - 1e-9, s"greedy $cGreedy vs degree $cDeg")
    assert(cGreedy >= cTop - 1e-9, s"greedy $cGreedy vs top-cfcc $cTop")
  }
}

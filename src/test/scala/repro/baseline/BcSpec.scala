package repro.baseline

import repro.{RefGraph, ReproSpec, TestGraphs}
import repro.core.{EnumConfig, HcQuery}

class BcSpec extends ReproSpec {

  private val cfg = EnumConfig(timeBudgetMs = 300000L, collectPaths = true)

  test("BC-DFS finds all paths on the layered DAG") {
    val r = BcDfs.run(spark, edgeDf(TestGraphs.layered), HcQuery(1L, 2L, 4), cfg)
    assert(pathSet(r.enum) == RefGraph.Ref(TestGraphs.layered).paths(1L, 2L, 4))
  }

  test("BC-DFS rejects walks on the cyclic graph") {
    val r = BcDfs.run(spark, edgeDf(TestGraphs.cyclic), HcQuery(1L, 2L, 4), cfg)
    assert(pathSet(r.enum) == Set(List(1L, 3L, 2L)))
  }

  test("BC-DFS B(v) check prunes by distance-to-t on the full graph") {
    // 5 is 3 hops from t; with k=3 any partial through 5 fails B-check
    val pairs = Seq((1L, 5L), (5L, 6L), (6L, 7L), (7L, 2L), (1L, 3L), (3L, 2L))
    val r = BcDfs.run(spark, edgeDf(pairs), HcQuery(1L, 2L, 3), cfg)
    assert(pathSet(r.enum) == Set(List(1L, 3L, 2L)))
  }

  test("BC-JOIN equals BC-DFS on figure1") {
    val q = HcQuery(1L, 2L, 4)
    val a = BcDfs.run(spark, edgeDf(TestGraphs.figure1), q, cfg)
    val b = BcJoin.run(spark, edgeDf(TestGraphs.figure1), q, cfg)
    assert(pathSet(a.enum) == pathSet(b.enum))
  }

  test("BC-JOIN cuts at the middle position") {
    val r = BcJoin.run(spark, edgeDf(TestGraphs.layered), HcQuery(1L, 2L, 5), cfg)
    assert(r.planInfo.cut.contains(3)) // ceil(5/2)
  }

  test("BC baselines expose no index metrics") {
    val r = BcDfs.run(spark, edgeDf(TestGraphs.layered), HcQuery(1L, 2L, 4), cfg)
    assert(r.indexEdges == -1)
  }

  for ((name, pairs) <- TestGraphs.randomCases(6, n = 12, e = 30)) {
    test(s"BC-DFS equals reference on $name k=4") {
      val r = BcDfs.run(spark, edgeDf(pairs), HcQuery(1L, 2L, 4), cfg)
      assert(pathSet(r.enum) == RefGraph.Ref(pairs).paths(1L, 2L, 4))
    }
    test(s"BC-JOIN equals reference on $name k=4") {
      val r = BcJoin.run(spark, edgeDf(pairs), HcQuery(1L, 2L, 4), cfg)
      assert(pathSet(r.enum) == RefGraph.Ref(pairs).paths(1L, 2L, 4))
    }
  }
}

package repro.core

import org.apache.spark.sql.functions._
import repro.{RefGraph, ReproSpec}

class ExtensionsSpec extends ReproSpec {

  // Weighted/labeled diamond: s=1, t=2 via 3 (w=1, lbl=1) or via 4 (w=5, lbl=2).
  private val wPairs = Seq(
    (1L, 3L, 1.0, 1L), (3L, 2L, 1.0, 1L),
    (1L, 4L, 5.0, 2L), (4L, 2L, 5.0, 2L),
    (3L, 4L, 1.0, 1L))
  private def weighted = {
    import spark.implicits._
    wPairs.map(e => (e._1, e._2, e._3)).toDF("src", "dst", "w")
  }
  private def labeled = {
    import spark.implicits._
    wPairs.map(e => (e._1, e._2, e._4)).toDF("src", "dst", "lbl")
  }

  test("predicate constraint filters edges before index build") {
    val q = HcQuery(1L, 2L, 4)
    val r = Extensions.withPredicate(spark, weighted, col("w") <= 1.0, q,
      EnumConfig(timeBudgetMs = 300000L, collectPaths = true))
    // only w<=1 edges: 1-3, 3-2, 3-4 remain; single path 1,3,2
    assert(pathSet(r.enum) == Set(List(1L, 3L, 2L)))
  }

  test("predicate that keeps everything changes nothing") {
    val q = HcQuery(1L, 2L, 4)
    val r = Extensions.withPredicate(spark, weighted, lit(true), q,
      EnumConfig(timeBudgetMs = 300000L, collectPaths = true))
    assert(pathSet(r.enum) ==
      RefGraph.Ref(wPairs.map(e => (e._1, e._2))).paths(1L, 2L, 4))
  }

  test("accumulative sum constraint keeps only low-risk paths") {
    val q = HcQuery(1L, 2L, 4)
    val (r, withAcc) = Extensions.accumulative(spark, weighted, q,
      init = 0.0, op = _ + _, accepts = _ <= 3.0,
      cfg = EnumConfig(timeBudgetMs = 300000L, collectPaths = true))
    assert(withAcc.map(_._1).toSet == Set(Seq(1L, 3L, 2L))) // sum 2.0
    assert(r.enum.results == 1)
  }

  test("accumulative values are computed correctly per path") {
    val q = HcQuery(1L, 2L, 4)
    val (_, withAcc) = Extensions.accumulative(spark, weighted, q,
      init = 0.0, op = _ + _, accepts = _ >= 0.0,
      cfg = EnumConfig(timeBudgetMs = 300000L, collectPaths = true))
    val weights = wPairs.map(e => (e._1, e._2) -> e._3).toMap
    for ((p, acc) <- withAcc) {
      val want = p.sliding(2).map(x => weights((x(0), x(1)))).sum
      assert(math.abs(acc - want) < 1e-9, s"path $p")
    }
  }

  test("monotone prune does not change the result set") {
    val q = HcQuery(1L, 2L, 4)
    val (_, a) = Extensions.accumulative(spark, weighted, q,
      init = 0.0, op = _ + _, accepts = _ <= 3.0,
      cfg = EnumConfig(timeBudgetMs = 300000L, collectPaths = true))
    val (_, b) = Extensions.accumulative(spark, weighted, q,
      init = 0.0, op = _ + _, accepts = _ <= 3.0,
      prune = Some(_ <= 3.0), // weights nonnegative: sums only grow
      cfg = EnumConfig(timeBudgetMs = 300000L, collectPaths = true))
    assert(a.toSet == b.toSet)
  }

  test("automaton constraint: paths must start with label 1") {
    import spark.implicits._
    // DFA: state 0 --lbl1--> 1 (accepting); state 1 loops on any label.
    val dfa = Seq((0L, 1L, 1L), (1L, 1L, 1L), (1L, 2L, 1L)).toDF("state", "lbl", "next")
    val q = HcQuery(1L, 2L, 4)
    val (_, got) = Extensions.automaton(spark, labeled, q, dfa,
      startState = 0L, acceptStates = Set(1L), EnumConfig(timeBudgetMs = 300000L, collectPaths = true))
    val all = RefGraph.Ref(wPairs.map(e => (e._1, e._2))).paths(1L, 2L, 4)
    val lbl = wPairs.map(e => (e._1, e._2) -> e._4).toMap
    val want = all.filter(p => lbl((p(0), p(1))) == 1L).map(_.toSeq)
    assert(got.map(_._1).toSet == want.toSet)
  }

  test("automaton with no accepting run yields nothing") {
    import spark.implicits._
    // only label-2 transitions exist from the start state
    val dfa = Seq((0L, 2L, 1L), (1L, 2L, 1L)).toDF("state", "lbl", "next")
    val q = HcQuery(1L, 2L, 4)
    val (_, got) = Extensions.automaton(spark, labeled, q, dfa,
      startState = 0L, acceptStates = Set(1L), EnumConfig(timeBudgetMs = 300000L, collectPaths = true))
    // 1->4 has lbl 2, then 4->2 lbl 2: path (1,4,2) qualifies
    assert(got.map(_._1).toSet == Set(Seq(1L, 4L, 2L)))
  }
}

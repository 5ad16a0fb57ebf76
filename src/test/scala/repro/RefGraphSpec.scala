package repro

import org.scalatest.funsuite.AnyFunSuite

/** Validation of the pure-Scala reference itself (no Spark): invariants the
  * whole test pyramid rests on. Random sweeps are seeded and cheap.
  */
class RefGraphSpec extends AnyFunSuite {
  import RefGraph._

  private val cases = (1 to 50).map(i => Ref(random(10, 25, seed = 900 + i)))

  test("every path is a walk") {
    for (r <- cases) {
      val w = r.walks(1L, 2L, 5).toSet
      assert(r.paths(1L, 2L, 5).forall(w.contains))
    }
  }

  test("paths are simple and walks may not be") {
    for (r <- cases; p <- r.paths(1L, 2L, 5)) assert(p.distinct == p)
  }

  test("paths start at s, end at t, interior excludes s and t") {
    for (r <- cases; p <- r.paths(1L, 2L, 6)) {
      assert(p.head == 1L && p.last == 2L)
      assert(!p.tail.init.exists(v => v == 1L || v == 2L))
    }
  }

  test("walks respect the hop constraint") {
    for (r <- cases; w <- r.walks(1L, 2L, 4)) assert(w.size - 1 <= 4)
  }

  test("paths are monotone in k") {
    for (r <- cases) {
      val p4 = r.paths(1L, 2L, 4); val p6 = r.paths(1L, 2L, 6)
      assert(p4.subsetOf(p6))
    }
  }

  test("bfs distance 0 only at the source") {
    for (r <- cases) {
      val d = r.bfs(1L, 6)
      assert(d(1L) == 0)
      assert(d.count(_._2 == 0) == 1)
    }
  }

  test("bfs distances grow by at most 1 along edges") {
    for (r <- cases) {
      val d = r.bfs(1L, 9)
      for ((u, v) <- r.edges if d.contains(u) && !Set(1L).contains(v))
        if (d.contains(v)) assert(d(v) <= d(u) + 1)
    }
  }

  test("noExpand never shortens distances") {
    for (r <- cases) {
      val base = r.bfs(1L, 6)
      val excl = r.bfs(1L, 6, noExpand = Set(3L))
      for ((v, d) <- excl) assert(base.getOrElse(v, Int.MaxValue) <= d)
    }
  }

  test("reverse bfs equals forward bfs on the reversed graph") {
    for (r <- cases) {
      val rev = Ref(r.edges.map(_.swap))
      assert(r.bfs(2L, 5, reverse = true) == rev.bfs(2L, 5))
    }
  }

  test("index edges are a subset of graph edges") {
    for (r <- cases) {
      val idx = r.indexEdges(1L, 2L, 5).toSet
      assert(idx.subsetOf(r.edges.toSet))
    }
  }

  test("enumerating over the index preserves all paths") {
    for (r <- cases) {
      val onIndex = Ref(r.indexEdges(1L, 2L, 5)).paths(1L, 2L, 5)
      assert(onIndex == r.paths(1L, 2L, 5))
    }
  }

  test("dp total equals walk count") {
    for (r <- cases) {
      val (f, b) = r.dp(1L, 2L, 5)
      val w = r.walks(1L, 2L, 5).size
      assert(f(5) == w && b(0) == w)
    }
  }

  test("dp forward levels count distinct padded prefixes") {
    for (r <- cases.take(20)) {
      val k = 4
      val (f, _) = r.dp(1L, 2L, k)
      val padded = r.walks(1L, 2L, k).map(w => w ++ List.fill(k + 1 - w.size)(2L))
      for (i <- 1 to k)
        assert(f(i) == padded.map(_.take(i + 1)).distinct.size, s"level $i")
    }
  }

  test("random generator has no self loops or duplicates") {
    val e = random(20, 60, seed = 5)
    assert(e.forall { case (a, b) => a != b })
    assert(e.distinct == e)
  }

  test("random generator is deterministic") {
    assert(random(15, 40, 3) == random(15, 40, 3))
  }
}

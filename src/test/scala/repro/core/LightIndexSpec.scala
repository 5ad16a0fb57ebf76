package repro.core

import repro.{RefGraph, ReproSpec, TestGraphs}

class LightIndexSpec extends ReproSpec {

  private val q = HcQuery(1L, 2L, 4)

  test("index on figure1 matches reference index edges") {
    val idx = LightIndex.build(spark, edgeDf(TestGraphs.figure1), q)
    try {
      val got = idx.edges.collect()
        .map(r => (r.getAs[Long]("src"), r.getAs[Long]("dst"))).toSet
      val want = RefGraph.Ref(TestGraphs.figure1).indexEdges(1L, 2L, 4).toSet
      assert(got == want)
    } finally idx.unpersist()
  }

  test("index drops vertices outside every result") {
    // vertex 9 (edge into s) and dead-end 7,8 cannot appear in any result
    val idx = LightIndex.build(spark, edgeDf(TestGraphs.figure1), q)
    try {
      val verts = idx.edges.collect()
        .flatMap(r => Seq(r.getAs[Long]("src"), r.getAs[Long]("dst"))).toSet
      assert(!verts.contains(9L))
      assert(!verts.contains(7L))
      assert(!verts.contains(8L))
    } finally idx.unpersist()
  }

  test("every index edge satisfies the Alg. 3 conditions") {
    val ref = RefGraph.Ref(TestGraphs.figure1)
    val dS = ref.ds(1L, 2L, 4); val dT = ref.dt(1L, 2L, 4)
    val idx = LightIndex.build(spark, edgeDf(TestGraphs.figure1), q)
    try {
      idx.edges.collect().foreach { r =>
        val src = r.getAs[Long]("src"); val dst = r.getAs[Long]("dst")
        val (srcDs, srcDt, dstDs, dstDt) = (r.getAs[Int]("srcDs"), r.getAs[Int]("srcDt"),
          r.getAs[Int]("dstDs"), r.getAs[Int]("dstDt"))
        assert(dS(src) == srcDs && dT(src) == srcDt, s"distances wrong for $src")
        assert(dS(dst) == dstDs && dT(dst) == dstDt, s"distances wrong for $dst")
        assert(srcDs + srcDt <= q.k && dstDs + dstDt <= q.k && srcDs + dstDt + 1 <= q.k)
        assert(src != q.t)
      }
    } finally idx.unpersist()
  }

  test("index never has more edges than the graph") {
    val idx = LightIndex.build(spark, edgeDf(TestGraphs.figure1), q)
    try assert(idx.edgeCount <= TestGraphs.figure1.size)
    finally idx.unpersist()
  }

  test("cSet(0) is {s} and cSet(k) contains t when reachable") {
    val idx = LightIndex.build(spark, edgeDf(TestGraphs.layered), HcQuery(1L, 2L, 4))
    try {
      assert(idx.cSet(0).collect().map(_.getLong(0)).toSet == Set(1L))
      assert(idx.cSet(4).collect().map(_.getLong(0)).toSet.contains(2L))
    } finally idx.unpersist()
  }

  test("iT returns dt-bounded neighbors (Example 4.4 semantics)") {
    val idx = LightIndex.build(spark, edgeDf(TestGraphs.figure1), q)
    try {
      // neighbors of v0=3 with dt <= 2: t (dt 0) and v1=4 (dt 2); cycle 6 has dt 1... compute via ref
      val ref = RefGraph.Ref(TestGraphs.figure1)
      val dT = ref.dt(1L, 2L, 4)
      val want = ref.indexEdges(1L, 2L, 4)
        .collect { case (3L, v) if dT(v) <= 2 => v }.toSet
      assert(idx.iT(3L, 2).collect().map(_.getLong(0)).toSet == want)
    } finally idx.unpersist()
  }

  test("memoryBytes counts edge and vertex cells") {
    val idx = LightIndex.build(spark, edgeDf(TestGraphs.layered), HcQuery(1L, 2L, 4))
    try assert(idx.memoryBytes == idx.edgeCount * 48 + idx.vertexCount * 24)
    finally idx.unpersist()
  }

  for ((name, pairs) <- TestGraphs.randomCases(5)) {
    test(s"index matches reference on $name") {
      val idx = LightIndex.build(spark, edgeDf(pairs), HcQuery(1L, 2L, 5))
      try {
        val got = idx.edges.collect()
          .map(r => (r.getAs[Long]("src"), r.getAs[Long]("dst"))).toSet
        val want = RefGraph.Ref(pairs).indexEdges(1L, 2L, 5).toSet
        assert(got == want)
      } finally idx.unpersist()
    }
  }
}

package repro

import org.apache.spark.sql.DataFrame
import repro.graph.GraphGen

/** Base for this repo's suites: SparkSpec plus small-data tuning and
  * reference-vs-Spark helpers.
  */
trait ReproSpec extends SparkSpec {

  override def beforeAll(): Unit = {
    super.beforeAll()
    // Small shuffle fan-out (graphs are modest), but keep real parallelism:
    // AQE's partition coalescing folds our sub-64MB shuffles into a single
    // partition and serializes every join onto one core.
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    spark.conf.set("spark.sql.adaptive.coalescePartitions.enabled", "false")
    spark.sparkContext.setLogLevel("WARN")
  }

  def edgeDf(pairs: Seq[(Long, Long)]): DataFrame =
    GraphGen.fromPairs(spark, pairs)

  /** Canonical path set from an EnumResult that collected paths. */
  def pathSet(r: repro.core.EnumResult): Set[List[Long]] =
    r.paths.getOrElse(fail("run did not collect paths")).map(_.toList).toSet
}

/** Hand-built and random graph fixtures shared across suites. */
object TestGraphs {
  // Layered DAG where every walk is a path (Example 5.2's G0 flavor):
  // s=1, t=2; layers {3,4} -> {5,6} -> {7,8}.
  val layered: Seq[(Long, Long)] = Seq(
    (1L, 3L), (1L, 4L),
    (3L, 5L), (3L, 6L), (4L, 5L), (4L, 6L),
    (5L, 7L), (5L, 8L), (6L, 7L), (6L, 8L),
    (7L, 2L), (8L, 2L))

  // Graph with a 2-cycle feeding walks that are not paths (Example 5.2's G1
  // flavor): s=1, t=2, s->3->t, 3<->4 cycle.
  val cyclic: Seq[(Long, Long)] = Seq(
    (1L, 3L), (3L, 2L), (3L, 4L), (4L, 3L), (4L, 5L), (5L, 4L))

  // Figure 1 flavor: multiple path lengths from s=1 to t=2, a vertex (9)
  // outside every result, and shortcut edges.
  val figure1: Seq[(Long, Long)] = Seq(
    (1L, 3L), (3L, 2L),          // s -> v0 -> t (length 2)
    (3L, 4L), (4L, 5L), (5L, 2L),// s -> v0 -> v1 -> v2 -> t (length 4)
    (3L, 6L), (6L, 3L),          // v0 <-> v6 cycle (walks, not paths)
    (1L, 7L), (7L, 8L),          // dead-end branch
    (9L, 1L))                    // edge into s (never used)

  /** Random graphs for equivalence sweeps: (name, edges, s, t). s=1, t=2
    * are forced to exist via an ensured edge into the graph body. */
  def randomCases(count: Int, n: Int = 12, e: Int = 30): Seq[(String, Seq[(Long, Long)])] =
    (1 to count).map { i =>
      val edges = (RefGraph.random(n, e, seed = 77 + i) ++
        Seq((1L, 3L), (4L, 2L))).distinct.filter { case (a, b) => a != b }
      (s"random-$i(n=$n,e=${edges.size})", edges)
    }
}

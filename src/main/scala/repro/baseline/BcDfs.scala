package repro.baseline

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel
import repro.core.{EnumConfig, EnumResult, HcQuery, LeftDeepEnum, PathEnumResult, PlanInfo}
import repro.graph.{Bfs, GraphGen}

/** BC-DFS baseline — the state-of-the-art polynomial-delay competitor [29]
  * cast into the same dataflow engine.
  *
  * Algorithm 1: expand over the **full** edge list; before the search, one
  * BFS from `t` along `G^r` initializes `B(v) = S(v, t | G)`, and each step
  * only checks `L(M) + 1 + B(v') <= k` plus the duplicate-vertex test. (The
  * dynamic barrier maintenance of [29] prunes sub-trees discovered empty;
  * the paper's own measurements — Figure 6 — show it removes few additional
  * partial results versus the static distance check, so the static check is
  * the faithful cost model here.) The contrast with IDX-DFS is exactly the
  * paper's: the join touches every neighbor of the frontier (no `ds`-side
  * pruning, no pre-reduced relation), so far more edges flow per level.
  */
object BcDfs {

  /** Edge relation: full edges with `er_dt = B(dst)`; vertices that cannot
    * reach `t` drop out (their check can never pass), and edges out of `t`
    * are never followed (Definition 2.1 stops at t). */
  def relation(spark: SparkSession, graphEdges: DataFrame, q: HcQuery): (DataFrame, Double) = {
    val t0 = System.nanoTime()
    val b = Bfs.distances(spark, GraphGen.reverse(graphEdges), q.t, q.k)
    val tJoin = System.nanoTime()
    val rel = graphEdges
      .join(b.select(col("v").as("dst"), col("dist").as("er_dt")), "dst")
      .where(col("src") =!= q.t)
      .select(col("src").as("er_src"), col("dst").as("er_dst"), col("er_dt"))
      .persist(StorageLevel.MEMORY_AND_DISK)
    rel.count()
    if (sys.env.contains("REPRO_DEBUG")) Console.err.println(
      f"[bcrel] bfs=${(tJoin - t0) / 1e6}%.0f ms join=${(System.nanoTime() - tJoin) / 1e6}%.0f ms")
    (rel, (System.nanoTime() - t0) / 1e6)
  }

  def run(spark: SparkSession, graphEdges: DataFrame, q: HcQuery,
          cfg: EnumConfig = EnumConfig()): PathEnumResult = {
    val (rel, prepMs) = relation(spark, graphEdges, q)
    try {
      val res: EnumResult = LeftDeepEnum.run(spark, rel, q, cfg)
      PathEnumResult(res, PlanInfo("BC-DFS", -1, None, None, None),
        prepMs, 0.0, -1, -1)
    } finally rel.unpersist(blocking = false)
  }
}

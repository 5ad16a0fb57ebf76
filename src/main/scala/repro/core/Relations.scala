package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** The join-based model of Section 3.1 and the full reducer (Algorithm 2).
  *
  * A query `q(s,t,k)` becomes a chain join
  * `Q = R_1(u_0,u_1) ⋈ ... ⋈ R_k(u_{k-1},u_k)` whose relations are derived
  * from the edge list with three properties:
  *   1. `R_1 = {(s,v)}`, `R_k = {(v,t) | v != s} ∪ {(t,t)}`,
  *   2. `R_i = {(v,v') in E(G − {s}) | v != t} ∪ {(t,t)}` for `1 < i < k`,
  *   3. the `(t,t)` self-loop pads paths shorter than k to length-k tuples.
  *
  * Evaluating Q and dropping tuples with duplicate vertices (ignoring the
  * trailing t-padding) yields exactly `P(s,t,k,G)` (Theorem 3.1). This
  * module exists to validate that model and to provide the full-reducer
  * comparison point for the light-weight index (Section 4.1 / Appendix B);
  * the production enumeration paths use [[LightIndex]] instead.
  */
object Relations {

  /** Relations R_1..R_k per the Section 3.1 construction (Alg. 2 lines 1-4).
    * Each has columns (src, dst).
    */
  def build(spark: SparkSession, edges: DataFrame, q: HcQuery): Seq[DataFrame] = {
    import spark.implicits._
    val tt = Seq((q.t, q.t)).toDF("src", "dst")
    val r1 = edges.where(col("src") === q.s)
    val rk = edges.where(col("dst") === q.t && col("src") =!= q.s).union(tt)
    val mid = edges
      .where(col("src") =!= q.s && col("dst") =!= q.s && col("src") =!= q.t)
      .union(tt)
    if (q.k == 2) Seq(r1, rk)
    else r1 +: Seq.fill(q.k - 2)(mid) :+ rk
  }

  /** Full reducer (Alg. 2 lines 5-12): forward then backward semi-join
    * passes remove dangling tuples; afterwards every remaining tuple joins
    * into at least one full result (Proposition 4.2).
    */
  def fullReduce(rels: Seq[DataFrame]): Seq[DataFrame] = {
    // USING joins put the join key first in the output — re-project to keep
    // every relation in (src, dst) shape.
    val fwd = rels.tail.scanLeft(rels.head) { (prev, r) =>
      r.join(prev.select(col("dst").as("src")).distinct(), Seq("src"), "left_semi")
        .select("src", "dst")
    }
    val bwd = fwd.init.scanRight(fwd.last) { (r, next) =>
      r.join(next.select(col("src").as("dst")).distinct(), Seq("dst"), "left_semi")
        .select("src", "dst")
    }
    bwd
  }

  /** Evaluate the chain join left-to-right and keep simple paths only:
    * returns a DataFrame with one array column `path` (trailing t-padding
    * stripped). Used by tests to validate Theorem 3.1.
    */
  def evaluate(spark: SparkSession, rels: Seq[DataFrame], q: HcQuery): DataFrame = {
    val first = rels.head.select(array(col("src"), col("dst")).as("path"), col("dst").as("last"))
    val joined = rels.tail.foldLeft(first) { (acc, r) =>
      acc.join(r, acc("last") === r("src"))
        .select(concat(col("path"), array(col("dst"))).as("path"), col("dst").as("last"))
    }
    // Strip the trailing t-padding, then keep tuples that are simple paths.
    joined
      .select(slice(col("path"), lit(1), array_position(col("path"), q.t).cast("int")).as("path"))
      .where(size(array_distinct(col("path"))) === size(col("path")))
  }
}

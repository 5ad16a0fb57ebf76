package repro

/** Pure-Scala reference implementations used as ground truth in tests.
  *
  * Everything here is the naive, obviously-correct version: backtracking
  * enumeration, queue BFS, and a direct transcription of the paper's
  * equations on driver-side collections. The Spark dataflow modules are
  * validated against these on small graphs.
  */
object RefGraph {

  final case class Ref(edges: Seq[(Long, Long)]) {
    val adj: Map[Long, Seq[Long]] =
      edges.groupBy(_._1).view.mapValues(_.map(_._2).distinct.sorted).toMap
    val radj: Map[Long, Seq[Long]] =
      edges.groupBy(_._2).view.mapValues(_.map(_._1).distinct.sorted).toMap
    def out(v: Long): Seq[Long] = adj.getOrElse(v, Seq.empty)
    def in(v: Long): Seq[Long] = radj.getOrElse(v, Seq.empty)

    /** BFS distances from `source`; vertices in `noExpand` are reached but
      * never expanded through (the paper's G − {x} interior-exclusion). */
    def bfs(source: Long, maxHops: Int, noExpand: Set[Long] = Set.empty,
            reverse: Boolean = false): Map[Long, Int] = {
      val nbr: Long => Seq[Long] = if (reverse) in else out
      var dist = Map(source -> 0)
      var frontier = Seq(source)
      var d = 1
      while (frontier.nonEmpty && d <= maxHops) {
        val next = frontier.filterNot(noExpand)
          .flatMap(nbr).distinct.filterNot(dist.contains)
        next.foreach(v => dist += v -> d)
        frontier = next
        d += 1
      }
      dist
    }

    /** All simple paths s -> t with <= k edges, interior not in {s, t}. */
    def paths(s: Long, t: Long, k: Int): Set[List[Long]] = {
      val acc = Set.newBuilder[List[Long]]
      def go(m: List[Long], last: Long): Unit = {
        if (last == t) acc += m.reverse
        else if (m.length <= k) // m has length edges+1
          for (v <- out(last) if v != s && (v == t || !m.contains(v)) && m.length + 1 <= k + 1)
            go(v :: m, v)
      }
      go(List(s), s)
      acc.result()
    }

    /** All walks s -> t with <= k edges, interior not in {s, t}. */
    def walks(s: Long, t: Long, k: Int): Seq[List[Long]] = {
      val acc = Seq.newBuilder[List[Long]]
      def go(m: List[Long], last: Long): Unit = {
        if (last == t) acc += m.reverse
        else if (m.length <= k)
          for (v <- out(last) if v != s && m.length + 1 <= k + 1) go(v :: m, v)
      }
      go(List(s), s)
      acc.result()
    }

    /** Index distances as the paper defines them. */
    def ds(s: Long, t: Long, k: Int): Map[Long, Int] = bfs(s, k, noExpand = Set(t))
    def dt(s: Long, t: Long, k: Int): Map[Long, Int] =
      bfs(t, k, noExpand = Set(s), reverse = true)

    /** The light-weight index edge set (Alg. 3 conditions). */
    def indexEdges(s: Long, t: Long, k: Int): Seq[(Long, Long)] = {
      val dS = ds(s, t, k); val dT = dt(s, t, k)
      edges.filter { case (u, v) =>
        dS.contains(u) && dT.contains(u) && dS.contains(v) && dT.contains(v) &&
        dS(u) + dT(u) <= k && dS(v) + dT(v) <= k && dS(u) + dT(v) + 1 <= k &&
        u != t && v != s
      }
    }

    /** Reference transcription of the full-fledged DP (Eq. 6/7 + padding):
      * returns (forward, backward) level sums, forward(i) = |Q[0:i]|,
      * backward(i) = |Q[i:k]|. */
    def dp(s: Long, t: Long, k: Int): (Seq[Long], Seq[Long]) = {
      val dS = ds(s, t, k); val dT = dt(s, t, k)
      val idx = indexEdges(s, t, k) :+ (t -> t)
      def dsOf(v: Long): Int = if (v == t) dS.getOrElse(t, k + 1) else dS(v)
      def dtOf(v: Long): Int = if (v == t) 0 else dT(v)

      val back = Array.fill[Map[Long, Long]](k + 1)(Map.empty)
      back(k) = Map(t -> 1L)
      for (i <- (k - 1) to 0 by -1) {
        var m = Map.empty[Long, Long]
        for ((u, v) <- idx
             if dsOf(u) <= i && dtOf(u) <= k - i && dtOf(v) <= k - i - 1
             && back(i + 1).contains(v))
          m += u -> (m.getOrElse(u, 0L) + back(i + 1)(v))
        back(i) = m
      }
      val fwd = Array.fill[Map[Long, Long]](k + 1)(Map.empty)
      fwd(0) = Map(s -> 1L)
      for (i <- 1 to k) {
        var m = Map.empty[Long, Long]
        for ((u, v) <- idx
             if dsOf(u) <= i - 1 && dtOf(u) <= k - (i - 1) && dtOf(v) <= k - i
             && fwd(i - 1).contains(u))
          m += v -> (m.getOrElse(v, 0L) + fwd(i - 1)(u))
        fwd(i) = m
      }
      (fwd.map(_.values.sum).toSeq, back.map(_.values.sum).toSeq)
    }
  }

  /** Deterministic random digraph: distinct edges, no self-loops. */
  def random(n: Int, e: Int, seed: Long): Seq[(Long, Long)] = {
    val rng = new scala.util.Random(seed)
    val acc = scala.collection.mutable.LinkedHashSet.empty[(Long, Long)]
    var attempts = 0
    while (acc.size < e && attempts < 50 * e + 100) {
      val a = rng.nextInt(n).toLong + 1
      val b = rng.nextInt(n).toLong + 1
      if (a != b) acc += ((a, b))
      attempts += 1
    }
    acc.toSeq
  }
}

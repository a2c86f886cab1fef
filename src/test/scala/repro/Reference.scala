package repro

import scala.collection.mutable

/** In-memory, single-threaded reference implementations of the four graph
  * algorithms, used as correctness oracles for the GraphX implementations.
  * Deliberately naive — correctness over speed; only run on tiny graphs.
  */
object Reference {

  /** All endpoints of an edge list. */
  def vertices(edges: Seq[(Long, Long)]): Set[Long] =
    edges.flatMap(e => Seq(e._1, e._2)).toSet

  /** Static PageRank with the GraphX semantics: rank starts at 1.0 and each
    * iteration sets rank(v) = reset + (1-reset) * sum of rank(u)/outDeg(u)
    * over in-neighbours u.
    */
  def pageRank(edges: Seq[(Long, Long)], iters: Int, resetProb: Double = 0.15): Map[Long, Double] = {
    val vs     = vertices(edges)
    val outDeg = edges.groupBy(_._1).map { case (v, es) => v -> es.size }
    var rank   = vs.map(_ -> 1.0).toMap
    for (_ <- 0 until iters) {
      val incoming = mutable.Map.empty[Long, Double].withDefaultValue(0.0)
      for ((u, v) <- edges) incoming(v) += rank(u) / outDeg(u)
      rank = vs.map(v => v -> (resetProb + (1 - resetProb) * incoming(v))).toMap
    }
    rank
  }

  /** Weakly connected components labelled by the minimum vertex ID. */
  def components(edges: Seq[(Long, Long)]): Map[Long, Long] = {
    val parent = mutable.Map.empty[Long, Long]
    def find(x: Long): Long = {
      val p = parent.getOrElseUpdate(x, x)
      if (p == x) x else { val r = find(p); parent(x) = r; r }
    }
    def union(a: Long, b: Long): Unit = {
      val (ra, rb) = (find(a), find(b))
      if (ra != rb) parent(math.max(ra, rb)) = math.min(ra, rb)
    }
    vertices(edges).foreach(v => find(v))
    edges.foreach { case (a, b) => union(a, b) }
    vertices(edges).map(v => v -> find(v)).toMap
  }

  /** Distinct triangles by brute-force enumeration over vertex triples of the
    * undirected simple graph.
    */
  def triangles(edges: Seq[(Long, Long)]): Long = {
    val und = edges.collect { case (a, b) if a != b =>
      (math.min(a, b), math.max(a, b))
    }.toSet
    val vs = vertices(edges).toSeq.sorted
    (for {
      i <- vs.indices
      j <- (i + 1) until vs.size
      if und((vs(i), vs(j)))
      k <- (j + 1) until vs.size
      if und((vs(j), vs(k))) && und((vs(i), vs(k)))
    } yield 1).size.toLong
  }

  /** Per-vertex triangle counts (triangles through each vertex). */
  def trianglesPerVertex(edges: Seq[(Long, Long)]): Map[Long, Int] = {
    val und = edges.collect { case (a, b) if a != b =>
      (math.min(a, b), math.max(a, b))
    }.toSet
    val vs     = vertices(edges).toSeq.sorted
    val counts = mutable.Map.empty[Long, Int].withDefaultValue(0)
    for {
      i <- vs.indices
      j <- (i + 1) until vs.size
      if und((vs(i), vs(j)))
      k <- (j + 1) until vs.size
      if und((vs(j), vs(k))) && und((vs(i), vs(k)))
    } {
      counts(vs(i)) += 1; counts(vs(j)) += 1; counts(vs(k)) += 1
    }
    vs.map(v => v -> counts(v)).toMap
  }

  /** Hop distance from every vertex to `landmark`, following edge direction
    * (v → … → landmark), i.e. BFS over reversed edges from the landmark.
    * Matches ShortestPathsAlg / graphx.lib.ShortestPaths semantics.
    */
  def distancesTo(edges: Seq[(Long, Long)], landmark: Long): Map[Long, Int] = {
    val reverseAdj = edges.groupBy(_._2).map { case (v, es) => v -> es.map(_._1) }
    val dist       = mutable.Map(landmark -> 0)
    val queue      = mutable.Queue(landmark)
    while (queue.nonEmpty) {
      val v = queue.dequeue()
      for (u <- reverseAdj.getOrElse(v, Nil) if !dist.contains(u)) {
        dist(u) = dist(v) + 1
        queue.enqueue(u)
      }
    }
    dist.toMap
  }

  /** Reference partitioning metrics, computed naively from an assignment. */
  def metrics(assigned: Seq[(Long, Long, Int)], numParts: Int): (Double, Long, Long, Long, Double) = {
    val sizes = (0 until numParts).map(p => assigned.count(_._3 == p).toLong)
    val mean  = sizes.sum.toDouble / numParts
    val balance = if (sizes.sum == 0) 1.0 else sizes.max / mean
    val stdev   = math.sqrt(sizes.map(s => (s - mean) * (s - mean)).sum / numParts)
    val replicas = assigned
      .flatMap { case (s, d, p) => Seq((s, p), (d, p)) }
      .distinct
      .groupBy(_._1)
      .map { case (v, ps) => v -> ps.size }
    val nonCut   = replicas.count(_._2 == 1).toLong
    val cut      = replicas.count(_._2 > 1).toLong
    val commCost = replicas.values.filter(_ > 1).map(_.toLong).sum
    (balance, nonCut, cut, commCost, stdev)
  }

  /** Deterministic random edge list for tests (no self-loops, deduplicated). */
  def randomEdges(numVertices: Int, numEdges: Int, seed: Long): Seq[(Long, Long)] = {
    val rng = new scala.util.Random(seed)
    Iterator
      .continually((rng.nextInt(numVertices).toLong, rng.nextInt(numVertices).toLong))
      .filter { case (a, b) => a != b }
      .take(numEdges)
      .toSeq
      .distinct
  }
}

package repro.algorithms

import org.apache.spark.graphx._
import scala.reflect.ClassTag

/** Static PageRank, implemented from scratch with the same semantics as
  * GraphX's `lib.PageRank.run` (which serves as the baseline in tests):
  * rank_i+1(v) = resetProb + (1 - resetProb) · Σ_{u→v} rank_i(u) / outDeg(u),
  * iterated a fixed number of supersteps. This is the paper's
  * "communication-bound, per-edge work" representative.
  */
object PageRankAlg {

  /** Ranks after `numIter` iterations; edge attributes hold 1/outDegree. */
  def run[VD: ClassTag, ED: ClassTag](
      graph: Graph[VD, ED],
      numIter: Int,
      resetProb: Double = 0.15): Graph[Double, Double] = {
    require(numIter > 0, s"numIter must be positive, got $numIter")
    require(resetProb > 0 && resetProb < 1, s"resetProb out of (0,1): $resetProb")

    var rankGraph: Graph[Double, Double] = graph
      .outerJoinVertices(graph.outDegrees) { (_, _, deg) => deg.getOrElse(0) }
      .mapTriplets(e => 1.0 / e.srcAttr, TripletFields.Src)
      .mapVertices((_, _) => 1.0)

    var iteration = 0
    while (iteration < numIter) {
      rankGraph.cache()
      val rankUpdates = rankGraph.aggregateMessages[Double](
        ctx => ctx.sendToDst(ctx.srcAttr * ctx.attr),
        _ + _,
        TripletFields.Src)
      val prev = rankGraph
      // Vertices with no in-edges receive no message and settle at resetProb.
      rankGraph = rankGraph.outerJoinVertices(rankUpdates) { (_, _, msgSum) =>
        resetProb + (1.0 - resetProb) * msgSum.getOrElse(0.0)
      }
      rankGraph.cache()
      rankGraph.edges.foreachPartition(_ => ()) // materialize before unpersisting parent
      prev.unpersistVertices(blocking = false)
      prev.edges.unpersist(blocking = false)
      iteration += 1
    }
    rankGraph
  }
}

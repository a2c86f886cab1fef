package repro.algorithms

import org.apache.spark.graphx._
import scala.reflect.ClassTag

/** Single-source (multi-landmark) shortest paths by Pregel, from scratch with
  * the same semantics as GraphX's `lib.ShortestPaths` baseline: each vertex
  * converges to a map landmark → hop distance, propagated against edge
  * direction (a vertex's distance to a landmark is 1 + its out-neighbour's
  * distance). Unreachable landmarks are absent from the map. The paper's
  * "diameter-bound iterative" representative.
  */
object ShortestPathsAlg {

  /** landmark → hop distance. */
  type SPMap = Map[VertexId, Int]

  private def makeMap(pairs: (VertexId, Int)*): SPMap = Map(pairs: _*)

  private def increment(m: SPMap): SPMap = m.map { case (k, v) => k -> (v + 1) }

  private def merge(a: SPMap, b: SPMap): SPMap =
    (a.keySet ++ b.keySet).map { k =>
      k -> math.min(a.getOrElse(k, Int.MaxValue), b.getOrElse(k, Int.MaxValue))
    }.toMap

  /** Distances from every vertex to each landmark (following edge direction
    * from the vertex towards the landmark).
    */
  def run[VD: ClassTag, ED: ClassTag](
      graph: Graph[VD, ED],
      landmarks: Seq[VertexId]): Graph[SPMap, ED] = {
    require(landmarks.nonEmpty, "need at least one landmark")
    val initial = graph.mapVertices { (vid, _) =>
      if (landmarks.contains(vid)) makeMap(vid -> 0) else makeMap()
    }
    Pregel(initial, makeMap())(
      vprog = (_, attr, msg) => merge(attr, msg),
      sendMsg = triplet => {
        val candidate = merge(increment(triplet.dstAttr), triplet.srcAttr)
        if (candidate != triplet.srcAttr) Iterator((triplet.srcId, candidate))
        else Iterator.empty
      },
      mergeMsg = merge)
  }
}

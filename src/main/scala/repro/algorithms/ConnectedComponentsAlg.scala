package repro.algorithms

import org.apache.spark.graphx._
import scala.reflect.ClassTag

/** Connected components by min-label propagation over Pregel, from scratch
  * with the same semantics as GraphX's `lib.ConnectedComponents` baseline:
  * every vertex converges to the smallest vertex ID in its (weakly) connected
  * component. The paper's "label-propagation, fast-converging" representative.
  */
object ConnectedComponentsAlg {

  /** Graph whose vertex attribute is the component label (min vertex ID). */
  def run[VD: ClassTag, ED: ClassTag](
      graph: Graph[VD, ED],
      maxIterations: Int = Int.MaxValue): Graph[VertexId, ED] = {
    val initial = graph.mapVertices((vid, _) => vid)
    Pregel(initial, Long.MaxValue, maxIterations, EdgeDirection.Either)(
      vprog = (_, attr, msg) => math.min(attr, msg),
      sendMsg = triplet =>
        if (triplet.srcAttr < triplet.dstAttr) {
          Iterator((triplet.dstId, triplet.srcAttr))
        } else if (triplet.dstAttr < triplet.srcAttr) {
          Iterator((triplet.srcId, triplet.dstAttr))
        } else {
          Iterator.empty
        },
      mergeMsg = math.min)
  }

  /** Number of weakly connected components. */
  def count[VD: ClassTag, ED: ClassTag](graph: Graph[VD, ED]): Long =
    run(graph).vertices.values.distinct().count()
}

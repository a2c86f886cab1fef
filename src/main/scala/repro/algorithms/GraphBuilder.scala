package repro.algorithms

import org.apache.spark.graphx.{Edge, Graph, PartitionStrategy}
import org.apache.spark.sql.DataFrame
import org.apache.spark.storage.StorageLevel

/** Bridge from the DataFrame edge-list representation (used by the generators
  * and the metric layer) to a partitioned GraphX [[Graph]] (used by the
  * algorithms). Partitioning happens through GraphX's documented extension
  * point, `Graph.partitionBy(strategy, numParts)` — exactly the code path the
  * paper evaluates.
  */
object GraphBuilder {

  /** Build a graph whose edges are distributed by `strategy` into `numParts`
    * partitions. Vertex and edge attributes are unit values; the algorithms
    * re-attach whatever state they need.
    */
  def partitioned(
      edges: DataFrame,
      strategy: PartitionStrategy,
      numParts: Int): Graph[Int, Int] = {
    val edgeRdd = edges
      .select("src", "dst")
      .rdd
      .map(r => Edge(r.getLong(0), r.getLong(1), 1))
    Graph
      .fromEdges(edgeRdd, defaultValue = 1,
        edgeStorageLevel = StorageLevel.MEMORY_AND_DISK,
        vertexStorageLevel = StorageLevel.MEMORY_AND_DISK)
      .partitionBy(strategy, numParts)
  }
}

package repro.jobs

import repro.graph.{Datasets, GraphOps}
import repro.partition.Metrics

/** Debug probe: print the metric row(s) for one dataset/partition-count.
  * Usage: runMain repro.jobs.MetricsProbe [dataset] [div] [numParts]
  */
object MetricsProbe {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("probe")
    val name  = if (args.length > 0) args(0) else "follow-dec"
    val div   = if (args.length > 1) args(1).toInt else 100
    val parts = if (args.length > 2) args(2).toInt else 256
    val edges = Datasets.edges(spark, name, div).cache()
    println(s"edges=${edges.count()} vertices=${GraphOps.numVertices(edges)} " +
      s"bytes=${GraphOps.sizeOnDiskBytes(edges)}")
    Metrics.computeAll(name, edges, parts).foreach(m => println(m.tableRow))
    spark.stop()
  }
}

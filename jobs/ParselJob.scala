package repro.jobs

import repro.core.{Experiments, Parsel}
import repro.graph.Datasets

/** Runs the PARSEL selector over every (dataset, algorithm) pair: the chosen
  * partitioner and granularity, from metrics alone.
  */
object ParselJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("parsel")
    val div   = JobSession.divArg(args, Experiments.timedDiv)
    val largest = Datasets.all.map(_.paperEdges / div).max
    for (spec <- Datasets.all) {
      val edges = Datasets.edges(spark, spec, div).cache()
      val numEdges = edges.count()
      for (kind <- Parsel.algoKinds) {
        val parts = Parsel.granularity(kind, numEdges, largest,
          Experiments.coarseParts, Experiments.fineParts)
        val sel = Parsel.select(spec.name, edges, kind.algoClass, parts)
        println(f"${spec.name}%-14s ${kind.name}%-20s -> ${sel.strategy.name}%-5s " +
          f"@ $parts%3d partitions (criterion=${Parsel.criterion(sel.metrics.find(_.partitioner == sel.strategy.name).get, kind.algoClass)})")
      }
      edges.unpersist()
    }
    spark.stop()
  }
}

package repro.jobs

import repro.core.{Experiments, Parsel}

/** Reproduces Figures 3–6 in tabular form: for each algorithm and granularity,
  * the Pearson correlation of execution time with CommCost and with Cut, plus
  * the best partitioner per dataset.
  */
object CorrelationJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("correlation")
    val div   = JobSession.divArg(args, Experiments.timedDiv)
    val partsList = Seq(Experiments.coarseParts, Experiments.fineParts)
    for (kind <- Parsel.algoKinds) {
      println(s"=== ${kind.name}: timed sweep (scale 1/$div, partitions ${partsList.mkString("/")}) ===")
      val cells = Experiments.timedSweep(spark, kind, div, partsList)
      for (parts <- partsList) {
        val rCommCost = Experiments.correlation(cells, parts, _.commCost)
        val rCut      = Experiments.correlation(cells, parts, _.cut)
        println(f"  parts=$parts%3d  corr(time, CommCost)=${100 * rCommCost}%6.1f%%  " +
          f"corr(time, Cut)=${100 * rCut}%6.1f%%")
        Experiments.bestPartitioner(cells, parts).toSeq.sortBy(_._1).foreach {
          case (d, p) => println(f"    best($d%-14s) = $p")
        }
      }
      cells.foreach(c => println(
        f"  ${c.run.dataset}%-14s ${c.run.partitioner}%-5s parts=${c.run.numPartitions}%3d " +
        f"${c.run.millis}%10.1f ms  commCost=${c.metrics.commCost}%10d cut=${c.metrics.cut}%10d"))
    }
    spark.stop()
  }
}

package repro.jobs

import repro.core.{Experiments, Parsel}

/** Debug probe: time one algorithm sweep over one dataset at the timed scale.
  * Usage: runMain repro.jobs.TimingProbe [dataset] [algo] [div]
  */
object TimingProbe {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("timingprobe")
    val name = if (args.length > 0) args(0) else "follow-dec"
    val kind = if (args.length > 1) Parsel.algoKinds.find(_.name == args(1)).get else Parsel.PR
    val div  = if (args.length > 2) args(2).toInt else Experiments.timedDiv
    val t0 = System.nanoTime()
    val cells = Experiments.timedSweep(spark, kind, div,
      datasets = Seq(repro.graph.Datasets.byName(name)))
    val total = (System.nanoTime() - t0) / 1e9
    cells.foreach(c => println(
      f"${c.run.dataset}%-14s ${c.run.partitioner}%-5s parts=${c.run.numPartitions}%3d " +
      f"${c.run.millis}%10.1f ms commCost=${c.metrics.commCost}%9d cut=${c.metrics.cut}%9d"))
    println(f"sweep wall time: $total%.1f s")
    spark.stop()
  }
}

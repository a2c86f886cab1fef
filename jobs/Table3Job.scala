package repro.jobs

import repro.core.Experiments

/** Reproduces Table 3: the five partitioning metrics for every
  * (dataset × partitioner) at 256 partitions.
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("table3")
    val div   = JobSession.divArg(args, Experiments.metricDiv)
    println(s"=== Table 3: partitioning metrics @ ${Experiments.PaperFine} partitions (scale 1/$div) ===")
    println(f"${"Dataset"}%-14s ${"Part."}%-5s ${"Balance"}%7s ${"NonCut"}%12s ${"Cut"}%12s " +
      f"${"CommCost"}%14s ${"PartStDev"}%14s")
    Experiments.metricsTable(spark, Experiments.PaperFine, div)
      .foreach(m => println(m.tableRow))
    spark.stop()
  }
}

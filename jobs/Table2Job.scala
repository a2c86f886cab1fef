package repro.jobs

import repro.core.Experiments

/** Reproduces Table 2: the five partitioning metrics for every
  * (dataset × partitioner) at 128 partitions.
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("table2")
    val div   = JobSession.divArg(args, Experiments.metricDiv)
    println(s"=== Table 2: partitioning metrics @ ${Experiments.PaperCoarse} partitions (scale 1/$div) ===")
    println(f"${"Dataset"}%-14s ${"Part."}%-5s ${"Balance"}%7s ${"NonCut"}%12s ${"Cut"}%12s " +
      f"${"CommCost"}%14s ${"PartStDev"}%14s")
    Experiments.metricsTable(spark, Experiments.PaperCoarse, div)
      .foreach(m => println(m.tableRow))
    spark.stop()
  }
}

package repro.jobs

import org.apache.spark.sql.functions._
import repro.graph.Datasets
import repro.partition.Partitioners

/** Debug probe: top out/in degrees and biggest 1D/2D partitions. */
object DegreeProbe {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("degprobe")
    val name  = if (args.length > 0) args(0) else "follow-dec"
    val div   = if (args.length > 1) args(1).toInt else 100
    val edges = Datasets.edges(spark, name, div).cache()
    println("top out-degrees:")
    edges.groupBy("src").count().orderBy(desc("count")).limit(8).collect()
      .foreach(r => println(s"  src=${r.getLong(0)} deg=${r.getLong(1)}"))
    println("top in-degrees:")
    edges.groupBy("dst").count().orderBy(desc("count")).limit(8).collect()
      .foreach(r => println(s"  dst=${r.getLong(0)} deg=${r.getLong(1)}"))
    for (s <- Seq(Partitioners.OneD, Partitioners.TwoD)) {
      println(s"${s.name} biggest partitions:")
      repro.partition.Metrics.withPid(edges, s, 256)
        .groupBy("pid").count().orderBy(desc("count")).limit(5).collect()
        .foreach(r => println(s"  pid=${r.getInt(0)} n=${r.getLong(1)}"))
    }
    spark.stop()
  }
}

package repro.jobs

import repro.core.Experiments

/** Reproduces Table 1 (dataset characterization): prints the measured profile
  * of every synthetic dataset analogue next to the paper's reported numbers.
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("table1")
    val div   = JobSession.divArg(args, Experiments.metricDiv)
    println(s"=== Table 1: dataset characterization (scale 1/$div) ===")
    println(f"${"Dataset"}%-14s ${"Vertices"}%9s ${"Edges"}%10s ${"Symm"}%6s ${"ZeroIn"}%7s " +
      f"${"ZeroOut"}%8s ${"Triangles"}%12s ${"Conn.Comp."}%10s ${"Diam"}%8s ${"Size"}%12s")
    for ((spec, p) <- Experiments.table1(spark, div)) {
      println("measured  " + p.tableRow)
      println(f"paper     ${spec.name}%-14s ${spec.paperVertices}%9d ${spec.paperEdges}%10d " +
        f"${spec.paperSymmPct}%6.2f ${spec.paperZeroInPct}%7.2f ${spec.paperZeroOutPct}%8.2f " +
        f"${spec.paperTriangles}%12d ${spec.paperComponents}%10d " +
        f"${spec.paperDiameter.map(_.toString).getOrElse("inf")}%8s ${spec.paperSizeBytes}%12d")
    }
    spark.stop()
  }
}

package repro.jobs

import repro.core.Experiments
import repro.graph.{Datasets, GraphOps}
import repro.partition.{Metrics, Partitioners}
import repro.sim.{BspCostModel, Infra}

/** Reproduces the infrastructure experiment of §4 via the BSP cost model:
  * PageRank on follow-dec under (ii) 1 Gbps + HDD, (iii) 40 Gbps + HDD and
  * (iv) 40 Gbps + SSD. The paper measures 15 % and 20 % improvements.
  */
object InfraJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("infra")
    val div   = JobSession.divArg(args, Experiments.metricDiv)
    val edges = Datasets.edges(spark, "follow-dec", div).cache()
    val bytes = GraphOps.sizeOnDiskBytes(edges)
    val m = Metrics.compute("follow-dec", edges, Partitioners.TwoD, Experiments.PaperFine)
    val ii  = BspCostModel.estimateSeconds(m, bytes, supersteps = 10, Infra.ConfigII)
    val iii = BspCostModel.estimateSeconds(m, bytes, supersteps = 10, Infra.ConfigIII)
    val iv  = BspCostModel.estimateSeconds(m, bytes, supersteps = 10, Infra.ConfigIV)
    println(f"(ii)  ${Infra.ConfigII.name}%-18s ${ii}%8.2f s  (baseline)")
    println(f"(iii) ${Infra.ConfigIII.name}%-18s ${iii}%8.2f s  " +
      f"improvement ${BspCostModel.improvementPct(ii, iii)}%5.1f%% (paper: 15%%)")
    println(f"(iv)  ${Infra.ConfigIV.name}%-18s ${iv}%8.2f s  " +
      f"improvement ${BspCostModel.improvementPct(ii, iv)}%5.1f%% (paper: 20%%)")
    spark.stop()
  }
}

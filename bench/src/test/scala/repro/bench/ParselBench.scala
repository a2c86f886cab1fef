package repro.bench

import repro.SparkSpec
import repro.core.{Experiments, Parsel, Runner}
import repro.graph.Datasets
import repro.partition.Partitioners

/** Evaluates the PARSEL selector: for a PageRank sweep over a subset of
  * datasets, compare the partitioner the selector predicts from metrics alone
  * against the measured-fastest partitioner, and report the regret.
  */
class ParselBench extends SparkSpec {

  // A spread of dataset shapes: grid, symmetric social, skewed crawl.
  private val datasets = Seq("RoadNet-PA", "YouTube", "socLiveJournal", "follow-dec")
  private val parts    = Experiments.fineParts

  private lazy val evaluation: Seq[(String, Parsel.Selection, Map[String, Double])] =
    datasets.map { name =>
      val edges = Datasets.edges(spark, name, Experiments.timedDiv).cache()
      edges.count()
      val selection = Parsel.select(name, edges, Parsel.EdgeBound, parts)
      val times = Partitioners.all.map { s =>
        s.name -> Runner.timeRun(name, edges, Runner.PageRank(10), s, parts).millis
      }.toMap
      edges.unpersist()
      (name, selection, times)
    }

  test("print PARSEL evaluation: predicted vs measured best (PageRank)") {
    println(s"=== PARSEL selection quality (PageRank, $parts partitions, " +
      s"scale 1/${Experiments.timedDiv}) ===")
    for ((name, sel, times) <- evaluation) {
      val best   = times.minBy(_._2)
      val chosen = times(sel.strategy.name)
      val regret = 100.0 * (chosen - best._2) / best._2
      println(f"$name%-14s predicted=${sel.strategy.name}%-5s measured-best=${best._1}%-5s " +
        f"chosen=${chosen}%8.1f ms best=${best._2}%8.1f ms regret=$regret%6.1f%%")
    }
    assert(evaluation.size == datasets.size)
  }

  test("the selector's pick is always close to the measured best (low regret)") {
    // Local single-node runs put all six partitioners within a ~20% noise
    // band on these graph sizes (the paper itself calls many gaps "in the
    // noise"), so rank order is unstable — regret against the fastest is the
    // stable statistic.
    val regrets = for ((name, sel, times) <- evaluation) yield {
      val best   = times.values.min
      val regret = (times(sel.strategy.name) - best) / best
      assert(regret < 1.0, s"$name: regret ${100 * regret}%")
      regret
    }
    assert(regrets.sum / regrets.size < 0.5,
      s"mean regret ${100 * regrets.sum / regrets.size}%")
  }

  test("selection criterion really is minimal among the candidates") {
    for ((_, sel, _) <- evaluation) {
      val chosenScore = sel.scores(sel.strategy.name)
      assert(chosenScore == sel.scores.values.min)
    }
  }

  test("granularity heuristic separates algorithms as the paper found") {
    val largest = Datasets.all.map(_.paperEdges).max
    val follow  = Datasets.byName("follow-dec").paperEdges
    val road    = Datasets.byName("RoadNet-PA").paperEdges
    assert(Parsel.granularity(Parsel.PR, follow, largest, 128, 256) == 128)
    assert(Parsel.granularity(Parsel.TR, follow, largest, 128, 256) == 256)
    assert(Parsel.granularity(Parsel.CC, follow, largest, 128, 256) == 256)
    assert(Parsel.granularity(Parsel.CC, road, largest, 128, 256) == 128)
  }
}

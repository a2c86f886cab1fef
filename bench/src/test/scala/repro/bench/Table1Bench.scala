package repro.bench

import repro.SparkSpec
import repro.core.Experiments

/** Reproduces Table 1 (dataset characterization) at 1/REPRO_METRIC_DIV of
  * the paper's scale. Prints measured-vs-paper rows (recorded in
  * EXPERIMENTS.md) and asserts the structural shape each dataset was built
  * to have.
  */
class Table1Bench extends SparkSpec {

  private lazy val profiles = Experiments.table1(spark)

  test("print Table 1: measured vs paper") {
    println(s"=== Table 1: dataset characterization (scale 1/${Experiments.metricDiv}) ===")
    for ((spec, p) <- profiles) {
      println("measured  " + p.tableRow)
      println(f"paper     ${spec.name}%-14s ${spec.paperVertices}%9d ${spec.paperEdges}%10d " +
        f"${spec.paperSymmPct}%6.2f ${spec.paperZeroInPct}%7.2f ${spec.paperZeroOutPct}%8.2f " +
        f"${spec.paperTriangles}%12d ${spec.paperComponents}%10d " +
        f"${spec.paperDiameter.map(_.toString).getOrElse("inf")}%8s ${spec.paperSizeBytes}%12d")
    }
    assert(profiles.size == 9)
  }

  test("vertex and edge counts land within 3x of the scaled paper targets") {
    for ((spec, p) <- profiles) {
      val targetV = spec.paperVertices / Experiments.metricDiv
      val targetE = spec.paperEdges / Experiments.metricDiv
      assert(p.vertices > targetV / 3 && p.vertices < targetV * 3,
        s"${spec.name}: vertices ${p.vertices} vs target $targetV")
      assert(p.edges > targetE / 3 && p.edges < targetE * 3,
        s"${spec.name}: edges ${p.edges} vs target $targetE")
    }
  }

  test("undirected datasets measure 100% symmetry; directed ones do not") {
    for ((spec, p) <- profiles) {
      if (spec.paperSymmPct == 100.0) assert(p.symmPct == 100.0, spec.name)
      else assert(math.abs(p.symmPct - spec.paperSymmPct) < 15.0,
        s"${spec.name}: symm ${p.symmPct} vs paper ${spec.paperSymmPct}")
    }
  }

  test("zero-in/zero-out shape: zero for symmetric graphs, large for follow crawls") {
    for ((spec, p) <- profiles) {
      if (spec.paperZeroInPct == 0.0) assert(p.zeroInPct == 0.0, spec.name)
      if (spec.paperZeroOutPct == 0.0) assert(p.zeroOutPct == 0.0, spec.name)
    }
    val followDec = profiles.find(_._1.name == "follow-dec").get._2
    assert(followDec.zeroInPct > 25.0, s"follow-dec zeroIn ${followDec.zeroInPct}")
    assert(followDec.zeroOutPct > 8.0, s"follow-dec zeroOut ${followDec.zeroOutPct}")
  }

  test("triangle density ordering: social graphs far denser than road networks") {
    val byName = profiles.map { case (s, p) => s.name -> p }.toMap
    def perVertex(n: String) = byName(n).triangles.toDouble / byName(n).vertices
    assert(perVertex("Orkut") > 10 * perVertex("RoadNet-PA"),
      s"Orkut ${perVertex("Orkut")} vs RoadNet-PA ${perVertex("RoadNet-PA")}")
    assert(perVertex("Pocek") > perVertex("RoadNet-CA"))
  }

  test("road networks fragment, with component counts near the scaled paper targets") {
    // The social analogues fragment more than SNAP's LCC-extracted graphs
    // (RMAT offers no giant-component guarantee at E/V ~ 2.6), so the anchor
    // is the road family, whose fragment count is a generator parameter.
    for ((spec, p) <- profiles if spec.name.startsWith("RoadNet")) {
      val target = math.max(1L, spec.paperComponents / Experiments.metricDiv)
      assert(p.components > 1, spec.name)
      assert(p.components <= 6 * target,
        s"${spec.name}: ${p.components} components vs scaled target $target")
    }
  }

  test("diameter: fragmented datasets report inf; connected social graphs are small-world") {
    for ((spec, p) <- profiles) {
      if (spec.paperDiameter.isEmpty) assert(p.diameter.isEmpty, spec.name)
      // profile() reports a diameter only when the analogue is connected, as
      // RMAT occasionally detaches a tiny island; when defined it must be
      // small-world like the paper's 9–20.
      p.diameter.foreach(d => assert(d < 25, s"${spec.name}: diameter $d"))
    }
  }
}

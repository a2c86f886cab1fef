package repro.bench

import repro.core.Experiments

/** Reproduces Table 3: the same metric sweep at 256 partitions, plus the
  * paper's two cross-table observations (CommCost grows sublinearly with
  * partition count; balance degrades at finer grain).
  */
class Table3Bench extends Table2Bench {

  override protected def numParts: Int = Experiments.PaperFine
  override protected def tableName: String = "Table 3"

  private lazy val coarseRows =
    Experiments.metricsTable(spark, Experiments.PaperCoarse)

  test("CommCost increases with partition count but far less than doubles (paper §A)") {
    val coarse = coarseRows.map(m => (m.dataset, m.partitioner) -> m.commCost).toMap
    var checked = 0
    for (m <- rows) {
      val c = coarse((m.dataset, m.partitioner))
      if (c > 1000) { // skip tiny-commcost rows where granularity noise dominates
        assert(m.commCost >= c, s"${m.dataset}/${m.partitioner}: commCost must grow")
        assert(m.commCost < 2 * c,
          s"${m.dataset}/${m.partitioner}: commCost ${m.commCost} vs coarse $c should be < 2x")
        checked += 1
      }
    }
    assert(checked > 30, s"only $checked rows checked")
  }

  test("finer grain cannot improve the balance factor on the skewed follow datasets") {
    val coarse = coarseRows.map(m => (m.dataset, m.partitioner) -> m.balance).toMap
    for (d <- Seq("follow-jul", "follow-dec"); p <- Seq("1D", "SC", "DC")) {
      val fine = rows.find(m => m.dataset == d && m.partitioner == p).get.balance
      assert(fine >= coarse((d, p)) * 0.9,
        s"$d/$p: fine balance $fine vs coarse ${coarse((d, p))}")
    }
  }
}

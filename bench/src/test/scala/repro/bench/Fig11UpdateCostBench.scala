package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.socialdata.SocialData

/** Fig. 11: CPPse-index maintenance (Algorithm 2) cost vs update batch size.
  * Paper shape: the cost increases steadily with the update size.
  */
class Fig11UpdateCostBench extends SparkSpec {

  test("Fig 11: maintenance cost grows steadily with the update size") {
    val cfg = SocialData.ytubeLite
    val ss = Experiments.defaultSs(cfg)
    val t = BenchShared.prepared(spark, cfg)
    val sizes = Seq(500, 1000, 2000, 4000, 8000)
    val rows = Experiments.fig11(t, ss, sizes)
    println(Experiments.render(
      s"Fig 11 — efficiency of social updates (${cfg.name})",
      Seq("Update size", "Time (ms)"),
      rows.map(r => Seq(r.updateSize.toString, f"${r.millis}%.1f"))))
    assert(rows.map(_.updateSize) == sizes)
    rows.foreach(r => assert(r.millis > 0))
    // Steady growth: the largest batch costs clearly more than the smallest,
    // and per-update cost stays within an order of magnitude (no blow-up).
    assert(rows.last.millis > rows.head.millis,
           s"cost did not grow with batch size: $rows")
    val perUpdate = rows.map(r => r.millis / r.updateSize)
    assert(perUpdate.max / perUpdate.min < 10.0,
           s"per-update cost unstable: $perUpdate")
  }
}

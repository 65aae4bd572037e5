package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Fig. 6: effect of the short-term window size |W| ∈ 1..10 on P@10 (best
  * λ_s per window). Paper shape: an interior optimum, always at |W| = 5.
  */
class Fig6WindowBench extends SparkSpec {

  test("Fig 6: the short-term window has an interior optimum") {
    val cfg = Experiments.benchQuality
    val ss = Experiments.defaultSs(cfg)
    val t = BenchShared.prepared(spark, cfg)
    val rows = Experiments.fig6(t, ss)
    println(Experiments.render(
      s"Fig 6 — effect of |W| (P@10, best lambda per |W|, ${cfg.name})",
      Seq("|W|", "best lambda", "P@10"),
      rows.map(r => Seq(r.window.toString, f"${r.bestLambda}%.1f", f"${r.pAtK}%.4f"))))
    assert(rows.map(_.window) == (1 to 10))
    rows.foreach(r => assert(r.pAtK > 0, s"zero precision at |W|=${r.window}"))
    val best = rows.maxBy(_.pAtK)
    // Interior optimum: the best window beats both extremes.
    assert(best.pAtK >= rows.head.pAtK, "best window no better than |W|=1")
    assert(best.pAtK >= rows.last.pAtK, "best window no better than |W|=10")
    assert(best.window >= 2 && best.window <= 9, s"optimum at the boundary: ${best.window}")
  }
}

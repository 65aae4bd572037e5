package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Fig. 7: effect of the short-term weight λ_s at |W| = 5. Paper shape:
  * precision rises, peaks at an interior λ_s (0.4 on YTube, 0.3 on MLens),
  * then falls toward λ_s = 1.
  */
class Fig7LambdaBench extends SparkSpec {

  test("Fig 7: lambda_s has an interior optimum") {
    val cfg = Experiments.benchQuality
    val ss = Experiments.defaultSs(cfg)
    val t = BenchShared.prepared(spark, cfg)
    val rows = Experiments.fig7(t, ss)
    println(Experiments.render(
      s"Fig 7 — effect of lambda_s (P@10 at |W|=5, ${cfg.name})",
      Seq("lambda_s", "P@10"),
      rows.map(r => Seq(f"${r.lambda}%.1f", f"${r.pAtK}%.4f"))))
    assert(rows.size == 10)
    rows.foreach(r => assert(r.pAtK >= 0))
    val best = rows.maxBy(_.pAtK)
    // The pure short-term extreme (λ=1) must not be optimal, and the best λ
    // must improve on it — long-term interests matter (paper Section VI-C.3).
    assert(best.lambda < 1.0, "optimum at lambda = 1.0")
    assert(best.pAtK > rows.last.pAtK, "no decay toward lambda = 1")
  }
}

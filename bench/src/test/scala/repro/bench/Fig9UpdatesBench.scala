package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Fig. 9: effect of user profile updates. Paper shape: ssRec (updated from
  * each tested partition) clearly beats ssRec-nu (static model) at every k.
  */
class Fig9UpdatesBench extends SparkSpec {

  test("Fig 9: per-partition profile updates improve P@k") {
    val cfg = Experiments.benchQuality
    val ss = Experiments.defaultSs(cfg).copy(lambdaS = 0.5)
    val t = BenchShared.prepared(spark, cfg)
    val ks = Seq(5, 10, 20, 30)
    val rows = Experiments.fig9(t, ss, ks)
    println(Experiments.render(
      s"Fig 9 — effect of user profile updates (${cfg.name})",
      "Method" +: ks.map(k => s"P@$k"),
      rows.map(r => r.method +: ks.map(k => f"${r.pAtK(k)}%.4f"))))
    val updated = rows.find(_.method == "ssRec").get.pAtK
    val static0 = rows.find(_.method == "ssRec-nu").get.pAtK
    def mean(m: Map[Int, Double]): Double = ks.map(m).sum / ks.size
    assert(mean(updated) > mean(static0),
           s"updates did not help: ${mean(updated)} vs ${mean(static0)}")
    // Updates help at most individual cutoffs too (allow one tie/noise point).
    val wins = ks.count(k => updated(k) >= static0(k))
    assert(wins >= ks.size - 1, s"updates lost at too many cutoffs: $rows")
  }
}

package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Fig. 8: effectiveness comparison at k ∈ {5, 10, 20, 30}. Paper shape:
  * ssRec best everywhere, ssRec-ne loses to ssRec (expansion helps), UCD
  * beats CTT (diversity-expanded profiles), CTT worst.
  */
class Fig8EffectivenessBench extends SparkSpec {

  test("Fig 8: ssRec beats ssRec-ne, UCD and CTT at every k") {
    val cfg = Experiments.benchQuality
    // "We use the optimal settings obtained from our previous experiments":
    // λ_s from the Fig-7 sweep on this dataset.
    val ss = Experiments.defaultSs(cfg).copy(lambdaS = 0.5)
    val t = BenchShared.prepared(spark, cfg)
    val ks = Seq(5, 10, 20, 30)
    val rows = Experiments.fig8(t, ss, cfg, ks)
    println(Experiments.render(
      s"Fig 8 — effectiveness comparison (${cfg.name})",
      "Method" +: ks.map(k => s"P@$k"),
      rows.map(r => r.method +: ks.map(k => f"${r.pAtK(k)}%.4f"))))
    val byMethod = rows.map(r => r.method -> r.pAtK).toMap
    val ssRec = byMethod("ssRec"); val ne = byMethod("ssRec-ne")
    val ctt = byMethod("CTT"); val ucd = byMethod("UCD")
    ks.foreach { k =>
      assert(ssRec(k) > 0, s"ssRec scored zero at k=$k")
      assert(ssRec(k) > ctt(k), s"ssRec (${ssRec(k)}) did not beat CTT (${ctt(k)}) at k=$k")
      assert(ssRec(k) > ucd(k), s"ssRec (${ssRec(k)}) did not beat UCD (${ucd(k)}) at k=$k")
    }
    // Expansion gain and the CTT-worst ordering hold on average over k.
    def mean(m: Map[Int, Double]): Double = ks.map(m).sum / ks.size
    assert(mean(ssRec) > mean(ne), s"expansion did not help: ${mean(ssRec)} vs ${mean(ne)}")
    assert(mean(ucd) >= mean(ctt), s"UCD (${mean(ucd)}) below CTT (${mean(ctt)})")
  }
}

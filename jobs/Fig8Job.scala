package repro.jobs

import repro.exp.Experiments

/** Reproduces Fig. 8: effectiveness comparison — ssRec vs ssRec-ne vs CTT vs
  * UCD at k ∈ {5, 10, 20, 30}.
  */
object Fig8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig8")
    val cfg = JobUtil.qualityScale(args)
    val ss = Experiments.defaultSs(cfg)
    val t = Experiments.prepare(spark, cfg, ss)
    val ks = Seq(5, 10, 20, 30)
    val rows = Experiments.fig8(t, ss, cfg, ks)
    println(Experiments.render(
      s"Fig 8 — effectiveness comparison (${cfg.name})",
      "Method" +: ks.map(k => s"P@$k"),
      rows.map(r => r.method +: ks.map(k => f"${r.pAtK(k)}%.4f"))))
    spark.stop()
  }
}

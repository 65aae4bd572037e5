package repro.jobs

import repro.exp.Experiments

/** Reproduces Fig. 9: effect of user-profile updates (ssRec vs ssRec-nu). */
object Fig9Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig9")
    val cfg = JobUtil.qualityScale(args)
    val ss = Experiments.defaultSs(cfg)
    val t = Experiments.prepare(spark, cfg, ss)
    val ks = Seq(5, 10, 20, 30)
    val rows = Experiments.fig9(t, ss, ks)
    println(Experiments.render(
      s"Fig 9 — effect of user profile updates (${cfg.name})",
      "Method" +: ks.map(k => s"P@$k"),
      rows.map(r => r.method +: ks.map(k => f"${r.pAtK(k)}%.4f"))))
    spark.stop()
  }
}

package repro.jobs

import repro.exp.Experiments

/** Reproduces Fig. 6: effect of the short-term interest window size |W|. */
object Fig6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig6")
    val cfg = JobUtil.qualityScale(args)
    val ss = Experiments.defaultSs(cfg)
    val t = Experiments.prepare(spark, cfg, ss)
    val rows = Experiments.fig6(t, ss)
    println(Experiments.render(
      s"Fig 6 — effect of |W| (P@10, best lambda per |W|, ${cfg.name})",
      Seq("|W|", "best lambda", "P@10"),
      rows.map(r => Seq(r.window.toString, f"${r.bestLambda}%.1f", f"${r.pAtK}%.4f"))))
    spark.stop()
  }
}

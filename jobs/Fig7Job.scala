package repro.jobs

import repro.exp.Experiments

/** Reproduces Fig. 7: effect of the short-term weight λ_s at |W| = 5. */
object Fig7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig7")
    val cfg = JobUtil.qualityScale(args)
    val ss = Experiments.defaultSs(cfg)
    val t = Experiments.prepare(spark, cfg, ss)
    val rows = Experiments.fig7(t, ss)
    println(Experiments.render(
      s"Fig 7 — effect of lambda_s (P@10 at |W|=5, ${cfg.name})",
      Seq("lambda_s", "P@10"),
      rows.map(r => Seq(f"${r.lambda}%.1f", f"${r.pAtK}%.4f"))))
    spark.stop()
  }
}

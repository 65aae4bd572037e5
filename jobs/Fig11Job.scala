package repro.jobs

import repro.exp.Experiments
import repro.socialdata.SocialData

/** Reproduces Fig. 11: CPPse-index maintenance cost vs update batch size. */
object Fig11Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig11")
    val cfg = JobUtil.scaleOf(args, SocialData.ytubeLite)
    val ss = Experiments.defaultSs(cfg)
    val t = Experiments.prepare(spark, cfg, ss)
    val rows = Experiments.fig11(t, ss)
    println(Experiments.render(
      s"Fig 11 — efficiency of social updates (${cfg.name})",
      Seq("Update size", "Time (ms)"),
      rows.map(r => Seq(r.updateSize.toString, f"${r.millis}%.1f"))))
    spark.stop()
  }
}

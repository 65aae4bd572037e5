package repro.jobs

import repro.exp.Experiments
import repro.socialdata.SocialData

/** Reproduces Fig. 10: recommendation efficiency — average response time per
  * stream item (k = 30) as test partitions accumulate.
  */
object Fig10Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig10")
    val cfg = JobUtil.scaleOf(args, SocialData.ytubeLite)
    val ss = Experiments.defaultSs(cfg)
    val t = Experiments.prepare(spark, cfg, ss)
    val rows = Experiments.fig10(t, ss, cfg)
    println(Experiments.render(
      s"Fig 10 — avg response time per item, ms (k=30, ${cfg.name})",
      Seq("Partitions", "ssRec", "CTT", "UCD"),
      rows.map(r => Seq(r.partitionsUsed.toString, f"${r.ssRecMsPerItem}%.3f",
                        f"${r.cttMsPerItem}%.3f", f"${r.ucdMsPerItem}%.3f"))))
    spark.stop()
  }
}

package repro.jobs

import repro.exp.Experiments
import repro.socialdata.SocialData

/** Reproduces Table II: user-profile signature size vs user-block count. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table2")
    val cfg = JobUtil.scaleOf(args, SocialData.ytubeLite)
    val rows = Experiments.table2(spark, cfg, Experiments.defaultSs(cfg))
    println(Experiments.render(
      s"Table II — signature-size factors (${cfg.name})",
      Seq("User block num", "Actual blocks", "Max entity num", "Max producer num"),
      rows.map(r => Seq(r.blockNum.toString, r.actualBlocks.toString,
                        r.maxEntityNum.toString, r.maxProducerNum.toString))))
    spark.stop()
  }
}

package repro.jobs

import repro.exp.Experiments
import repro.socialdata.SocialData

/** Reproduces Table III: the dataset overview of the four collections. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table3")
    val configs = if (args.contains("--tiny")) Seq(SocialData.tiny) else SocialData.allConfigs
    val rows = Experiments.table3(spark, configs)
    println(Experiments.render(
      "Table III — overview of datasets",
      Seq("Dataset", "|Up|", "|Uc|", "|E|", "|C|", "|IRact|", "|V|"),
      rows.map(r => Seq(r.dataset, r.nProducers.toString, r.nConsumers.toString,
                        r.nEntities.toString, r.nCategories.toString,
                        r.nInteractions.toString, r.nItems.toString))))
    spark.stop()
  }
}

package repro.bench

import org.apache.spark.sql.SparkSession
import repro.exp.{Experiments, Trained}
import repro.socialdata.SocialConfig

/** Cache of prepared (trained) datasets shared across bench suites — several
  * figures reuse the same dataset, and preparation (BiHMM training + expansion
  * mining) is the expensive part.
  */
object BenchShared {
  private val cache = scala.collection.mutable.Map.empty[String, Trained]

  def prepared(spark: SparkSession, cfg: SocialConfig): Trained =
    synchronized {
      cache.getOrElseUpdate(cfg.name, Experiments.prepare(spark, cfg, Experiments.defaultSs(cfg)))
    }
}

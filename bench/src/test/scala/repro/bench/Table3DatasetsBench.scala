package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.socialdata.SocialData

/** Table III: overview of the four datasets (scaled-down stand-ins; see
  * DESIGN.md §3). Paper: YTube 3,146/8.41M/54,327/19/49M/787,010 and MLens
  * 586/138,221/28,195/15/20M/27,278, plus their synthpop twins.
  */
class Table3DatasetsBench extends SparkSpec {

  test("Table III: dataset overview matches the paper's structure") {
    val rows = Experiments.table3(spark)
    println(Experiments.render(
      "Table III — overview of datasets",
      Seq("Dataset", "|Up|", "|Uc|", "|E|", "|C|", "|IRact|", "|V|"),
      rows.map(r => Seq(r.dataset, r.nProducers.toString, r.nConsumers.toString,
                        r.nEntities.toString, r.nCategories.toString,
                        r.nInteractions.toString, r.nItems.toString))))
    assert(rows.map(_.dataset) ==
      Seq("YTube-lite", "SynYTube-lite", "MLens-lite", "SynMLens-lite"))
    val Seq(yt, syt, ml, sml) = rows
    // Category structure mirrors the paper: 19 for YTube-likes, 15 for MLens-likes.
    assert(yt.nCategories == 19 && syt.nCategories == 19)
    assert(ml.nCategories == 15 && sml.nCategories == 15)
    // Synthetic twins are near their originals (synthpop preserves scale).
    assert(math.abs(syt.nInteractions - yt.nInteractions).toDouble / yt.nInteractions < 0.2)
    assert(math.abs(sml.nInteractions - ml.nInteractions).toDouble / ml.nInteractions < 0.2)
    // Relative ordering as in the paper: YTube has more items and producers;
    // MLens has denser per-user histories.
    assert(yt.nItems > ml.nItems && yt.nProducers > ml.nProducers)
    val ytDensity = yt.nInteractions.toDouble / yt.nConsumers
    val mlDensity = ml.nInteractions.toDouble / ml.nConsumers
    assert(mlDensity > ytDensity)
    rows.foreach(r => assert(r.nProducers > 0 && r.nConsumers > 0 && r.nEntities > 0 &&
                             r.nInteractions > 0 && r.nItems > 0))
  }
}

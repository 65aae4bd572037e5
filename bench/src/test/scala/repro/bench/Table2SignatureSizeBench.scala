package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.socialdata.SocialData

/** Table II: the factors relevant to user-profile signature size.
  * Paper (YTube): blocks 1→50 shrink the max entity count 4000→101 and the
  * max producer count 98→25.
  */
class Table2SignatureSizeBench extends SparkSpec {

  test("Table II: per-block vocabularies shrink sharply as blocks grow") {
    val cfg = SocialData.ytubeLite
    val rows = Experiments.table2(spark, cfg, Experiments.defaultSs(cfg))
    println(Experiments.render(
      s"Table II — signature-size factors (${cfg.name})",
      Seq("User block num", "Actual blocks", "Max entity num", "Max producer num"),
      rows.map(r => Seq(r.blockNum.toString, r.actualBlocks.toString,
                        r.maxEntityNum.toString, r.maxProducerNum.toString))))
    assert(rows.map(_.blockNum) == Seq(1, 10, 20, 30, 40, 50))
    assert(rows.head.actualBlocks == 1)
    val ents = rows.map(_.maxEntityNum)
    val prods = rows.map(_.maxProducerNum)
    // Shape: both vocabularies shrink with more blocks; the 50-block max
    // entity vocabulary is a small fraction of the single-block one (paper:
    // 101/4000 ≈ 2.5%; we assert < 60% to be robust at reduced scale).
    assert(ents.last < ents.head * 0.6, s"entity counts did not shrink: $ents")
    assert(prods.last <= prods.head, s"producer counts did not shrink: $prods")
    ents.sliding(2).foreach { case Seq(a, b) => assert(b <= a * 1.15, s"non-shrinking: $ents") }
  }
}

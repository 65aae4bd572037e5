package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.socialdata.SocialData

/** Fig. 10: average response time per stream item (k = 30) as the data grows.
  * Paper shape: ssRec (CPPse-index) is much faster than CTT and UCD and its
  * cost is nearly flat in the data size; UCD is slower than CTT.
  */
class Fig10EfficiencyBench extends SparkSpec {

  test("Fig 10: the CPPse-index beats sequential scans and stays flat") {
    val cfg = SocialData.ytubeLite
    val ss = Experiments.defaultSs(cfg)
    val t = BenchShared.prepared(spark, cfg)
    val rows = Experiments.fig10(t, ss, cfg)
    println(Experiments.render(
      s"Fig 10 — avg response time per item, ms (k=30, ${cfg.name})",
      Seq("Partitions", "ssRec", "CTT", "UCD"),
      rows.map(r => Seq(r.partitionsUsed.toString, f"${r.ssRecMsPerItem}%.3f",
                        f"${r.cttMsPerItem}%.3f", f"${r.ucdMsPerItem}%.3f"))))
    assert(rows.map(_.partitionsUsed) == Seq(1, 2, 3, 4))
    def mean(f: Experiments.Fig10Row => Double): Double = rows.map(f).sum / rows.size
    // ssRec fastest on average and at the largest data size.
    assert(mean(_.ssRecMsPerItem) < mean(_.cttMsPerItem),
           s"ssRec not faster than CTT: $rows")
    assert(mean(_.ssRecMsPerItem) < mean(_.ucdMsPerItem),
           s"ssRec not faster than UCD: $rows")
    assert(rows.last.ssRecMsPerItem < rows.last.cttMsPerItem)
    assert(rows.last.ssRecMsPerItem < rows.last.ucdMsPerItem)
    // "The average recommendation cost of our proposed method is less
    // affected by the size of items": absolute growth over the accumulated
    // partitions must be far smaller for ssRec than for the scans.
    val ssGrowth = rows.last.ssRecMsPerItem - rows.head.ssRecMsPerItem
    val cttGrowth = rows.last.cttMsPerItem - rows.head.cttMsPerItem
    val ucdGrowth = rows.last.ucdMsPerItem - rows.head.ucdMsPerItem
    assert(ssGrowth < math.max(cttGrowth, ucdGrowth) / 2,
           s"ssRec cost not flat: +$ssGrowth ms vs CTT +$cttGrowth / UCD +$ucdGrowth")
  }
}

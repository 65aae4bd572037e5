package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Fig. 5: BiHMM vs HMM next-category prediction accuracy, users grouped by
  * their tuned optimal hidden-state count. Paper shape: BiHMM beats HMM in
  * every group on all four datasets.
  */
class Fig5BiHmmVsHmmBench extends SparkSpec {

  test("Fig 5: BiHMM dominates HMM across state groups") {
    val cfg = Experiments.benchFig5
    val rows = Experiments.fig5(spark, cfg, Experiments.defaultSs(cfg))
    println(Experiments.render(
      s"Fig 5 — prediction accuracy by optimal state group (${cfg.name})",
      Seq("States", "Users", "HMM acc", "BiHMM acc"),
      rows.map(r => Seq(r.group.toString, r.users.toString,
                        f"${r.accHmm}%.4f", f"${r.accBiHmm}%.4f"))))
    assert(rows.nonEmpty)
    val totalUsers = rows.map(_.users).sum
    val wH = rows.map(r => r.accHmm * r.users).sum / totalUsers
    val wB = rows.map(r => r.accBiHmm * r.users).sum / totalUsers
    assert(wB > wH, f"BiHMM ($wB%.4f) must beat HMM ($wH%.4f) overall")
    // BiHMM wins (or ties within 2pp) in the large majority of groups.
    val wins = rows.count(r => r.accBiHmm >= r.accHmm - 0.02)
    assert(wins.toDouble / rows.size >= 0.75, s"BiHMM lost too many groups: $rows")
    // Both models clear the uniform-guess floor by a wide margin.
    assert(wH > 1.5 / cfg.nCategories && wB > 1.5 / cfg.nCategories)
  }
}

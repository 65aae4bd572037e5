package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.socialdata.SocialData

class EntitiesSpec extends SparkSpec {
  private val cfg = SocialData.tiny
  private lazy val items = SocialData.items(spark, cfg).toDF().cache()
  private lazy val expansion = Entities.mine(spark, items)

  test("explodedEntities emits one row per (item, entity)") {
    val n = items.select(explode(col("entities"))).count()
    assert(Entities.explodedEntities(items).count() == n)
  }

  test("oracle: exploded entity counts match DuckDB") {
    val flat = Entities.explodedEntities(items)
    val got = flat.groupBy("entity").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(got,
      "SELECT entity, count(*) AS cnt FROM pairs GROUP BY entity",
      "pairs" -> flat)
  }

  test("oracle: within-item co-occurrence counts match a DuckDB self-join") {
    val flat = Entities.explodedEntities(items)
    val got = Entities.cooccurrence(items)
    Oracle.assertEquivalent(got,
      """SELECT a.entity AS e1, b.entity AS e2, count(*) AS pair_cnt
        |FROM pairs a JOIN pairs b
        |  ON a.itemId = b.itemId AND a.entity <> b.entity
        |GROUP BY a.entity, b.entity""".stripMargin,
      "pairs" -> flat)
  }

  test("cooccurrence never pairs an entity with itself") {
    assert(Entities.cooccurrence(items).where(col("e1") === col("e2")).count() == 0)
  }

  test("cooccurrence is symmetric in counts") {
    val co = Entities.cooccurrence(items).collect()
      .map(r => ((r.getInt(0), r.getInt(1)), r.getLong(2))).toMap
    co.foreach { case ((a, b), n) => assert(co((b, a)) == n, s"asymmetric pair ($a,$b)") }
  }

  test("mined expansion weights are positive and self-free") {
    expansion.exp.foreach { case (e, xs) =>
      xs.foreach { case (x, w) =>
        assert(x != e, s"entity $e expands to itself")
        assert(w > 0, s"non-positive weight $w")
      }
    }
  }

  test("mined expansion respects the per-entity cap and the weight floor") {
    val exp = Entities.mine(spark, items, topPerEntity = 2, minWeight = 0.3)
    exp.exp.foreach { case (_, xs) =>
      assert(xs.size <= 2)
      xs.foreach { case (_, w) => assert(w >= 0.3) }
    }
  }

  test("expansion weights are sorted descending per entity") {
    expansion.exp.foreach { case (_, xs) =>
      val ws = xs.map(_._2)
      assert(ws == ws.sorted(Ordering[Double].reverse))
    }
  }

  test("correlated generator pairs are discovered by the miner") {
    // drawEntities emits even/odd pairs (e, e+1) with prob 0.6 — the strongest
    // co-occurrence signal in the data. At least a third of expandable even
    // entities should expand to their odd twin.
    val evens = expansion.exp.keys.filter(e => e % 2 == 0 && expansion.of(e).nonEmpty).toSeq
    assert(evens.nonEmpty, "no even entities got expansions")
    val twinned = evens.count(e => expansion.of(e).exists(_._1 == e + 1))
    assert(twinned.toDouble / evens.size > 0.33,
           s"only $twinned/${evens.size} even entities expand to their twin")
  }

  test("expansions stay within the same category pool") {
    val pool = cfg.poolSize
    expansion.exp.foreach { case (e, xs) =>
      xs.foreach { case (x, _) => assert(x / pool == e / pool, s"$e expands across pools to $x") }
    }
  }

  test("the none expansion is empty") {
    assert(Entities.none.of(42).isEmpty && Entities.none.exp.isEmpty)
  }
}

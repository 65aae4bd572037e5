package repro.socialdata

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class SocialDataSpec extends SparkSpec {
  private val cfg = SocialData.tiny
  private lazy val items = SocialData.items(spark, cfg).cache()
  private lazy val interactions = SocialData.interactions(spark, cfg).cache()

  test("items: exactly nItems are generated") {
    assert(items.count() == cfg.nItems)
  }

  test("items: itemId equals ts and both are unique") {
    assert(items.where(col("itemId") =!= col("ts")).count() == 0)
    assert(items.select("itemId").distinct().count() == cfg.nItems)
  }

  test("items: categories are in range") {
    val cats = items.select("category").distinct().collect().map(_.getInt(0))
    assert(cats.forall(c => c >= 0 && c < cfg.nCategories))
  }

  test("items: every producer id is in range and all producers emit") {
    val prods = items.select("producerId").distinct().collect().map(_.getLong(0))
    assert(prods.length == cfg.nProducers)
    assert(prods.forall(p => p >= 0 && p < cfg.nProducers))
  }

  test("items: entity ids stay within their category pool") {
    val bad = items.select(col("category"), explode(col("entities")).as("e"))
      .where(col("e") < col("category") * cfg.poolSize ||
             col("e") >= (col("category") + 1) * cfg.poolSize)
      .count()
    assert(bad == 0, s"$bad entities escape their category pool")
  }

  test("items: every item has 1 to 8 distinct entities") {
    val sizes = items.select(size(col("entities")).as("n"))
      .agg(min("n"), max("n")).collect()(0)
    assert(sizes.getInt(0) >= 1 && sizes.getInt(1) <= 8)
  }

  test("items: planted producer states are in range") {
    val zs = items.select("zPlanted").distinct().collect().map(_.getInt(0))
    assert(zs.forall(z => z >= 0 && z < 3))
  }

  test("items generation is deterministic") {
    val again = SocialData.items(spark, cfg)
    assert(items.toDF().except(again.toDF()).count() == 0)
    assert(again.toDF().except(items.toDF()).count() == 0)
  }

  test("interactions: users are in range and most consumers appear") {
    val users = interactions.select("userId").distinct().collect().map(_.getLong(0))
    assert(users.forall(u => u >= 0 && u < cfg.nConsumers))
    assert(users.length >= cfg.nConsumers * 9 / 10)
  }

  test("interactions: every referenced item exists with matching attributes") {
    val joined = interactions.toDF().as("ir")
      .join(items.toDF().as("it"), col("ir.itemId") === col("it.itemId"))
    assert(joined.count() == interactions.count(), "dangling item reference")
    assert(joined.where(col("ir.category") =!= col("it.category") ||
                        col("ir.producerId") =!= col("it.producerId")).count() == 0)
  }

  test("interactions: per-user timestamps are strictly increasing") {
    val viol = interactions.groupBy("userId")
      .agg((count(lit(1)) - countDistinct(col("ts"))).as("d"))
      .where(col("d") =!= 0).count()
    assert(viol == 0)
  }

  test("interactions generation is deterministic") {
    val again = SocialData.interactions(spark, cfg)
    assert(interactions.toDF().except(again.toDF()).count() == 0)
  }

  test("interactions: history lengths follow the configured average") {
    val meanLen = interactions.groupBy("userId").count()
      .agg(avg("count")).collect()(0).getDouble(0)
    assert(meanLen > cfg.avgHistory * 0.5 && meanLen < cfg.avgHistory * 1.5,
           s"avg history $meanLen")
  }

  test("oracle: per-category item counts match DuckDB") {
    val flat = items.toDF().select("itemId", "category", "producerId")
    val got = flat.groupBy("category").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(got,
      "SELECT category, count(*) AS cnt FROM items GROUP BY category",
      "items" -> flat)
  }

  test("oracle: per-producer item counts match DuckDB") {
    val flat = items.toDF().select("itemId", "category", "producerId")
    val got = flat.groupBy("producerId").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(got,
      "SELECT producerId, count(*) AS cnt FROM items GROUP BY producerId",
      "items" -> flat)
  }

  test("oracle: interaction counts per user-category match DuckDB") {
    val flat = interactions.toDF().select("userId", "itemId", "category")
    val got = flat.groupBy("userId", "category").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(got,
      "SELECT userId, category, count(*) AS cnt FROM ir GROUP BY userId, category",
      "ir" -> flat)
  }

  test("overview matches direct counts (Table III plumbing)") {
    val (name, p, u, e, c, ir, v) = SocialData.overview(spark, cfg)
    assert(name == cfg.name)
    assert(v == cfg.nItems)
    assert(p == cfg.nProducers)
    assert(c.toInt <= cfg.nCategories && c > 0)
    assert(ir == interactions.count())
    assert(u == interactions.select("userId").distinct().count())
    assert(e <= cfg.nEntities)
  }

  test("synthetic twins have the paper's shape: same vocab scale, different draws") {
    val a = SocialData.items(spark, SocialData.tiny)
    val b = SocialData.items(spark, SocialData.tiny.copy(seed = 999L))
    assert(a.toDF().except(b.toDF()).count() > 0, "different seeds must differ")
    assert(a.count() == b.count())
  }

  test("config validation rejects impossible sizes") {
    intercept[IllegalArgumentException](cfg.copy(nEntities = 1, nCategories = 5))
    intercept[IllegalArgumentException](cfg.copy(nItems = 1, nProducers = 5))
  }
}

package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.socialdata.{Interaction, Item}
import scala.util.Random

class BaselinesSpec extends AnyFunSuite {
  private val NCats = 5

  private def mkInteractions(n: Int, nUsers: Int, nItems: Int, seed: Long): Seq[Interaction] = {
    val rnd = new Random(seed)
    (0 until n).map { t =>
      val u = rnd.nextInt(nUsers).toLong
      val v = rnd.nextInt(nItems).toLong
      Interaction(u, v, t.toLong, (v % NCats).toInt, v % 3,
                  Seq((v % 17).toInt, ((v + 1) % 17).toInt), 0)
    }
  }

  private def mkItem(id: Long, cat: Int, ts: Long = 1000L): Item =
    Item(id, ts, cat, id % 3, Seq((id % 17).toInt, ((id + 1) % 17).toInt), 0)

  private val train = mkInteractions(400, 20, 30, 1)

  test("CTT: knows every training user") {
    val ctt = new Ctt(NCats).train(train)
    assert(ctt.users.toSet == train.map(_.userId).toSet)
  }

  test("CTT: recommends k distinct users with descending scores") {
    val ctt = new Ctt(NCats).train(train)
    val recs = ctt.recommend(mkItem(3, 3), 7)
    assert(recs.size == 7 && recs.map(_._1).distinct.size == 7)
    val s = recs.map(_._2)
    assert(s == s.sorted(Ordering[Double].reverse))
  }

  test("CTT: scores are finite and non-negative") {
    val ctt = new Ctt(NCats).train(train)
    ctt.users.foreach { u =>
      val s = ctt.score(u, mkItem(5, 0))
      assert(!s.isNaN && s >= 0.0)
    }
  }

  test("CTT: category affinity raises the score") {
    val ctt = new Ctt(NCats)
    // User 1 watches only category 2, user 2 only category 3.
    ctt.observe((0 until 10).map(t => Interaction(1L, 100L + t, t.toLong, 2, 0L, Seq(1), 0)))
    ctt.observe((0 until 10).map(t => Interaction(2L, 200L + t, t.toLong, 3, 0L, Seq(9), 0)))
    val v = Item(999L, 20L, 2, 0L, Seq(50), 0)
    assert(ctt.score(1L, v) > ctt.score(2L, v))
  }

  test("CTT: co-consumption boosts CF score") {
    val ctt = new Ctt(NCats)
    // Users 1 and 2 co-consume item 10; user 3 is unrelated.
    ctt.observe(Seq(
      Interaction(1L, 10L, 1, 0, 0L, Seq(1), 0),
      Interaction(2L, 10L, 2, 0, 0L, Seq(1), 0),
      Interaction(3L, 20L, 3, 0, 0L, Seq(2), 0)))
    // New item 30 is consumed by user 2 → CF links it to item 10 → user 1.
    ctt.observe(Seq(Interaction(2L, 30L, 4, 0, 0L, Seq(3), 0)))
    val v = Item(30L, 5L, 0, 0L, Seq(3), 0)
    assert(ctt.score(1L, v) > ctt.score(3L, v))
  }

  test("CTT: recently active users get a temporal boost") {
    val ctt = new Ctt(NCats)
    ctt.observe(Seq(
      Interaction(1L, 10L, 1000, 0, 0L, Seq(1), 0),
      Interaction(2L, 10L, 1, 0, 0L, Seq(1), 0)))
    val v = Item(99L, 1001L, 1, 0L, Seq(7), 0) // category matches neither history
    assert(ctt.score(1L, v) > ctt.score(2L, v))
  }

  test("CTT: observe changes subsequent recommendations") {
    val ctt = new Ctt(NCats).train(train)
    val v = mkItem(7, 2)
    val before = ctt.recommend(v, 5).map(_._1)
    ctt.observe(mkInteractions(300, 20, 30, 2).map(_.copy(ts = 10000L)))
    val after = ctt.recommend(v, 5).map(_._1)
    assert(ctt.users.toSet.size == 20)
    assert(before.size == after.size)
  }

  test("UCD: knows every training user") {
    val ucd = new Ucd(NCats).train(train)
    assert(ucd.users.toSet == train.map(_.userId).toSet)
  }

  test("UCD: recommends k distinct users with descending scores") {
    val ucd = new Ucd(NCats).train(train)
    val recs = ucd.recommend(mkItem(4, 4), 6)
    assert(recs.size == 6 && recs.map(_._1).distinct.size == 6)
    val s = recs.map(_._2)
    assert(s == s.sorted(Ordering[Double].reverse))
  }

  test("UCD: entity overlap raises the score") {
    val ucd = new Ucd(NCats)
    ucd.observe((0 until 8).map(t => Interaction(1L, t.toLong, t.toLong, 0, 0L, Seq(3, 4), 0)))
    ucd.observe((0 until 8).map(t => Interaction(2L, 50L + t, t.toLong, 0, 0L, Seq(11, 12), 0)))
    ucd.rebuildNeighbours()
    val v = Item(99L, 9L, 0, 0L, Seq(3, 4), 0)
    assert(ucd.score(1L, v) > ucd.score(2L, v))
  }

  test("UCD: repeated recommendations of near-duplicates are penalized (diversity)") {
    val ucd = new Ucd(NCats).train(train)
    val v = mkItem(8, 3)
    val first = ucd.recommend(v, 3)
    val winner = first.head._1
    val sBefore = first.head._2
    // Recommend the same item again: the winner's diversity penalty kicks in.
    val sAfter = ucd.score(winner, v)
    assert(sAfter < sBefore, s"no diversity penalty: $sBefore -> $sAfter")
  }

  test("UCD: neighbour expansion lets a user match unseen entities") {
    val ucd = new Ucd(NCats, nNeighbours = 1)
    // Users 1 and 2 share category behaviour; only user 2 saw entity 7.
    ucd.observe((0 until 6).map(t => Interaction(1L, t.toLong, t.toLong, 1, 0L, Seq(3), 0)))
    ucd.observe((0 until 6).map(t => Interaction(2L, 40L + t, t.toLong, 1, 0L, Seq(7), 0)))
    // User 3 lives in a different category and saw nothing relevant.
    ucd.observe((0 until 6).map(t => Interaction(3L, 80L + t, t.toLong, 4, 0L, Seq(9), 0)))
    ucd.rebuildNeighbours()
    val v = Item(99L, 9L, 1, 0L, Seq(7), 0)
    assert(ucd.score(1L, v) > ucd.score(3L, v), "neighbour expansion missing")
  }

  test("baselines are deterministic given the same input") {
    val a = new Ctt(NCats).train(train).recommend(mkItem(3, 3), 5)
    val b = new Ctt(NCats).train(train).recommend(mkItem(3, 3), 5)
    assert(a == b)
    val c = new Ucd(NCats).train(train).recommend(mkItem(3, 3), 5)
    val d = new Ucd(NCats).train(train).recommend(mkItem(3, 3), 5)
    assert(c == d)
  }
}

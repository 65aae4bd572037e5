package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.testutil.Fixtures
import scala.util.Random

class RankingSpec extends AnyFunSuite {
  import Fixtures._

  private val exp = EntityExpansion(Map(
    1 -> Seq((10, 0.7), (11, 0.5)),
    2 -> Seq((10, 0.9)),
  ))

  test("queryOf without expansion counts entity frequencies") {
    val q = Ranking.queryOf(1L, 0, 2L, Seq(1, 2, 2, 3), Entities.none, expand = false)
    assert(q.entityWeights.toMap == Map(1 -> 1.0, 2 -> 2.0, 3 -> 1.0))
  }

  test("queryOf with expansion adds weighted expansion entities") {
    val q = Ranking.queryOf(1L, 0, 2L, Seq(1), exp, expand = true)
    assert(q.entityWeights.toMap == Map(1 -> 1.0, 10 -> 0.7, 11 -> 0.5))
  }

  test("queryOf accumulates expansion weights across occurrences (Example 1)") {
    // Entity 1 and 2 both expand into 10: coefficients add up.
    val q = Ranking.queryOf(1L, 0, 2L, Seq(1, 2, 2), exp, expand = true)
    val m = q.entityWeights.toMap
    assert(math.abs(m(10) - (0.7 + 2 * 0.9)) < 1e-12)
    assert(m(1) == 1.0 && m(2) == 2.0 && math.abs(m(11) - 0.5) < 1e-12)
  }

  test("queryOf with expand=false ignores a non-empty expansion table (ssRec-ne)") {
    val q = Ranking.queryOf(1L, 0, 2L, Seq(1, 2), exp, expand = false)
    assert(q.entityWeights.toMap == Map(1 -> 1.0, 2 -> 1.0))
  }

  test("combine is the Eq.-3 convex combination") {
    assert(Ranking.combine(-2.0, -6.0, 0.0) == -2.0)
    assert(Ranking.combine(-2.0, -6.0, 1.0) == -6.0)
    assert(math.abs(Ranking.combine(-2.0, -6.0, 0.25) - (-3.0)) < 1e-12)
  }

  test("score equals combine of components") {
    val rnd = new Random(1)
    (1 to 30).foreach { _ =>
      val s = randStats(rnd); val q = randQuery(rnd)
      val (rl, rs) = Ranking.components(s, q, params, collection)
      assert(Ranking.score(s, q, params, collection) == Ranking.combine(rl, rs, params.lambdaS))
    }
  }

  test("components match the hand-computed Eq. 2 on crafted stats") {
    val s = EntryStats(pL = 0.5, pS = 0.25, invTot = 0.1,
                       prod = Map(3L -> 0.4), ent = Map(7 -> 0.2, 8 -> 0.3))
    val q = ItemQuery(1L, 0, 3L, Seq((7, 1.0), (8, 2.0)))
    val (rl, rs) = Ranking.components(s, q, params, collection)
    val entSum = 1.0 * 0.2 + 2.0 * 0.3
    assert(math.abs(rl - (math.log(0.5) + math.log(0.4) + math.log(entSum))) < 1e-12)
    assert(math.abs(rs - math.log(0.25)) < 1e-12)
  }

  test("absent producer falls back to its smoothing floor") {
    val s = EntryStats(0.5, 0.5, 0.1, Map.empty, Map(7 -> 0.2))
    val q = ItemQuery(1L, 0, 99L, Seq((7, 1.0)))
    val (rl, _) = Ranking.components(s, q, params, collection)
    val floor = params.mu * collection.producerBg(99L) * 0.1
    assert(math.abs(rl - (math.log(0.5) + math.log(floor) + math.log(0.2))) < 1e-12)
  }

  test("absent entities fall back to their smoothing floors") {
    val s = EntryStats(0.5, 0.5, 0.1, Map(3L -> 0.4), Map.empty)
    val q = ItemQuery(1L, 0, 3L, Seq((7, 1.0), (8, 0.5)))
    val (rl, _) = Ranking.components(s, q, params, collection)
    val f7 = params.mu * collection.entityBg(7) * 0.1
    val f8 = params.mu * collection.entityBg(8) * 0.1
    assert(math.abs(rl - (math.log(0.5) + math.log(0.4) + math.log(f7 + 0.5 * f8))) < 1e-12)
  }

  test("score is monotone in matching-entity probability") {
    val q = ItemQuery(1L, 0, 3L, Seq((7, 1.0)))
    val lo = EntryStats(0.5, 0.5, 0.1, Map(3L -> 0.4), Map(7 -> 0.1))
    val hi = lo.copy(ent = Map(7 -> 0.6))
    assert(Ranking.score(hi, q, params, collection) > Ranking.score(lo, q, params, collection))
  }

  test("score is monotone in the BiHMM category probability") {
    val rnd = new Random(2)
    val q = randQuery(rnd)
    val s = randStats(rnd)
    val better = s.copy(pL = math.min(1.0, s.pL * 1.5), pS = math.min(1.0, s.pS * 1.5))
    assert(Ranking.score(better, q, params, collection) > Ranking.score(s, q, params, collection))
  }

  test("score never produces NaN or +Inf, even on degenerate stats") {
    val s = EntryStats(0.0, 0.0, 0.0, Map.empty, Map.empty)
    val q = ItemQuery(1L, 0, 3L, Seq.empty)
    val v = Ranking.score(s, q, params, collection)
    assert(!v.isNaN && v < 0)
  }

  test("lambda bounds are validated") {
    intercept[IllegalArgumentException](RankParams(lambdaS = -0.1))
    intercept[IllegalArgumentException](RankParams(lambdaS = 1.1))
    intercept[IllegalArgumentException](RankParams(mu = 0.0))
  }

  test("merged stats never score below either operand (bound used by Alg. 1)") {
    val rnd = new Random(3)
    (1 to 50).foreach { _ =>
      val a = randStats(rnd); val b = randStats(rnd); val q = randQuery(rnd)
      val m = a.merge(b)
      val sm = Ranking.score(m, q, params, collection)
      assert(sm >= Ranking.score(a, q, params, collection) - 1e-9)
      assert(sm >= Ranking.score(b, q, params, collection) - 1e-9)
    }
  }
}

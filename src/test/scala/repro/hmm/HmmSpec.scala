package repro.hmm

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class HmmSpec extends AnyFunSuite {

  private def assertDist(row: Array[Double], label: String): Unit = {
    assert(row.forall(_ >= 0.0), s"$label has negative entries: ${row.mkString(",")}")
    assert(math.abs(row.sum - 1.0) < 1e-9, s"$label does not sum to 1: ${row.sum}")
  }

  /** A deterministic 2-state model: state i emits symbol i, states alternate. */
  private val alternating = Hmm(
    pi = Array(1.0, 0.0),
    a = Array(Array(0.0, 1.0), Array(1.0, 0.0)),
    b = Array(Array(1.0, 0.0), Array(0.0, 1.0)))

  private def plantedSeq(T: Int, seed: Long): IndexedSeq[Int] = {
    // Sticky 2-state chain over 3 symbols with concentrated emissions.
    val rnd = new Random(seed)
    var s = 0
    (0 until T).map { _ =>
      if (rnd.nextDouble() > 0.85) s = 1 - s
      if (rnd.nextDouble() < 0.85) s else (s + 1 + rnd.nextInt(2)) % 3
    }
  }

  test("random init: pi is a distribution") {
    (1 to 5).foreach(s => assertDist(Hmm.random(4, 6, s).pi, s"pi(seed=$s)"))
  }

  test("random init: every transition row is a distribution") {
    (1 to 5).foreach(s => Hmm.random(4, 6, s).a.zipWithIndex.foreach {
      case (r, i) => assertDist(r, s"A($i)") })
  }

  test("random init: every emission row is a distribution") {
    (1 to 5).foreach(s => Hmm.random(4, 6, s).b.zipWithIndex.foreach {
      case (r, i) => assertDist(r, s"B($i)") })
  }

  test("random init: entries strictly positive") {
    val m = Hmm.random(3, 5, 9)
    assert(m.pi.forall(_ > 0) && m.a.flatten.forall(_ > 0) && m.b.flatten.forall(_ > 0))
  }

  test("forward: scaled alphas are per-step distributions") {
    val m = Hmm.random(3, 4, 1)
    val obs = IndexedSeq(0, 1, 2, 3, 1, 0, 2)
    val (alpha, _) = m.forward(obs)
    alpha.zipWithIndex.foreach { case (row, t) => assertDist(row, s"alpha($t)") }
  }

  test("logLikelihood of a uniform model is T*log(1/M)") {
    val n = 3; val mObs = 4
    val m = Hmm(
      Array.fill(n)(1.0 / n),
      Array.fill(n)(Array.fill(n)(1.0 / n)),
      Array.fill(n)(Array.fill(mObs)(1.0 / mObs)))
    val obs = IndexedSeq(0, 3, 2, 2, 1)
    assert(math.abs(m.logLikelihood(obs) - obs.length * math.log(1.0 / mObs)) < 1e-9)
  }

  test("logLikelihood of empty sequence is 0") {
    assert(Hmm.random(2, 3, 1).logLikelihood(IndexedSeq.empty) == 0.0)
  }

  test("viterbi recovers the states of a deterministic model") {
    val obs = IndexedSeq(0, 1, 0, 1, 0)
    assert(alternating.viterbi(obs).toSeq == Seq(0, 1, 0, 1, 0))
  }

  test("viterbi on empty sequence is empty") {
    assert(alternating.viterbi(IndexedSeq.empty).isEmpty)
  }

  test("filtered on empty history equals pi") {
    val m = Hmm.random(3, 4, 2)
    assert(m.filtered(IndexedSeq.empty).toSeq == m.pi.toSeq)
  }

  test("filtered is a distribution after any history") {
    val m = Hmm.random(3, 4, 2)
    assertDist(m.filtered(IndexedSeq(1, 0, 3, 2)), "filtered")
  }

  test("nextObsDist is a distribution") {
    val m = Hmm.random(3, 5, 4)
    assertDist(m.nextObsDist(IndexedSeq(0, 2, 4, 1)), "nextObsDist")
    assertDist(m.nextObsDist(IndexedSeq.empty), "nextObsDist(empty)")
  }

  test("nextObsDist of the deterministic model alternates") {
    // After observing 0 (state 0), the next state is 1, emitting symbol 1.
    val d = alternating.nextObsDist(IndexedSeq(0))
    assert(math.abs(d(1) - 1.0) < 1e-9)
  }

  test("predictNext returns the argmax symbol") {
    assert(alternating.predictNext(IndexedSeq(0)) == 1)
    assert(alternating.predictNext(IndexedSeq(0, 1)) == 0)
  }

  test("train: log-likelihood does not decrease vs the random init") {
    val obs = plantedSeq(200, 3)
    val init = Hmm.random(2, 3, 7)
    val trained = Hmm.train(obs, 2, 3, maxIter = 30, seed = 7)
    assert(trained.logLikelihood(obs) >= init.logLikelihood(obs) - 1e-6)
  }

  test("train result is a valid parametrization") {
    val m = Hmm.train(plantedSeq(150, 5), 3, 3, maxIter = 20, seed = 5)
    assertDist(m.pi, "pi")
    m.a.foreach(assertDist(_, "A row"))
    m.b.foreach(assertDist(_, "B row"))
  }

  test("train beats uniform prediction on sticky planted data") {
    val obs = plantedSeq(400, 11)
    val m = Hmm.train(obs.take(300), 2, 3, maxIter = 40, seed = 11)
    val hits = (300 until 400).count(t => m.predictNext(obs.take(t)) == obs(t))
    // A uniform guesser hits 1/3; the sticky chain is far more predictable.
    assert(hits > 40, s"only $hits/100 correct")
  }

  test("train handles a single-state model") {
    val m = Hmm.train(IndexedSeq(0, 1, 0, 1, 1), 1, 2, maxIter = 10)
    assert(m.nStates == 1)
    // Emissions converge to the empirical symbol frequencies.
    assert(math.abs(m.b(0)(1) - 0.6) < 0.05)
  }

  test("train handles an empty sequence") {
    val m = Hmm.train(IndexedSeq.empty, 2, 3)
    assertDist(m.pi, "pi")
  }

  test("train handles a length-1 sequence") {
    val m = Hmm.train(IndexedSeq(2), 2, 3, maxIter = 5)
    assertDist(m.pi, "pi")
    m.b.foreach(assertDist(_, "B row"))
  }

  test("model copes with symbols unseen in training") {
    val m = Hmm.train(IndexedSeq(0, 0, 0, 0, 0), 2, 3, maxIter = 10)
    // Symbol 2 never trained: likelihood finite, no NaN.
    val ll = m.logLikelihood(IndexedSeq(2, 2))
    assert(!ll.isNaN && ll < 0)
    assert(!m.nextObsDist(IndexedSeq(2)).exists(_.isNaN))
  }

  test("training is deterministic in the seed") {
    val obs = plantedSeq(100, 13)
    val m1 = Hmm.train(obs, 2, 3, seed = 21)
    val m2 = Hmm.train(obs, 2, 3, seed = 21)
    assert(m1.pi.toSeq == m2.pi.toSeq && m1.a.map(_.toSeq).toSeq == m2.a.map(_.toSeq).toSeq)
  }

  test("scalacheck: forward scales are positive for random models and sequences") {
    import org.scalacheck.{Gen, Prop, Test => ScTest}
    val gen = for {
      n <- Gen.choose(1, 4)
      m <- Gen.choose(2, 5)
      seed <- Gen.choose(1L, 1000L)
      len <- Gen.choose(1, 30)
      obs <- Gen.listOfN(len, Gen.choose(0, m - 1))
    } yield (Hmm.random(n, m, seed), obs.toIndexedSeq)
    val prop = Prop.forAll(gen) { case (model, obs) =>
      val (_, scales) = model.forward(obs)
      scales.forall(s => s > 0 && !s.isNaN)
    }
    val res = ScTest.check(ScTest.Parameters.default.withMinSuccessfulTests(50), prop)
    assert(res.passed, res.status.toString)
  }
}

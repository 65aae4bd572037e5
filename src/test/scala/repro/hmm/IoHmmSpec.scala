package repro.hmm

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class IoHmmSpec extends AnyFunSuite {

  private def assertDist(row: Array[Double], label: String): Unit = {
    assert(row.forall(_ >= 0.0), s"$label has negative entries")
    assert(math.abs(row.sum - 1.0) < 1e-9, s"$label does not sum to 1: ${row.sum}")
  }

  /** Wrap a plain HMM as a single-input IoHmm — the two must agree exactly. */
  private def wrap(h: Hmm): IoHmm = IoHmm(h.pi, Array(h.a), Array(h.b))

  /** Planted input-dependent sequence: input z flips the favoured symbol. */
  private def plantedIo(T: Int, seed: Long): IndexedSeq[(Int, Int)] = {
    val rnd = new Random(seed)
    (0 until T).map { _ =>
      val z = rnd.nextInt(2)
      val c = if (rnd.nextDouble() < 0.8) z else rnd.nextInt(3)
      (z, c)
    }
  }

  test("random init: pi, transitions and emissions are distributions") {
    val m = IoHmm.random(3, 2, 4, 5)
    assertDist(m.pi, "pi")
    m.a.foreach(_.foreach(assertDist(_, "A slice row")))
    m.b.foreach(_.foreach(assertDist(_, "B slice row")))
  }

  test("dimensions are reported correctly") {
    val m = IoHmm.random(3, 2, 5, 1)
    assert(m.nStates == 3 && m.nInputs == 2 && m.nObs == 5)
  }

  test("single-input IoHmm forward matches the plain HMM") {
    val h = Hmm.random(3, 4, 8)
    val io = wrap(h)
    val obs = IndexedSeq(0, 2, 1, 3, 0, 1)
    val llH = h.logLikelihood(obs)
    val llIo = io.logLikelihood(obs.map(c => (0, c)))
    assert(math.abs(llH - llIo) < 1e-9, s"$llH vs $llIo")
  }

  test("single-input IoHmm filtered matches the plain HMM") {
    val h = Hmm.random(2, 3, 3)
    val io = wrap(h)
    val obs = IndexedSeq(0, 1, 2, 2)
    val fh = h.filtered(obs)
    val fio = io.filtered(obs.map(c => (0, c)))
    fh.zip(fio).foreach { case (x, y) => assert(math.abs(x - y) < 1e-9) }
  }

  test("single-input IoHmm nextObsDist matches the plain HMM") {
    val h = Hmm.random(2, 3, 6)
    val io = wrap(h)
    val obs = IndexedSeq(1, 0, 2)
    val dh = h.nextObsDist(obs)
    val dio = io.nextObsDist(obs.map(c => (0, c)), Array(1.0))
    dh.zip(dio).foreach { case (x, y) => assert(math.abs(x - y) < 1e-9) }
  }

  test("forward: scaled alphas are per-step distributions") {
    val m = IoHmm.random(3, 2, 4, 2)
    val obs = IndexedSeq((0, 1), (1, 3), (0, 0), (1, 2))
    val (alpha, _) = m.forward(obs)
    alpha.foreach(assertDist(_, "alpha"))
  }

  test("nextObsDist is a distribution for any input mixture") {
    val m = IoHmm.random(2, 3, 4, 4)
    val obs = IndexedSeq((0, 1), (2, 3))
    assertDist(m.nextObsDist(obs, Array(0.2, 0.5, 0.3)), "nextObsDist")
    assertDist(m.nextObsDist(IndexedSeq.empty, Array(1.0, 0.0, 0.0)), "nextObsDist(empty)")
  }

  test("nextObsDist rejects a wrong-size input mixture") {
    val m = IoHmm.random(2, 3, 4, 4)
    intercept[IllegalArgumentException](m.nextObsDist(IndexedSeq.empty, Array(1.0)))
  }

  test("train: log-likelihood does not decrease vs the random init") {
    val obs = plantedIo(200, 17)
    val init = IoHmm.random(2, 2, 3, 11)
    val trained = IoHmm.train(obs, 2, 2, 3, maxIter = 30)
    assert(trained.logLikelihood(obs) >= init.logLikelihood(obs) - 1e-6)
  }

  test("train result is a valid parametrization") {
    val m = IoHmm.train(plantedIo(150, 19), 2, 2, 3, maxIter = 20)
    assertDist(m.pi, "pi")
    m.a.foreach(_.foreach(assertDist(_, "A")))
    m.b.foreach(_.foreach(assertDist(_, "B")))
  }

  test("train learns the input dependency of planted data") {
    val obs = plantedIo(500, 23)
    val m = IoHmm.train(obs.take(400), 2, 2, 3, maxIter = 40)
    // Input z favours symbol z with prob ~0.87 in the planted process; a model
    // that exploits z should predict the favoured symbol when zDist is pinned.
    val hits = (400 until 500).count { t =>
      val (z, c) = obs(t)
      val zd = Array(0.0, 0.0); zd(z) = 1.0
      m.predictNext(obs.take(t), zd) == c
    }
    assert(hits > 55, s"only $hits/100 correct")
  }

  test("train validates observation ranges") {
    intercept[IllegalArgumentException](IoHmm.train(IndexedSeq((5, 0)), 2, 2, 3))
    intercept[IllegalArgumentException](IoHmm.train(IndexedSeq((0, 9)), 2, 2, 3))
  }

  test("train handles empty and length-1 sequences") {
    assertDist(IoHmm.train(IndexedSeq.empty, 2, 2, 3).pi, "pi(empty)")
    assertDist(IoHmm.train(IndexedSeq((1, 2)), 2, 2, 3, maxIter = 5).pi, "pi(len1)")
  }

  test("training is deterministic in the seed") {
    val obs = plantedIo(100, 29)
    val m1 = IoHmm.train(obs, 2, 2, 3, seed = 31)
    val m2 = IoHmm.train(obs, 2, 2, 3, seed = 31)
    assert(m1.pi.toSeq == m2.pi.toSeq)
    assert(m1.b.map(_.map(_.toSeq).toSeq).toSeq == m2.b.map(_.map(_.toSeq).toSeq).toSeq)
  }

  test("scalacheck: likelihood finite for random models and observations") {
    import org.scalacheck.{Gen, Prop, Test => ScTest}
    val gen = for {
      n <- Gen.choose(1, 3)
      nz <- Gen.choose(1, 3)
      m <- Gen.choose(2, 4)
      seed <- Gen.choose(1L, 500L)
      len <- Gen.choose(1, 25)
      obs <- Gen.listOfN(len, Gen.zip(Gen.choose(0, nz - 1), Gen.choose(0, m - 1)))
    } yield (IoHmm.random(n, nz, m, seed), obs.toIndexedSeq)
    val prop = Prop.forAll(gen) { case (model, obs) =>
      val ll = model.logLikelihood(obs)
      !ll.isNaN && !ll.isInfinity
    }
    val res = ScTest.check(ScTest.Parameters.default.withMinSuccessfulTests(50), prop)
    assert(res.passed, res.status.toString)
  }
}

package repro.hmm

import scala.util.Random

/** Discrete hidden Markov model `λ = ⟨π, A, B⟩` (paper Section IV-A, a-HMM layer).
  *
  * `pi(i)` is the initial probability of state i, `a(i)(j)` the transition
  * probability i→j, and `b(j)(m)` the probability of emitting observation
  * symbol m from state j. All algorithms use the scaled forward/backward
  * recursions so sequences of thousands of steps do not underflow.
  */
final case class Hmm(pi: Array[Double], a: Array[Array[Double]], b: Array[Array[Double]]) {

  /** Number of hidden states N. */
  def nStates: Int = pi.length

  /** Number of observation symbols M. */
  def nObs: Int = b(0).length

  /** Scaled forward pass.
    *
    * @return (alphaHat, scales) where `alphaHat(t)(i)` is the normalized
    *         forward probability of state i after observing `obs(0..t)` and
    *         `scales(t)` is the per-step normalizer; the log-likelihood of the
    *         sequence is `scales.map(math.log).sum`.
    */
  def forward(obs: IndexedSeq[Int]): (Array[Array[Double]], Array[Double]) = {
    val T = obs.length
    val alpha  = Array.ofDim[Double](T, nStates)
    val scales = Array.ofDim[Double](T)
    var t = 0
    while (t < T) {
      var i = 0
      var norm = 0.0
      while (i < nStates) {
        val prior =
          if (t == 0) pi(i)
          else {
            var s = 0.0; var j = 0
            while (j < nStates) { s += alpha(t - 1)(j) * a(j)(i); j += 1 }
            s
          }
        val v = prior * b(i)(obs(t))
        alpha(t)(i) = v
        norm += v
        i += 1
      }
      // A zero-probability step (symbol never emitted under current params)
      // would poison the rest of the pass; fall back to a uniform posterior.
      if (norm <= 0.0) {
        var j = 0; while (j < nStates) { alpha(t)(j) = 1.0 / nStates; j += 1 }
        scales(t) = 1e-300
      } else {
        var j = 0; while (j < nStates) { alpha(t)(j) /= norm; j += 1 }
        scales(t) = norm
      }
      t += 1
    }
    (alpha, scales)
  }

  /** Scaled backward pass using the forward scales. `beta(t)(i)` is normalized
    * by the same per-step scale as the forward pass, so `alpha·beta` yields the
    * smoothed state posterior directly.
    */
  def backward(obs: IndexedSeq[Int], scales: Array[Double]): Array[Array[Double]] = {
    val T = obs.length
    val beta = Array.ofDim[Double](T, nStates)
    var i = 0
    while (i < nStates) { beta(T - 1)(i) = 1.0; i += 1 }
    var t = T - 2
    while (t >= 0) {
      var ii = 0
      while (ii < nStates) {
        var s = 0.0; var j = 0
        while (j < nStates) { s += a(ii)(j) * b(j)(obs(t + 1)) * beta(t + 1)(j); j += 1 }
        beta(t)(ii) = s / math.max(scales(t + 1), 1e-300)
        ii += 1
      }
      t -= 1
    }
    beta
  }

  /** Filtered state distribution p(state | obs); equals `pi` on an empty history. */
  def filtered(obs: IndexedSeq[Int]): Array[Double] =
    if (obs.isEmpty) pi.clone()
    else forward(obs)._1.last.clone()

  /** Log-likelihood of the observation sequence under this model. */
  def logLikelihood(obs: IndexedSeq[Int]): Double =
    if (obs.isEmpty) 0.0
    else forward(obs)._2.map(s => math.log(math.max(s, 1e-300))).sum

  /** Most likely hidden state sequence (Viterbi, log-space). */
  def viterbi(obs: IndexedSeq[Int]): Array[Int] = {
    val T = obs.length
    if (T == 0) return Array.emptyIntArray
    val delta = Array.ofDim[Double](T, nStates)
    val psi   = Array.ofDim[Int](T, nStates)
    def lg(x: Double): Double = math.log(math.max(x, 1e-300))
    var i = 0
    while (i < nStates) { delta(0)(i) = lg(pi(i)) + lg(b(i)(obs(0))); i += 1 }
    var t = 1
    while (t < T) {
      var j = 0
      while (j < nStates) {
        var best = Double.NegativeInfinity; var arg = 0; var k = 0
        while (k < nStates) {
          val v = delta(t - 1)(k) + lg(a(k)(j))
          if (v > best) { best = v; arg = k }
          k += 1
        }
        delta(t)(j) = best + lg(b(j)(obs(t)))
        psi(t)(j) = arg
        j += 1
      }
      t += 1
    }
    val path = Array.ofDim[Int](T)
    path(T - 1) = delta(T - 1).indices.maxBy(delta(T - 1))
    t = T - 2
    while (t >= 0) { path(t) = psi(t + 1)(path(t + 1)); t -= 1 }
    path
  }

  /** One-step-ahead observation distribution p(o_{T+1} = m | obs). On an empty
    * history this is the marginal emission under the initial distribution.
    */
  def nextObsDist(obs: IndexedSeq[Int]): Array[Double] = {
    val filt = filtered(obs)
    val stateNext = Array.ofDim[Double](nStates)
    if (obs.isEmpty) {
      System.arraycopy(filt, 0, stateNext, 0, nStates)
    } else {
      var j = 0
      while (j < nStates) {
        var s = 0.0; var i = 0
        while (i < nStates) { s += filt(i) * a(i)(j); i += 1 }
        stateNext(j) = s
        j += 1
      }
    }
    val out = Array.ofDim[Double](nObs)
    var j = 0
    while (j < nStates) {
      var m = 0
      while (m < nObs) { out(m) += stateNext(j) * b(j)(m); m += 1 }
      j += 1
    }
    out
  }

  /** Most likely next observation symbol. */
  def predictNext(obs: IndexedSeq[Int]): Int = {
    val d = nextObsDist(obs)
    d.indices.maxBy(d)
  }
}

object Hmm {

  /** Normalize a row in place; a degenerate all-zero row becomes uniform. */
  private[hmm] def normalize(row: Array[Double]): Unit = {
    var s = 0.0; var i = 0
    while (i < row.length) { s += row(i); i += 1 }
    if (s <= 0.0) { i = 0; while (i < row.length) { row(i) = 1.0 / row.length; i += 1 } }
    else { i = 0; while (i < row.length) { row(i) /= s; i += 1 } }
  }

  /** Row-normalized random initialization; strictly positive entries so every
    * transition/emission stays reachable during Baum-Welch.
    */
  def random(nStates: Int, nObs: Int, seed: Long): Hmm = {
    val rnd = new Random(seed)
    def row(n: Int): Array[Double] = {
      val r = Array.fill(n)(0.2 + rnd.nextDouble())
      normalize(r); r
    }
    Hmm(row(nStates), Array.fill(nStates)(row(nStates)), Array.fill(nStates)(row(nObs)))
  }

  /** Relabel hidden states into a canonical order — by dominant emission
    * symbol (ties by full emission row). Baum-Welch state identities are
    * arbitrary per training run; canonical labels make the decoded states of
    * *different* models comparable, which the BiHMM's b-layer needs when it
    * conditions on states decoded by many per-producer a-HMMs.
    */
  def canonicalize(h: Hmm): Hmm = {
    val order = (0 until h.nStates)
      .sortBy(j => (h.b(j).indices.maxBy(h.b(j)), -h.b(j).max))
      .toArray
    Hmm(
      Array.tabulate(h.nStates)(k => h.pi(order(k))),
      Array.tabulate(h.nStates, h.nStates)((k, l) => h.a(order(k))(order(l))),
      Array.tabulate(h.nStates, h.nObs)((k, m) => h.b(order(k))(m)),
    )
  }

  /** [[train]] with random restarts: EM is run from several seeds and the
    * highest-likelihood model wins. Used for the a-HMM layer, where a bad
    * local optimum corrupts every downstream decoded producer state.
    */
  def trainBest(obs: IndexedSeq[Int], nStates: Int, nObs: Int,
                maxIter: Int = 40, tol: Double = 1e-5, seed: Long = 7,
                restarts: Int = 3): Hmm = {
    val models = (0 until math.max(1, restarts)).map(r => train(obs, nStates, nObs, maxIter, tol, seed + 1000L * r))
    if (obs.isEmpty) models.head else models.maxBy(_.logLikelihood(obs))
  }

  /** Baum-Welch (EM) estimation of `λ = ⟨π, A, B⟩` from a single observation
    * sequence (paper: "We use Baum-Welch algorithm [32] to learn all three
    * parameters"). Iterates until the log-likelihood gain drops below `tol` or
    * `maxIter` is hit. A small Dirichlet-style floor keeps rows strictly
    * positive so Viterbi and prediction never hit log(0).
    */
  def train(obs: IndexedSeq[Int], nStates: Int, nObs: Int,
            maxIter: Int = 40, tol: Double = 1e-5, seed: Long = 7): Hmm = {
    require(nStates >= 1, "nStates must be >= 1")
    require(nObs >= 1, "nObs must be >= 1")
    val T = obs.length
    if (T == 0) return uniformFloor(random(nStates, nObs, seed))
    var model = random(nStates, nObs, seed)
    var prevLl = Double.NegativeInfinity
    var iter = 0
    var done = false
    while (iter < maxIter && !done) {
      val (alpha, scales) = model.forward(obs)
      val beta = model.backward(obs, scales)
      val n = nStates
      val gamma = Array.ofDim[Double](T, n)
      var t = 0
      while (t < T) {
        var s = 0.0; var i = 0
        while (i < n) { gamma(t)(i) = alpha(t)(i) * beta(t)(i); s += gamma(t)(i); i += 1 }
        if (s > 0) { i = 0; while (i < n) { gamma(t)(i) /= s; i += 1 } }
        t += 1
      }
      val aNum = Array.ofDim[Double](n, n)
      val aDen = Array.ofDim[Double](n)
      t = 0
      while (t < T - 1) {
        var denom = 0.0
        var i = 0
        while (i < n) {
          var j = 0
          while (j < n) {
            denom += alpha(t)(i) * model.a(i)(j) * model.b(j)(obs(t + 1)) * beta(t + 1)(j)
            j += 1
          }
          i += 1
        }
        if (denom > 0) {
          i = 0
          while (i < n) {
            var j = 0
            while (j < n) {
              val xi = alpha(t)(i) * model.a(i)(j) * model.b(j)(obs(t + 1)) * beta(t + 1)(j) / denom
              aNum(i)(j) += xi
              aDen(i) += xi
              j += 1
            }
            i += 1
          }
        }
        t += 1
      }
      val bNum = Array.ofDim[Double](n, nObs)
      val bDen = Array.ofDim[Double](n)
      t = 0
      while (t < T) {
        var i = 0
        while (i < n) { bNum(i)(obs(t)) += gamma(t)(i); bDen(i) += gamma(t)(i); i += 1 }
        t += 1
      }
      val eps = 1e-6
      val newPi = gamma(0).clone()
      normalize(newPi)
      val newA = Array.tabulate(n, n)((i, j) => aNum(i)(j) + eps)
      newA.foreach(normalize)
      val newB = Array.tabulate(n, nObs)((i, m) => bNum(i)(m) + eps)
      newB.foreach(normalize)
      model = Hmm(newPi, newA, newB)
      val ll = scales.map(s => math.log(math.max(s, 1e-300))).sum
      if (ll - prevLl < tol && iter > 0) done = true
      prevLl = ll
      iter += 1
    }
    model
  }

  private def uniformFloor(m: Hmm): Hmm = m
}

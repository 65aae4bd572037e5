package repro.index

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class OnePassClusteringSpec extends AnyFunSuite {
  import OnePassClustering._

  test("cosine of a vector with itself is 1") {
    val v = Array(0.3, 0.5, 0.2)
    assert(math.abs(cosine(v, v) - 1.0) < 1e-12)
  }

  test("cosine of orthogonal vectors is 0") {
    assert(cosine(Array(1.0, 0.0), Array(0.0, 1.0)) == 0.0)
  }

  test("cosine is symmetric") {
    val a = Array(0.2, 0.7, 0.1); val b = Array(0.5, 0.1, 0.4)
    assert(math.abs(cosine(a, b) - cosine(b, a)) < 1e-12)
  }

  test("cosine treats the zero vector as orthogonal") {
    assert(cosine(Array(0.0, 0.0), Array(1.0, 1.0)) == 0.0)
  }

  test("cosine rejects dimension mismatch") {
    intercept[IllegalArgumentException](cosine(Array(1.0), Array(1.0, 2.0)))
  }

  test("every input id gets a block") {
    val vs = (0L until 40L).map(i => (i, Array(Random.nextDouble(), Random.nextDouble())))
    val out = cluster(vs, maxBlocks = 5)
    assert(out.keySet == vs.map(_._1).toSet)
  }

  test("block ids are contiguous from 0") {
    val rnd = new Random(1)
    val vs = (0L until 60L).map(i => (i, Array.fill(4)(rnd.nextDouble())))
    val out = cluster(vs, maxBlocks = 8, threshold = 0.95)
    val ids = out.values.toSet
    assert(ids == (0 until ids.size).toSet)
  }

  test("maxBlocks = 1 puts everyone in one block") {
    val vs = (0L until 20L).map(i => (i, Array(i.toDouble, 1.0)))
    assert(cluster(vs, maxBlocks = 1).values.toSet == Set(0))
  }

  test("never exceeds maxBlocks") {
    val rnd = new Random(2)
    val vs = (0L until 100L).map(i => (i, Array.fill(6)(rnd.nextDouble())))
    (1 to 10).foreach { mb =>
      assert(cluster(vs, maxBlocks = mb, threshold = 0.99).values.toSet.size <= mb)
    }
  }

  test("identical vectors share a block") {
    val v = Array(0.5, 0.5, 0.0)
    val vs = (0L until 10L).map(i => (i, v.clone()))
    assert(cluster(vs, maxBlocks = 5).values.toSet.size == 1)
  }

  test("clearly separated groups split into distinct blocks") {
    val g1 = (0L until 10L).map(i => (i, Array(1.0, 0.0, 0.0)))
    val g2 = (10L until 20L).map(i => (i, Array(0.0, 1.0, 0.0)))
    val g3 = (20L until 30L).map(i => (i, Array(0.0, 0.0, 1.0)))
    val out = cluster(g1 ++ g2 ++ g3, maxBlocks = 10, threshold = 0.8)
    assert(out.values.toSet.size == 3)
    assert((0L until 10L).map(out).toSet.size == 1)
    assert((10L until 20L).map(out).toSet.size == 1)
    assert((20L until 30L).map(out).toSet.size == 1)
  }

  test("a higher block budget never yields fewer blocks on the same input") {
    val rnd = new Random(3)
    val vs = (0L until 80L).map(i => (i, Array.fill(5)(rnd.nextDouble())))
    val sizes = Seq(1, 2, 4, 8, 16).map(mb => cluster(vs, mb, threshold = 0.99).values.toSet.size)
    assert(sizes == sizes.sorted, s"block counts not monotone: $sizes")
  }

  test("clustering is deterministic") {
    val rnd = new Random(4)
    val vs = (0L until 50L).map(i => (i, Array.fill(3)(rnd.nextDouble())))
    assert(cluster(vs, 6) == cluster(vs, 6))
  }
}

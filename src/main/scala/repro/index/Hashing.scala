package repro.index

/** The *shift-add-xor* string hashing class of Eq. 5 (after Ramakrishna &
  * Zobel), used to map category-entity pairs to hash-table buckets:
  *
  *   init(s)        = seed
  *   step(i, h, c)  = h ⊕ (L_L(h) + R_R(h) + c)
  *   final(h, T)    = h mod T
  */
object Hashing {

  /** Default shift amounts and seed from the original shift-add-xor family. */
  val DefaultL: Int = 5
  val DefaultR: Int = 2
  val DefaultSeed: Int = 31

  /** Hash a string into `[0, buckets)`. */
  def shiftAddXor(s: String, buckets: Int,
                  l: Int = DefaultL, r: Int = DefaultR, seed: Int = DefaultSeed): Int = {
    require(buckets > 0, "buckets must be positive")
    var h = seed
    var i = 0
    while (i < s.length) {
      h = h ^ ((h << l) + (h >>> r) + s.charAt(i))
      i += 1
    }
    math.floorMod(h, buckets)
  }

  /** Canonical key string of a category-entity pair. */
  def pairKey(category: Int, entity: Int): String = s"c$category#e$entity"

  /** Bucket of a category-entity pair. */
  def pairHash(category: Int, entity: Int, buckets: Int): Int =
    shiftAddXor(pairKey(category, entity), buckets)
}

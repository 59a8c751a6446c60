package repro.core

/** Bitvector encoding of a provenance sketch (paper Sec. 7): one bit per
  * fragment of the partition, packed into machine words. A sketch for a
  * 10000-fragment partition is ~1.2 KB — the "10s or 100s of bytes" compact
  * relevance description the paper exploits.
  */
final class BitSketch private (val nFragments: Int, private val words: Array[Long])
    extends Serializable {

  def get(i: Int): Boolean = {
    require(i >= 0 && i < nFragments, s"fragment $i out of [0, $nFragments)")
    (words(i >> 6) & (1L << (i & 63))) != 0
  }

  /** Selected fragment indexes in ascending order. */
  def fragments: Seq[Int] = (0 until nFragments).filter(get)

  def cardinality: Int = words.map(java.lang.Long.bitCount).sum

  /** Fraction of fragments selected — for equi-depth partitions this
    * approximates the fraction of rows covered (sketch selectivity, Fig. 9).
    */
  def selectivity: Double = cardinality.toDouble / nFragments

  def isEmpty: Boolean = cardinality == 0
  def isFull: Boolean  = cardinality == nFragments

  /** Non-mutating union — sketches are immutable outside capture. */
  def or(o: BitSketch): BitSketch = {
    require(o.nFragments == nFragments, "fragment count mismatch")
    val w = words.clone()
    var i = 0
    while (i < w.length) { w(i) |= o.words(i); i += 1 }
    new BitSketch(nFragments, w)
  }

  def subsetOf(o: BitSketch): Boolean = {
    require(o.nFragments == nFragments, "fragment count mismatch")
    words.indices.forall(i => (words(i) & ~o.words(i)) == 0)
  }

  def toWords: Array[Long] = words.clone()
  def sizeInBytes: Int = words.length * 8

  override def equals(o: Any): Boolean = o match {
    case b: BitSketch => b.nFragments == nFragments && java.util.Arrays.equals(b.words, words)
    case _            => false
  }
  override def hashCode: Int = nFragments * 31 + java.util.Arrays.hashCode(words)
  override def toString: String = s"BitSketch($nFragments, {${fragments.mkString(",")}})"
}

object BitSketch {
  def nWords(nFragments: Int): Int = (nFragments + 63) >> 6

  def empty(nFragments: Int): BitSketch =
    new BitSketch(nFragments, new Array[Long](nWords(nFragments)))

  def full(nFragments: Int): BitSketch =
    fromFragments(nFragments, 0 until nFragments)

  def fromFragments(nFragments: Int, frags: Iterable[Int]): BitSketch = {
    val w = new Array[Long](nWords(nFragments))
    frags.foreach { i =>
      require(i >= 0 && i < nFragments, s"fragment $i out of [0, $nFragments)")
      w(i >> 6) |= 1L << (i & 63)
    }
    new BitSketch(nFragments, w)
  }

  /** Wrap capture output words (from the BITOR aggregators). */
  def fromWords(nFragments: Int, words: Array[Long]): BitSketch = {
    require(words.length == nWords(nFragments), "word length mismatch")
    new BitSketch(nFragments, words.clone())
  }
}

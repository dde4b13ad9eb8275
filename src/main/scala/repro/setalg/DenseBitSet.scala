package repro.setalg

import java.util.Arrays

/** The paper's dense bitvector set: one bit per vertex of the universe.
  *
  * O(1) `add` / `remove` / `contains` (the property the paper leans on for
  * Bron-Kerbosch's dynamic P/X/R sets), word-parallel ∩ / ∪ / \ via bitwise
  * ops, popcount-based cardinality. Space is Θ(universe) bits regardless of
  * occupancy — the dense end of the space/perf trade-off (§5.2).
  */
final class DenseBitSet private[setalg] (private val words: Array[Long],
                                         private var card: Int) extends VertexSet {

  override def cardinality: Int = card

  override def contains(b: Int): Boolean = {
    val w = b >>> 6
    w < words.length && ((words(w) >>> (b & 63)) & 1L) == 1L
  }

  private def asDense(b: VertexSet): DenseBitSet = b match {
    case d: DenseBitSet => d
    case other =>
      val out = new Array[Long](words.length)
      var c = 0
      other.iterator.foreach { v =>
        val w = v >>> 6
        if (w < out.length) { out(w) |= 1L << (v & 63); c += 1 }
      }
      new DenseBitSet(out, c)
  }

  private def zipNew(b: VertexSet)(op: (Long, Long) => Long): DenseBitSet = {
    val d = asDense(b)
    val n = words.length
    val out = new Array[Long](n)
    var c = 0; var i = 0
    while (i < n) {
      val w = op(words(i), if (i < d.words.length) d.words(i) else 0L)
      out(i) = w; c += java.lang.Long.bitCount(w); i += 1
    }
    new DenseBitSet(out, c)
  }

  override def intersect(b: VertexSet): VertexSet = zipNew(b)(_ & _)
  override def diff(b: VertexSet): VertexSet      = zipNew(b)(_ & ~_)
  override def union(b: VertexSet): VertexSet     = zipNew(b)(_ | _)

  override def intersectCount(b: VertexSet): Int = b match {
    case d: DenseBitSet =>
      var c = 0; var i = 0
      val n = math.min(words.length, d.words.length)
      while (i < n) { c += java.lang.Long.bitCount(words(i) & d.words(i)); i += 1 }
      c
    case other if other.cardinality < cardinality =>
      var c = 0
      other.iterator.foreach(v => if (contains(v)) c += 1)
      c
    case other =>
      var c = 0
      iterator.foreach(v => if (other.contains(v)) c += 1)
      c
  }

  private def zipInplace(b: VertexSet)(op: (Long, Long) => Long): Unit = {
    val d = asDense(b)
    var c = 0; var i = 0
    while (i < words.length) {
      val w = op(words(i), if (i < d.words.length) d.words(i) else 0L)
      words(i) = w; c += java.lang.Long.bitCount(w); i += 1
    }
    card = c
  }

  override def intersectInplace(b: VertexSet): Unit = zipInplace(b)(_ & _)
  override def diffInplace(b: VertexSet): Unit      = zipInplace(b)(_ & ~_)

  override def add(b: Int): Unit = {
    val w = b >>> 6
    require(w < words.length, s"vertex $b outside universe of ${words.length * 64}")
    if (((words(w) >>> (b & 63)) & 1L) == 0L) { words(w) |= 1L << (b & 63); card += 1 }
  }

  override def remove(b: Int): Unit = {
    val w = b >>> 6
    if (w < words.length && ((words(w) >>> (b & 63)) & 1L) == 1L) {
      words(w) &= ~(1L << (b & 63)); card -= 1
    }
  }

  override def iterator: Iterator[Int] = new Iterator[Int] {
    private var wi = 0
    private var cur = if (words.nonEmpty) words(0) else 0L
    private def advance(): Unit =
      while (cur == 0L && wi < words.length - 1) { wi += 1; cur = words(wi) }
    advance()
    override def hasNext: Boolean = cur != 0L
    override def next(): Int = {
      val bit = java.lang.Long.numberOfTrailingZeros(cur)
      cur &= cur - 1
      val v = (wi << 6) + bit
      advance()
      v
    }
  }

  override def copy(): VertexSet = new DenseBitSet(words.clone(), card)

  def storageBytes: Long = 16L + 8L * words.length
}

object DenseBitSet extends SetFactory {
  override def name = "DenseBitSet"

  private def nWords(universe: Int): Int = math.max(1, (universe + 63) >>> 6)

  override def empty(universe: Int): VertexSet =
    new DenseBitSet(new Array[Long](nWords(universe)), 0)

  override def fromSorted(sorted: Array[Int], universe: Int): VertexSet = {
    val hi = if (sorted.isEmpty) universe else math.max(universe, sorted.last + 1)
    val words = new Array[Long](nWords(hi))
    var i = 0
    while (i < sorted.length) { val v = sorted(i); words(v >>> 6) |= 1L << (v & 63); i += 1 }
    new DenseBitSet(words, sorted.length)
  }
}

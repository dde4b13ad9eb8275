package repro.setalg

/** The paper's `HashSet` representation (they use the Robin Hood library;
  * here an open-addressing linear-probe table over primitive `Int`s, which
  * keeps the same O(1) expected point ops without boxing).
  *
  * Sentinel `-1` marks empty slots (vertex IDs are non-negative). Deletion
  * uses backward-shift compaction, the Robin-Hood-family approach that avoids
  * tombstone buildup in Bron-Kerbosch's heavy add/remove churn.
  */
final class HashVertexSet private[setalg] (initialCapacity: Int) extends VertexSet {

  private var table: Array[Int] = {
    val cap = math.max(8, Integer.highestOneBit(math.max(1, initialCapacity * 2 - 1)) * 2)
    Array.fill(cap)(-1)
  }
  private var size = 0

  private def mask: Int = table.length - 1
  private def slot(v: Int): Int = {
    // Fibonacci hashing spreads consecutive vertex IDs across the table.
    ((v * 0x9E3779B9) >>> (32 - Integer.numberOfTrailingZeros(table.length))) & mask
  }

  private def grow(): Unit = {
    val old = table
    table = Array.fill(old.length * 2)(-1)
    size = 0
    var i = 0
    while (i < old.length) { if (old(i) >= 0) add(old(i)); i += 1 }
  }

  override def cardinality: Int = size

  override def contains(b: Int): Boolean = {
    var i = slot(b)
    while (table(i) != -1) {
      if (table(i) == b) return true
      i = (i + 1) & mask
    }
    false
  }

  override def add(b: Int): Unit = {
    if (size * 4 >= table.length * 3) grow()
    var i = slot(b)
    while (table(i) != -1) {
      if (table(i) == b) return
      i = (i + 1) & mask
    }
    table(i) = b
    size += 1
  }

  override def remove(b: Int): Unit = {
    var i = slot(b)
    while (table(i) != -1 && table(i) != b) i = (i + 1) & mask
    if (table(i) == -1) return
    // Backward-shift deletion: re-seat the probe chain after the hole.
    table(i) = -1
    size -= 1
    var j = (i + 1) & mask
    while (table(j) != -1) {
      val v = table(j)
      table(j) = -1
      size -= 1
      add(v)
      j = (j + 1) & mask
    }
  }

  override def intersect(b: VertexSet): VertexSet = {
    val out = new HashVertexSet(math.min(cardinality, b.cardinality))
    val it = iterator
    while (it.hasNext) { val v = it.next(); if (b.contains(v)) out.add(v) }
    out
  }

  override def intersectCount(b: VertexSet): Int = {
    val (small, large) = if (cardinality <= b.cardinality) (this: VertexSet, b) else (b, this: VertexSet)
    var c = 0
    val it = small.iterator
    while (it.hasNext) { if (large.contains(it.next())) c += 1 }
    c
  }

  override def diff(b: VertexSet): VertexSet = {
    val out = new HashVertexSet(cardinality)
    val it = iterator
    while (it.hasNext) { val v = it.next(); if (!b.contains(v)) out.add(v) }
    out
  }

  override def union(b: VertexSet): VertexSet = {
    val out = new HashVertexSet(cardinality + b.cardinality)
    iterator.foreach(out.add)
    b.iterator.foreach(out.add)
    out
  }

  override def intersectInplace(b: VertexSet): Unit = {
    val keep = iterator.filter(b.contains).toArray
    java.util.Arrays.fill(table, -1)
    size = 0
    keep.foreach(add)
  }

  override def diffInplace(b: VertexSet): Unit = {
    val drop = iterator.filter(b.contains).toArray
    drop.foreach(remove)
  }

  /** Ascending order, per the interface contract (sorts on demand). */
  override def iterator: Iterator[Int] = {
    val out = new Array[Int](size)
    var i = 0; var k = 0
    while (i < table.length) { if (table(i) >= 0) { out(k) = table(i); k += 1 }; i += 1 }
    java.util.Arrays.sort(out)
    out.iterator
  }

  override def copy(): VertexSet = {
    val out = new HashVertexSet(size)
    var i = 0
    while (i < table.length) { if (table(i) >= 0) out.add(table(i)); i += 1 }
    out
  }

  def storageBytes: Long = 24L + 4L * table.length
}

object HashVertexSet extends SetFactory {
  override def name = "HashSet"
  override def empty(universe: Int): VertexSet = new HashVertexSet(8)
  override def fromSorted(sorted: Array[Int], universe: Int): VertexSet = {
    val s = new HashVertexSet(sorted.length)
    sorted.foreach(s.add)
    s
  }
}

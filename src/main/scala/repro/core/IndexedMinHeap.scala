package repro.core

/** Array-backed binary min-heap over dense non-negative integer ids with
  * O(log n) insert / pop / change-key and O(1) contains / key lookup.
  *
  * Ordering is lexicographic on `(key, id)` so every consumer of the heap is
  * deterministic: the static peeling (Algorithm 1 of the paper) and the
  * incremental reordering (§4.1 / Algorithm 2) break weight ties identically,
  * which makes "incremental sequence == static sequence" an exact, testable
  * equality rather than a density-only statement.
  *
  * The heap is reusable across reorder calls: `clear()` resets only the
  * entries that are currently present (O(size)), not the whole id space.
  */
final class IndexedMinHeap(initialCapacity: Int = 16) {
  private var keys = new Array[Double](math.max(1, initialCapacity))
  private var pos  = Array.fill(math.max(1, initialCapacity))(-1)
  private var heap = new Array[Int](math.max(1, initialCapacity))
  private var n    = 0

  /** Number of entries currently in the heap. */
  def size: Int = n
  def isEmpty: Boolean  = n == 0
  def nonEmpty: Boolean = n > 0

  /** Grow internal arrays so `id` is addressable. */
  private def ensureId(id: Int): Unit = {
    if (id >= pos.length) {
      val newCap  = math.max(pos.length * 2, id + 1)
      val newKeys = new Array[Double](newCap)
      val newPos  = Array.fill(newCap)(-1)
      System.arraycopy(keys, 0, newKeys, 0, keys.length)
      System.arraycopy(pos, 0, newPos, 0, pos.length)
      keys = newKeys
      pos = newPos
    }
    if (n >= heap.length) {
      val newHeap = new Array[Int](math.max(heap.length * 2, n + 1))
      System.arraycopy(heap, 0, newHeap, 0, heap.length)
      heap = newHeap
    }
  }

  /** True iff `id` is currently in the heap. */
  def contains(id: Int): Boolean = id < pos.length && pos(id) >= 0

  /** Current key of `id`; requires `contains(id)`. */
  def keyOf(id: Int): Double = {
    require(contains(id), s"id $id not in heap")
    keys(id)
  }

  @inline private def less(i: Int, j: Int): Boolean = {
    val a = heap(i); val b = heap(j)
    val ka = keys(a); val kb = keys(b)
    ka < kb || (ka == kb && a < b)
  }

  @inline private def swap(i: Int, j: Int): Unit = {
    val a = heap(i); val b = heap(j)
    heap(i) = b; heap(j) = a
    pos(b) = i; pos(a) = j
  }

  private def siftUp(i0: Int): Unit = {
    var i = i0
    while (i > 0 && less(i, (i - 1) / 2)) { swap(i, (i - 1) / 2); i = (i - 1) / 2 }
  }

  private def siftDown(i0: Int): Unit = {
    var i = i0
    var done = false
    while (!done) {
      val l = 2 * i + 1; val r = 2 * i + 2
      var m = i
      if (l < n && less(l, m)) m = l
      if (r < n && less(r, m)) m = r
      if (m == i) done = true else { swap(i, m); i = m }
    }
  }

  /** Insert a new id; requires it is not already present. */
  def insert(id: Int, key: Double): Unit = {
    require(id >= 0, "ids must be non-negative")
    ensureId(id)
    require(pos(id) < 0, s"id $id already in heap")
    keys(id) = key
    heap(n) = id
    pos(id) = n
    n += 1
    siftUp(n - 1)
  }

  /** Set the key of an existing id (may move it either direction). */
  def changeKey(id: Int, key: Double): Unit = {
    require(contains(id), s"id $id not in heap")
    val old = keys(id)
    keys(id) = key
    if (key < old) siftUp(pos(id)) else siftDown(pos(id))
  }

  /** Add `delta` to the key of an existing id. */
  def addTo(id: Int, delta: Double): Unit = changeKey(id, keys(id) + delta)

  /** Id with the smallest (key, id); requires nonEmpty. */
  def minId: Int = { require(n > 0, "heap is empty"); heap(0) }

  /** Smallest key; requires nonEmpty. */
  def minKey: Double = { require(n > 0, "heap is empty"); keys(heap(0)) }

  /** Remove and return the id with the smallest (key, id). */
  def popMin(): Int = {
    require(n > 0, "heap is empty")
    val top = heap(0)
    n -= 1
    if (n > 0) {
      heap(0) = heap(n)
      pos(heap(0)) = 0
      siftDown(0)
    }
    pos(top) = -1
    top
  }

  /** Remove all entries; O(current size). */
  def clear(): Unit = {
    var i = 0
    while (i < n) { pos(heap(i)) = -1; i += 1 }
    n = 0
  }
}

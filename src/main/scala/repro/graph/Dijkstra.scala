package repro.graph

/** Reference shortest-path algorithms — the independent distance oracle
  * used by tests and by the approximate-betweenness ranking.
  */
object Dijkstra {

  /** Sentinel for "unreachable"; safely addable without overflow. */
  val Inf: Long = Long.MaxValue / 4

  /** Single-source shortest distances from `src` (plain binary-heap
    * Dijkstra with lazy deletion).
    */
  def sssp(g: CsrGraph, src: Int): Array[Long] = {
    val dist = Array.fill[Long](g.n)(Inf)
    val heap = new LongMinHeap(64)
    dist(src) = 0
    heap.push(0L, src)
    while (heap.nonEmpty) {
      val d = heap.topDist; val v = heap.topVertex; heap.pop()
      if (d == dist(v)) {
        var e = g.offsets(v)
        while (e < g.offsets(v + 1)) {
          val u = g.nbrs(e); val nd = d + g.wts(e)
          if (nd < dist(u)) { dist(u) = nd; heap.push(nd, u) }
          e += 1
        }
      }
    }
    dist
  }

  /** All-pairs distances via repeated Dijkstra (tests only; O(n·m·log n)). */
  def allPairs(g: CsrGraph): Array[Array[Long]] =
    Array.tabulate(g.n)(sssp(g, _))

  /** All-pairs distances via Floyd–Warshall — an implementation independent
    * from the heap code above, so the two can cross-check each other.
    */
  def floydWarshall(g: CsrGraph): Array[Array[Long]] = {
    val n = g.n
    val d = Array.fill(n, n)(Inf)
    var v = 0
    while (v < n) {
      d(v)(v) = 0
      var e = g.offsets(v)
      while (e < g.offsets(v + 1)) {
        val u = g.nbrs(e)
        if (g.wts(e) < d(v)(u)) d(v)(u) = g.wts(e)
        e += 1
      }
      v += 1
    }
    var k = 0
    while (k < n) {
      var i = 0
      while (i < n) {
        val dik = d(i)(k)
        if (dik < Inf) {
          var j = 0
          while (j < n) {
            val nd = dik + d(k)(j)
            if (nd < d(i)(j)) d(i)(j) = nd
            j += 1
          }
        }
        i += 1
      }
      k += 1
    }
    d
  }
}

/** Array-backed binary min-heap of (distance, vertex) pairs packed into a
  * single Long (`dist << 21 | v`). Lazy deletion: callers push duplicates
  * and skip stale pops by comparing against their dist array.
  *
  * Packing limits: `n < 2^21` vertices and distances `< 2^42` — far beyond
  * anything this reproduction instantiates (asserted in `push`).
  */
final class LongMinHeap(initialCapacity: Int) {
  private var arr  = new Array[Long](math.max(4, initialCapacity))
  private var size = 0

  private final val VBits = 21
  private final val VMask = (1L << VBits) - 1

  def nonEmpty: Boolean = size > 0
  def isEmpty: Boolean  = size == 0

  def topDist: Long  = arr(0) >>> VBits
  def topVertex: Int = (arr(0) & VMask).toInt

  def push(dist: Long, v: Int): Unit = {
    require(v >= 0 && v < (1 << VBits) && dist >= 0 && dist < (1L << (63 - VBits)),
      s"heap packing overflow: dist=$dist v=$v")
    if (size == arr.length) arr = java.util.Arrays.copyOf(arr, arr.length * 2)
    var i = size
    arr(i) = (dist << VBits) | v
    size += 1
    while (i > 0 && arr((i - 1) / 2) > arr(i)) {
      val p = (i - 1) / 2
      val t = arr(p); arr(p) = arr(i); arr(i) = t
      i = p
    }
  }

  def pop(): Unit = {
    size -= 1
    arr(0) = arr(size)
    var i = 0
    var done = false
    while (!done) {
      val l = 2 * i + 1; val r = l + 1
      var s = i
      if (l < size && arr(l) < arr(s)) s = l
      if (r < size && arr(r) < arr(s)) s = r
      if (s == i) done = true
      else { val t = arr(s); arr(s) = arr(i); arr(i) = t; i = s }
    }
  }

  def clear(): Unit = size = 0
}

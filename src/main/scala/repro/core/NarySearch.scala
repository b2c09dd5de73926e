package repro.core

/** One IVF bucket (or partition) in the conventional horizontal layout:
  * vector i occupies `data(i*d until (i+1)*d)`. `suffixSqNorms` mirrors the
  * PDX block metadata for BSA (`suffixSqNorms(i*(d+1)+j) = Σ_{t≥j} v_i(t)²`).
  */
final case class NaryBucket(ids: Array[Long], n: Int, d: Int,
                            data: Array[Float], suffixSqNorms: Array[Float]) {
  require(ids.length == n && data.length == n * d)
}

object NaryBucket {
  def pack(vecs: IndexedSeq[Array[Float]], ids: IndexedSeq[Long],
           withSuffixNorms: Boolean = false): NaryBucket = {
    require(vecs.nonEmpty)
    val d = vecs.head.length
    val data = PdxLayout.packNary(vecs)
    val suffix =
      if (!withSuffixNorms) Array.emptyFloatArray
      else {
        val s = new Array[Float](vecs.length * (d + 1))
        var i = 0
        while (i < vecs.length) {
          val v = vecs(i)
          val base = i * (d + 1)
          var accD = 0.0
          s(base + d) = 0f
          var j = d - 1
          while (j >= 0) { accD += v(j).toDouble * v(j); s(base + j) = accD.toFloat; j -= 1 }
          i += 1
        }
        s
      }
    NaryBucket(ids.toArray, vecs.length, d, data, suffix)
  }
}

/** The original ADSampling/BSA search strategy on horizontal storage:
  * vector-at-a-time, with the pruning bound evaluated every Δd dimensions,
  * interleaved with the distance computation (the branchy pattern §6.3
  * profiles). τ tightens after every accepted vector.
  *
  * Used as the N-ary side of Table 7 and the SIMD-ADS/BSA stand-in.
  */
final class NarySearcher(val k: Int, val deltaD: Int = 32,
                         profiler: SearchProfiler = null) {

  def search(buckets: IterableOnce[NaryBucket], rawQuery: Array[Float],
             pruner: Pruner): KnnHeap = {
    val t0 = if (profiler ne null) System.nanoTime() else 0L
    val pq = pruner.prepareQuery(rawQuery)
    if (profiler ne null) profiler.queryPrepNanos += System.nanoTime() - t0
    searchPrepared(buckets, pq, new KnnHeap(k))
  }

  def searchPrepared(buckets: IterableOnce[NaryBucket], pq: PreparedQuery,
                     heap: KnnHeap): KnnHeap = {
    val it = buckets.iterator
    while (it.hasNext) {
      val b = it.next()
      val q = pq.query
      val d = b.d
      val stride = d + 1
      val suffix = b.suffixSqNorms
      val t0 = if (profiler ne null) System.nanoTime() else 0L
      var dimValues = 0L
      var evals = 0L
      var i = 0
      while (i < b.n) {
        val o = i * d
        val tau = heap.threshold // tightens per accepted vector
        var partial = 0f
        var dv = 0
        var prunedV = false
        if (tau == Float.PositiveInfinity) {
          partial = Kernels.l2Unrolled(b.data, o, q, d)
          dv = d
          dimValues += d
        } else {
          while (dv < d && !prunedV) {
            val nd = math.min(d, dv + deltaD)
            partial += Kernels.l2PartialNary(b.data, o, q, dv, nd)
            dimValues += nd - dv
            dv = nd
            if (dv < d) {
              val vs = if (suffix.length == 0) 0f else suffix(i * stride + dv)
              evals += 1
              if (pq.bound(partial, dv, vs) > tau) prunedV = true
            }
          }
        }
        if (!prunedV) heap.push(b.ids(i), partial)
        i += 1
      }
      if (profiler ne null) {
        // Interleaved per-vector segments are too small to time individually;
        // record the whole bucket scan as distance time plus the op counts —
        // the bench splits it with calibrated unit costs (DESIGN.md #5).
        profiler.distanceNanos += System.nanoTime() - t0
        profiler.dimValuesScanned += dimValues
        profiler.boundEvals += evals
      }
    }
    heap
  }
}

/** Exact linear scans over each layout — the non-pruning competitors
  * (FAISS / Milvus / USearch / sklearn stand-ins, DSM, PDX-LINEAR-SCAN,
  * N-ary+Gather of §7).
  */
object LinearScan {

  /** Horizontal scan with the unrolled ("SIMD") kernel. */
  def naryKnn(data: Array[Float], n: Int, d: Int, q: Array[Float], k: Int): KnnHeap = {
    val heap = new KnnHeap(k)
    var i = 0
    while (i < n) {
      heap.push(i.toLong, Kernels.l2Unrolled(data, i * d, q, d))
      i += 1
    }
    heap
  }

  /** Horizontal scan with the plain scalar kernel (the "vanilla" baseline). */
  def naryScalarKnn(data: Array[Float], n: Int, d: Int, q: Array[Float], k: Int): KnnHeap = {
    val heap = new KnnHeap(k)
    var i = 0
    while (i < n) {
      heap.push(i.toLong, Kernels.l2Scalar(data, i * d, q, d))
      i += 1
    }
    heap
  }

  /** PDX linear scan: blocks of vectors, dimension-at-a-time, no pruning. */
  def pdxKnn(blocks: IterableOnce[PdxBlock], q: Array[Float], k: Int): KnnHeap = {
    val heap = new KnnHeap(k)
    var acc = Array.emptyFloatArray
    val it = blocks.iterator
    while (it.hasNext) {
      val b = it.next()
      if (acc.length < b.n) acc = new Array[Float](b.n)
      java.util.Arrays.fill(acc, 0, b.n, 0f)
      Kernels.l2Pdx(b.data, b.n, q, 0, b.d, acc)
      var i = 0
      while (i < b.n) { heap.push(b.ids(i), acc(i)); i += 1 }
    }
    heap
  }

  /** Fully decomposed (DSM) linear scan: whole-collection columns. */
  def dsmKnn(columns: Array[Array[Float]], n: Int, q: Array[Float], k: Int): KnnHeap = {
    val acc = new Array[Float](n)
    Kernels.l2Dsm(columns, n, q, acc)
    val heap = new KnnHeap(k)
    var i = 0
    while (i < n) { heap.push(i.toLong, acc(i)); i += 1 }
    heap
  }

  /** N-ary + on-the-fly gather scan (§7): PDX-style computation with
    * strided loads from horizontal storage, 64 vectors at-a-time.
    */
  def gatherKnn(data: Array[Float], n: Int, d: Int, q: Array[Float], k: Int,
                group: Int = 64): KnnHeap = {
    val heap = new KnnHeap(k)
    val out = new Array[Float](group)
    var v0 = 0
    while (v0 < n) {
      val count = math.min(group, n - v0)
      Kernels.l2NaryGather(data, v0, count, d, q, out)
      var i = 0
      while (i < count) { heap.push((v0 + i).toLong, out(i)); i += 1 }
      v0 += count
    }
    heap
  }
}

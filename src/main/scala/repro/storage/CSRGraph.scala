package repro.storage

import scala.util.Random

/** The paper's in-memory default-index layout at the data-structure level
  * (§3, §4.3): a compressed-sparse-row adjacency whose per-vertex ID lists
  * store (8-byte edge ID, 4-byte neighbour ID) pairs contiguously.
  * Vertex IDs are 0-based ints here.
  */
final class CSRGraph(val nV: Int, val offsets: Array[Int],
                     val eIds: Array[Long], val nbrs: Array[Int]) {
  def nE: Int = eIds.length
  def listStart(v: Int): Int = offsets(v)
  def listEnd(v: Int): Int = offsets(v + 1)
  def degree(v: Int): Int = offsets(v + 1) - offsets(v)
  /** Model bytes of the ID lists (8 B edge ID + 4 B neighbour ID). */
  def idListBytes: Long = 12L * nE
}

object CSRGraph {
  /** Counting-sort edges by source into CSR form. */
  def build(nV: Int, src: Array[Int], dst: Array[Int], eIds: Array[Long]): CSRGraph = {
    val n = src.length
    val offsets = new Array[Int](nV + 1)
    var i = 0
    while (i < n) { offsets(src(i) + 1) += 1; i += 1 }
    i = 0
    while (i < nV) { offsets(i + 1) += offsets(i); i += 1 }
    val pos  = java.util.Arrays.copyOf(offsets, nV)
    val oe   = new Array[Long](n)
    val onbr = new Array[Int](n)
    i = 0
    while (i < n) {
      val p = pos(src(i)); pos(src(i)) += 1
      oe(p) = eIds(i); onbr(p) = dst(i)
      i += 1
    }
    new CSRGraph(nV, offsets, oe, onbr)
  }

  /** Deterministic synthetic multigraph with skewed degrees (driver-side
    * counterpart of [[repro.core.GraphGen]], for data-structure benches). */
  def random(nV: Int, nE: Int, skew: Double = 2.0, seed: Long = 7L): CSRGraph = {
    val rnd = new Random(seed)
    val src = new Array[Int](nE)
    val dst = new Array[Int](nE)
    val ids = new Array[Long](nE)
    var i = 0
    while (i < nE) {
      src(i) = (math.pow(rnd.nextDouble(), skew) * nV).toInt.min(nV - 1)
      val d = (math.pow(rnd.nextDouble(), skew) * nV).toInt.min(nV - 1)
      dst(i) = if (d == src(i)) (d + 1) % nV else d
      ids(i) = i + 1L
      i += 1
    }
    build(nV, src, dst, ids)
  }
}

/** A secondary vertex-bound index stored as offset lists into the CSR's ID
  * lists (§3): per vertex, a byte-encoded permutation (or subset) of
  * positions within that vertex's default list. */
final class OffsetIndex(val csr: CSRGraph, val lists: Array[Array[Byte]]) {
  /** Offset-list model bytes (1-byte header + width·len per vertex list). */
  def offsetBytes: Long = lists.map(_.length.toLong).sum
}

object OffsetIndex {
  /** The §3 list-level-indirection index: each vertex's list in a random
    * (e.g. differently-sorted) within-list order. */
  def shuffled(csr: CSRGraph, seed: Long = 11L): OffsetIndex = {
    val rnd = new Random(seed)
    val lists = new Array[Array[Byte]](csr.nV)
    var v = 0
    while (v < csr.nV) {
      val d = csr.degree(v)
      val perm = rnd.shuffle((0 until d).toVector).toArray
      lists(v) = OffsetListCodec.encode(perm)
      v += 1
    }
    new OffsetIndex(csr, lists)
  }
}

/** The §3 "graph-level indirection" baseline: all adjacency lists shuffled
  * into a single physical pool; logical position i of a list indirects
  * through ``perm(i)`` into the shuffled pool — random reads spanning all
  * |E| entries instead of staying within one short list. The entry read is
  * still the semantically correct one (``poolE(perm(i)) == eIds(i)``). */
final class GraphIndirection(val csr: CSRGraph, val perm: Array[Int],
                             val poolE: Array[Long], val poolN: Array[Int])

object GraphIndirection {
  def shuffled(csr: CSRGraph, seed: Long = 13L): GraphIndirection = {
    val rnd   = new Random(seed)
    val perm  = rnd.shuffle((0 until csr.nE).toVector).toArray
    val poolE = new Array[Long](csr.nE)
    val poolN = new Array[Int](csr.nE)
    var i = 0
    while (i < csr.nE) {
      poolE(perm(i)) = csr.eIds(i)
      poolN(perm(i)) = csr.nbrs(i)
      i += 1
    }
    new GraphIndirection(csr, perm, poolE, poolN)
  }
}

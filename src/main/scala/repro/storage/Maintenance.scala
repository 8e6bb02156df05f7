package repro.storage

import scala.collection.mutable

/** §5.5 maintenance micro-benchmark substrate: a single-threaded in-memory
  * adjacency store with per-vertex update buffers (20 % of the data size,
  * merged when full — §4.4) under progressively richer index configurations:
  *
  *  - D_s   — no secondary partitioning, lists sorted by neighbour ID
  *  - D_p   — partitioned by adjacent-edge label, unsorted
  *  - D_ps  — partitioned by label and sorted by neighbour ID
  *  - D_ps+VB_t — adds a secondary vertex-bound offset index sorted on time
  *  - D_ps+EB_t — adds an edge-bound index over the 2-path
  *    ``v_nbr ←[e_adj]− v_s −[e_b]→ v_d`` with predicate
  *    ``e_b.time < e_adj.time + α`` (α at ~1 % selectivity): each insert
  *    runs the two delta-queries of §4.4 (update the lists of bound edges
  *    sharing the source, then build the new edge's own list).
  */
object Maintenance {

  sealed trait Config { def name: String }
  case object Ds   extends Config { val name = "D_s"      }
  case object Dp   extends Config { val name = "D_p"      }
  case object Dps  extends Config { val name = "D_ps"     }
  case object VBt  extends Config { val name = "D_ps+VB_t" }
  final case class EBt(alpha: Double) extends Config { val name = "D_ps+EB_t" }

  final case class Edge(eId: Long, src: Int, dst: Int, label: Int, time: Int)

  /** One direction's per-vertex page: main arrays + an update buffer. */
  private final class Page {
    var main = new mutable.ArrayBuffer[Edge]()
    val buf  = new mutable.ArrayBuffer[Edge]()
    def bufCap: Int = math.max(4, main.size / 5)
  }

  final class Store(val nV: Int, val cfg: Config) {
    private val fwd = Array.fill(nV)(new Page)
    private val bwd = Array.fill(nV)(new Page)
    /** VB_t: per-vertex forward offset view sorted on time (rebuilt on merge). */
    private val vbt = Array.fill(nV)(new mutable.ArrayBuffer[Edge]())
    /** EB_t: per-bound-edge adjacency (edge IDs of qualifying adjacent edges). */
    val ebt = mutable.LongMap.empty[mutable.ArrayBuffer[Long]]

    private def nbrKey(dir: Boolean, e: Edge): Int = if (dir) e.dst else e.src

    private def merge(p: Page, dirFwd: Boolean, v: Int): Unit = {
      p.main ++= p.buf
      val ord: Ordering[Edge] = cfg match {
        case Ds  => Ordering.by(e => (nbrKey(dirFwd, e), e.eId))
        case Dp  => Ordering.by(e => (e.label, e.eId))
        case _   => Ordering.by(e => (e.label, nbrKey(dirFwd, e), e.eId))
      }
      p.main = p.main.sorted(ord)
      p.buf.clear()
      if (cfg == VBt && dirFwd) {
        // rebuild the time-sorted offset view of v's merged forward list
        vbt(v).clear()
        vbt(v) ++= p.main.sortBy(_.time)
      }
    }

    def insert(e: Edge): Unit = {
      if (cfg == VBt) {
        // keep the time-sorted secondary view current before any merge (a
        // merge rebuilds it wholesale from the compacted main list)
        val lst = vbt(e.src)
        var lo = 0; var hi = lst.size
        while (lo < hi) {
          val mid = (lo + hi) >>> 1
          if (lst(mid).time <= e.time) lo = mid + 1 else hi = mid
        }
        lst.insert(lo, e)
      }
      val pf = fwd(e.src)
      pf.buf += e
      if (pf.buf.size >= pf.bufCap) merge(pf, dirFwd = true, e.src)
      val pb = bwd(e.dst)
      pb.buf += e
      if (pb.buf.size >= pb.bufCap) merge(pb, dirFwd = false, e.dst)

      cfg match {
        case EBt(alpha) =>
          // Delta query 1: the new edge joins the lists of bound edges that
          // share its source and pass the predicate.
          outEdges(e.src).foreach { eb =>
            if (eb.eId != e.eId && eb.time < e.time + alpha)
              ebt.getOrElseUpdate(eb.eId, new mutable.ArrayBuffer[Long]()) += e.eId
          }
          // Delta query 2: build the new bound edge's own list.
          val own = ebt.getOrElseUpdate(e.eId, new mutable.ArrayBuffer[Long]())
          outEdges(e.src).foreach { a =>
            if (a.eId != e.eId && e.time < a.time + alpha) own += a.eId
          }
        case _ => ()
      }
    }

    def outEdges(v: Int): Seq[Edge] = fwd(v).main.toSeq ++ fwd(v).buf.toSeq

    def inEdges(v: Int): Seq[Edge] = bwd(v).main.toSeq ++ bwd(v).buf.toSeq

    /** Force-merge every page (end-of-ingest compaction). */
    def compact(): Unit = {
      var v = 0
      while (v < nV) {
        merge(fwd(v), dirFwd = true, v)
        merge(bwd(v), dirFwd = false, v)
        v += 1
      }
    }

    def timeSortedOut(v: Int): Seq[Edge] = vbt(v).toSeq
  }

  /** Load `initial` in bulk, then insert `stream` one edge at a time;
    * returns single-threaded sustained inserts/second over the stream. */
  def throughput(nV: Int, cfg: Config, initial: Seq[Edge], stream: Seq[Edge]): (Store, Double) = {
    val st = new Store(nV, cfg)
    initial.foreach(st.insert)
    st.compact()
    val t0 = System.nanoTime()
    stream.foreach(st.insert)
    val dt = (System.nanoTime() - t0) / 1e9
    (st, stream.size / math.max(dt, 1e-9))
  }
}

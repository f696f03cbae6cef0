package repro.index

import repro.core.Linalg
import scala.collection.mutable

/** Hierarchical Navigable Small World graph (Malkov & Yashunin, TPAMI 2020)
  * over cosine similarity — the index the paper credits with the 3,000×
  * query-time gain on WDC.
  *
  * Faithful to the published algorithm: exponential level assignment with
  * mL = 1/ln(M); greedy descent through upper layers; beam search of width
  * efConstruction at insertion / efSearch at query; neighbour lists pruned
  * to M (2M at layer 0) keeping the closest.
  */
final class Hnsw(dim: Int, m: Int = 16, efConstruction: Int = 100,
                 efSearch: Int = 64, seed: Long = 42) extends VectorIndex {

  private val mMax0 = 2 * m
  private val levelMult = 1.0 / math.log(m.toDouble)
  private val rnd = new scala.util.Random(seed)

  private val vecs = mutable.ArrayBuffer[Array[Float]]()
  private val extIds = mutable.ArrayBuffer[Int]()
  /** neighbours(node)(layer) = array buffer of node ids */
  private val neighbours = mutable.ArrayBuffer[Array[mutable.ArrayBuffer[Int]]]()
  private var entryPoint = -1
  private var maxLayer = -1

  @inline private def sim(a: Int, q: Array[Float]): Float = Linalg.dot(vecs(a), q)

  override def size: Int = vecs.size

  override def add(id: Int, vec: Array[Float]): Unit = {
    require(vec.length == dim)
    val node = vecs.size
    vecs += vec
    extIds += id
    val level = math.floor(-math.log(rnd.nextDouble() + 1e-12) * levelMult).toInt
    neighbours += Array.fill(level + 1)(mutable.ArrayBuffer[Int]())

    if (entryPoint < 0) { entryPoint = node; maxLayer = level; return }

    var ep = entryPoint
    // greedy descent on layers above the new node's level
    var layer = maxLayer
    while (layer > level) {
      ep = greedyClosest(vec, ep, layer)
      layer -= 1
    }
    // beam-search insert on each layer ≤ min(level, maxLayer)
    layer = math.min(level, maxLayer)
    while (layer >= 0) {
      val cands = searchLayer(vec, ep, efConstruction, layer)
      val cap   = if (layer == 0) mMax0 else m
      val selected = selectHeuristic(cands, m, vec)
      val bucket = neighbours(node)(layer)
      selected.foreach { nb =>
        bucket += nb
        val back = neighbours(nb)(layer)
        back += node
        if (back.size > cap) {
          // prune with the same diversity heuristic, keyed on nb
          val scored = back.map(x => (x, sim(x, vecs(nb)))).sortBy(-_._2).toIndexedSeq
          val pruned = selectHeuristic(scored, cap, vecs(nb))
          back.clear(); back ++= pruned
        }
      }
      if (cands.nonEmpty) ep = cands.head._1
      layer -= 1
    }
    if (level > maxLayer) { maxLayer = level; entryPoint = node }
  }

  override def search(query: Array[Float], k: Int): IndexedSeq[(Int, Float)] = {
    if (entryPoint < 0) return IndexedSeq.empty
    var ep = entryPoint
    var layer = maxLayer
    while (layer > 0) {
      ep = greedyClosest(query, ep, layer)
      layer -= 1
    }
    searchLayer(query, ep, math.max(efSearch, k), 0)
      .take(k)
      .map { case (n, s) => (extIds(n), s) }
  }

  /** Neighbour selection heuristic (Malkov & Yashunin, Alg. 4): pick up to
    * `cap` candidates that are closer to the query point than to any
    * already-selected neighbour — diversity keeps clustered regions
    * navigable. Remaining slots are filled with the closest leftovers.
    */
  private def selectHeuristic(cands: IndexedSeq[(Int, Float)], cap: Int,
                              q: Array[Float]): IndexedSeq[Int] = {
    val selected = mutable.ArrayBuffer[Int]()
    cands.foreach { case (c, simToQ) =>
      if (selected.size < cap) {
        val diverse = selected.forall(s => sim(c, vecs(s)) < simToQ)
        if (diverse) selected += c
      }
    }
    if (selected.size < cap) {
      val chosen = selected.toSet
      cands.iterator.map(_._1).filterNot(chosen.contains)
        .take(cap - selected.size).foreach(selected += _)
    }
    selected.toIndexedSeq
  }

  /** greedy hill-climb to the locally closest node on `layer` */
  private def greedyClosest(q: Array[Float], start: Int, layer: Int): Int = {
    var cur = start
    var curSim = sim(cur, q)
    var improved = true
    while (improved) {
      improved = false
      val nbs = neighbours(cur)
      if (layer < nbs.length) {
        nbs(layer).foreach { nb =>
          val s = sim(nb, q)
          if (s > curSim) { curSim = s; cur = nb; improved = true }
        }
      }
    }
    cur
  }

  /** beam search of width `ef` on `layer`; returns candidates best-first */
  private def searchLayer(q: Array[Float], ep: Int, ef: Int,
                          layer: Int): IndexedSeq[(Int, Float)] = {
    val visited = mutable.HashSet[Int](ep)
    // candidates: max-heap by sim; results: min-heap by sim (bounded by ef)
    val cand = mutable.PriorityQueue[(Int, Float)]()(Ordering.by(_._2))
    val res  = mutable.PriorityQueue[(Int, Float)]()(Ordering.by(-_._2))
    val epSim = sim(ep, q)
    cand.enqueue((ep, epSim)); res.enqueue((ep, epSim))
    while (cand.nonEmpty) {
      val (c, cSim) = cand.dequeue()
      val worst = res.head._2
      if (cSim < worst && res.size >= ef) {
        cand.clear() // nothing closer can be found
      } else {
        val nbs = neighbours(c)
        if (layer < nbs.length) {
          nbs(layer).foreach { nb =>
            if (!visited.contains(nb)) {
              visited += nb
              val s = sim(nb, q)
              if (res.size < ef || s > res.head._2) {
                cand.enqueue((nb, s))
                res.enqueue((nb, s))
                if (res.size > ef) res.dequeue()
              }
            }
          }
        }
      }
    }
    res.dequeueAll.reverse.toIndexedSeq
  }

  override def memoryBytes: Long = {
    var links = 0L
    neighbours.foreach(_.foreach(links += _.size))
    size.toLong * (4L + 4L * dim) + links * 4L
  }
}

package repro.index

import repro.core.Linalg

/** Approximate (or exact) nearest-neighbour index over L2-normalized vectors
  * under cosine similarity. Ids are dense ints assigned by the caller.
  */
trait VectorIndex extends Serializable {
  /** insert a vector (must be L2-normalized) */
  def add(id: Int, vec: Array[Float]): Unit
  /** top-k most similar ids with their cosine similarity, descending */
  def search(query: Array[Float], k: Int): IndexedSeq[(Int, Float)]
  def size: Int
  /** approximate in-memory footprint in bytes, for the Table 6 experiment */
  def memoryBytes: Long
}

/** Exact brute-force index — the recall reference and the "Linear" design
  * choice's candidate generator (i.e. no filtering at all).
  */
final class LinearIndex(dim: Int) extends VectorIndex {
  private val ids  = scala.collection.mutable.ArrayBuffer[Int]()
  private val vecs = scala.collection.mutable.ArrayBuffer[Array[Float]]()

  override def add(id: Int, vec: Array[Float]): Unit = {
    require(vec.length == dim); ids += id; vecs += vec
  }

  override def search(query: Array[Float], k: Int): IndexedSeq[(Int, Float)] = {
    val scored = new Array[(Int, Float)](ids.size)
    var i = 0
    while (i < ids.size) {
      scored(i) = (ids(i), Linalg.dot(query, vecs(i)))
      i += 1
    }
    scored.sortBy(-_._2).take(k).toIndexedSeq
  }

  override def size: Int = ids.size
  override def memoryBytes: Long = size.toLong * (4L + 4L * dim)
}

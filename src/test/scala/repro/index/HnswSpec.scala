package repro.index

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Linalg
import scala.util.Random

class HnswSpec extends AnyFunSuite {

  private def randomUnit(d: Int, rnd: Random): Array[Float] =
    Linalg.normalize(Array.fill(d)(rnd.nextGaussian().toFloat))

  test("empty index returns nothing") {
    val h = new Hnsw(4)
    assert(h.search(Array(1f, 0f, 0f, 0f), 5).isEmpty)
  }

  test("single element is found") {
    val h = new Hnsw(2)
    h.add(7, Array(1f, 0f))
    val res = h.search(Array(1f, 0f), 1)
    assert(res.size == 1 && res.head._1 == 7)
    assert(math.abs(res.head._2 - 1f) < 1e-6)
  }

  test("exact nearest neighbour on a tiny set") {
    val h = new Hnsw(2)
    h.add(0, Array(1f, 0f))
    h.add(1, Array(0f, 1f))
    h.add(2, Linalg.normalized(Array(1f, 0.1f)))
    val res = h.search(Array(1f, 0f), 2).map(_._1)
    assert(res.head == 0 && res(1) == 2)
  }

  test("results are sorted by similarity descending") {
    val rnd = new Random(1)
    val h = new Hnsw(8)
    (0 until 200).foreach(i => h.add(i, randomUnit(8, rnd)))
    val res = h.search(randomUnit(8, rnd), 10)
    assert(res.map(_._2).toSeq == res.map(_._2).sortBy(-_).toSeq)
  }

  test("recall@10 ≥ 0.9 vs linear scan on 2000 random vectors") {
    val rnd = new Random(2)
    val d = 16
    val vecs = IndexedSeq.fill(2000)(randomUnit(d, rnd))
    val hnsw = new Hnsw(d, m = 16, efConstruction = 100, efSearch = 80)
    val lin  = new LinearIndex(d)
    vecs.zipWithIndex.foreach { case (v, i) => hnsw.add(i, v); lin.add(i, v) }
    val recalls = (0 until 30).map { _ =>
      val q = randomUnit(d, rnd)
      val exact  = lin.search(q, 10).map(_._1).toSet
      val approx = hnsw.search(q, 10).map(_._1).toSet
      exact.intersect(approx).size.toDouble / exact.size
    }
    val avg = recalls.sum / recalls.size
    assert(avg >= 0.9, s"HNSW recall too low: $avg")
  }

  test("recall on clustered data (the lake regime) is near-perfect") {
    val rnd = new Random(4)
    val d = 16
    // 20 clusters of 50 vectors each
    val centers = IndexedSeq.fill(20)(randomUnit(d, rnd))
    val vecs = (0 until 1000).map { i =>
      val c = centers(i % 20)
      Linalg.normalized(c.zip(randomUnit(d, rnd)).map { case (a, b) => a + 0.15f * b })
    }
    val hnsw = new Hnsw(d)
    val lin  = new LinearIndex(d)
    vecs.zipWithIndex.foreach { case (v, i) => hnsw.add(i, v); lin.add(i, v) }
    val recalls = centers.map { q =>
      val exact  = lin.search(q, 20).map(_._1).toSet
      val approx = hnsw.search(q, 20).map(_._1).toSet
      exact.intersect(approx).size.toDouble / exact.size
    }
    assert(recalls.sum / recalls.size >= 0.95)
  }

  test("search is deterministic for a fixed build seed") {
    val rnd = new Random(5)
    def build(): Hnsw = {
      val h = new Hnsw(8, seed = 99)
      val r = new Random(3)
      (0 until 300).foreach(i => h.add(i, randomUnit(8, r)))
      h
    }
    val q = randomUnit(8, rnd)
    assert(build().search(q, 5) == build().search(q, 5))
  }

  test("memoryBytes grows with inserts") {
    val h = new Hnsw(8)
    val rnd = new Random(6)
    h.add(0, randomUnit(8, rnd))
    val m1 = h.memoryBytes
    (1 until 100).foreach(i => h.add(i, randomUnit(8, rnd)))
    assert(h.memoryBytes > m1)
    assert(h.size == 100)
  }
}

package repro.core

/** Minimal dense float linear algebra used by the encoders, the contrastive
  * trainer, and the vector indexes. Everything is plain arrays — no external
  * math dependency is available offline, and the shapes are tiny (embedding
  * dim ≤ 128, feature dim ≤ ~1100).
  */
object Linalg {

  def dot(a: Array[Float], b: Array[Float]): Float = {
    var s = 0.0f; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  def norm(a: Array[Float]): Float = math.sqrt(dot(a, a).toDouble).toFloat

  /** L2-normalize in place; a zero vector is left untouched. Returns `a`. */
  def normalize(a: Array[Float]): Array[Float] = {
    val n = norm(a)
    if (n > 1e-12f) { var i = 0; while (i < a.length) { a(i) /= n; i += 1 } }
    a
  }

  def normalized(a: Array[Float]): Array[Float] = normalize(a.clone())

  /** Cosine similarity; 0 when either vector is zero. */
  def cosine(a: Array[Float], b: Array[Float]): Float = {
    val na = norm(a); val nb = norm(b)
    if (na < 1e-12f || nb < 1e-12f) 0.0f else dot(a, b) / (na * nb)
  }

  def axpy(alpha: Float, x: Array[Float], y: Array[Float]): Unit = {
    var i = 0
    while (i < x.length) { y(i) += alpha * x(i); i += 1 }
  }

  /** y = W x for a row-major matrix W (rows × cols). */
  def matVec(w: Array[Array[Float]], x: Array[Float]): Array[Float] = {
    val out = new Array[Float](w.length)
    var r = 0
    while (r < w.length) { out(r) = dot(w(r), x); r += 1 }
    out
  }

  /** grad += alpha * (g ⊗ x): rank-1 update of a row-major matrix. */
  def outerAdd(grad: Array[Array[Float]], alpha: Float,
               g: Array[Float], x: Array[Float]): Unit = {
    var r = 0
    while (r < g.length) {
      val gr = alpha * g(r)
      if (gr != 0.0f) axpy(gr, x, grad(r))
      r += 1
    }
  }

  def zeros(rows: Int, cols: Int): Array[Array[Float]] =
    Array.fill(rows)(new Array[Float](cols))

  /** Gaussian init scaled by 1/sqrt(cols) — the "pre-trained LM" stand-in. */
  def randomMatrix(rows: Int, cols: Int, seed: Long): Array[Array[Float]] = {
    val rnd   = new scala.util.Random(seed)
    val scale = (1.0 / math.sqrt(cols.toDouble)).toFloat
    Array.fill(rows)(Array.fill(cols)((rnd.nextGaussian() * scale).toFloat))
  }
}

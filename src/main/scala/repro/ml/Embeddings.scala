package repro.ml

import scala.util.Random

/** Entity embeddings trained with a hinge loss on co-occurrence pairs
  * (Sec. 3.2, "Edges between Entities"): correlated entities end up close in
  * Euclidean distance, negatives are pushed beyond a margin. Also provides
  * co-occurrence–derived token vectors standing in for the paper's BERT /
  * directional-skip-gram vectors in story-tree similarity (Eq. 9–10).
  */
object Embeddings {

  final case class Model(dim: Int, vecs: Map[Long, Array[Double]]) {
    def distance(a: Long, b: Long): Double = {
      (vecs.get(a), vecs.get(b)) match {
        case (Some(x), Some(y)) =>
          var s = 0.0
          var i = 0
          while (i < dim) { val d = x(i) - y(i); s += d * d; i += 1 }
          math.sqrt(s)
        case _ => Double.PositiveInfinity
      }
    }
  }

  /** Train with hinge loss: pull positives within `marginPos`, push sampled
    * negatives beyond `marginNeg` (squared-distance margins).
    */
  def train(ids: Seq[Long], positives: Seq[(Long, Long)], dim: Int = 16,
            epochs: Int = 80, lr: Double = 0.05, marginPos: Double = 0.5,
            marginNeg: Double = 4.0, negPerPos: Int = 2, seed: Long = 17): Model = {
    require(ids.nonEmpty, "no entities to embed")
    val rng = new Random(seed)
    val idArr = ids.toArray
    val vecs = ids.map(id => id -> Array.fill(dim)(rng.nextGaussian() * 0.5)).toMap

    def sqDist(x: Array[Double], y: Array[Double]): Double = {
      var s = 0.0; var i = 0
      while (i < dim) { val d = x(i) - y(i); s += d * d; i += 1 }
      s
    }
    def pull(x: Array[Double], y: Array[Double], sign: Double): Unit = {
      var i = 0
      while (i < dim) {
        val g = 2 * (x(i) - y(i)) * sign * lr
        x(i) -= g; y(i) += g
        i += 1
      }
    }

    for (_ <- 0 until epochs; (a, b) <- positives) {
      val (xa, xb) = (vecs(a), vecs(b))
      if (sqDist(xa, xb) > marginPos) pull(xa, xb, 1.0)
      for (_ <- 0 until negPerPos) {
        val c = idArr(rng.nextInt(idArr.length))
        if (c != a && c != b) {
          val xc = vecs(c)
          if (sqDist(xa, xc) < marginNeg) pull(xa, xc, -1.0)
        }
      }
    }
    Model(dim, vecs)
  }

  /** Sparse co-occurrence token vectors: v(token) = counts of tokens seen in
    * the same text, L2-normalized — a cheap distributional embedding whose
    * cosine similarity feeds Eq. (9)–(10).
    */
  def tokenVectors(corpus: Seq[Seq[String]]): Map[String, Map[String, Double]] = {
    val co = collection.mutable.Map[String, collection.mutable.Map[String, Double]]()
    for (text <- corpus; a <- text.distinct; b <- text.distinct if a != b) {
      co.getOrElseUpdate(a, collection.mutable.Map().withDefaultValue(0.0))(b) += 1.0
    }
    co.map { case (t, m) =>
      val norm = math.sqrt(m.values.map(v => v * v).sum)
      t -> m.map { case (k, v) => k -> v / norm }.toMap
    }.toMap
  }

  /** Cosine similarity of two sparse vectors. */
  def cosine(a: Map[String, Double], b: Map[String, Double]): Double =
    if (a.isEmpty || b.isEmpty) 0.0
    else a.iterator.map { case (k, v) => v * b.getOrElse(k, 0.0) }.sum
}

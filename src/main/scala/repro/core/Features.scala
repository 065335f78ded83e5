package repro.core

import repro.graph.QTIG
import repro.nlp.Lang

/** QTIG node feature encoding (Sec. 3.1, "Node Classification with R-GCN").
  *
  * The paper embeds NER tag, POS tag, stopword flag, character count and the
  * sequential id of node insertion; we concatenate the equivalent one-hot
  * blocks (embeddings would be learned jointly — one-hot inputs feed the same
  * information to the first R-GCN layer's weight matrix).
  */
object Features {

  private val CharBuckets = Vector(2, 5, 8) // ≤2, 3–5, 6–8, 9+
  private val SeqBucketSize = 4
  private val NumSeqBuckets = 8

  /** Feature dimensionality. */
  val Dim: Int =
    Lang.PosTags.size + Lang.NerTags.size + 1 + (CharBuckets.size + 1) + NumSeqBuckets + 1

  /** Encode one node of a QTIG. `seqId` is the node's insertion order. */
  def encode(token: String, seqId: Int): Array[Double] = {
    val f = new Array[Double](Dim)
    var off = 0
    if (token == QTIG.Sos || token == QTIG.Eos) {
      f(Dim - 1) = 1.0 // marker flag; all linguistic blocks zero
      val b = math.min(seqId / SeqBucketSize, NumSeqBuckets - 1)
      f(Lang.PosTags.size + Lang.NerTags.size + 1 + CharBuckets.size + 1 + b) = 1.0
      return f
    }
    val info = Lang.info(token)
    f(off + Lang.PosTags.indexOf(info.pos)) = 1.0
    off += Lang.PosTags.size
    f(off + Lang.NerTags.indexOf(info.ner)) = 1.0
    off += Lang.NerTags.size
    if (info.stop) f(off) = 1.0
    off += 1
    val cb = CharBuckets.indexWhere(token.length <= _) match {
      case -1 => CharBuckets.size; case i => i
    }
    f(off + cb) = 1.0
    off += CharBuckets.size + 1
    f(off + math.min(seqId / SeqBucketSize, NumSeqBuckets - 1)) = 1.0
    f
  }

  /** Encode all nodes of a graph (node id is its insertion order). */
  def encodeGraph(g: QTIG.Graph): Array[Array[Double]] =
    g.tokens.zipWithIndex.map { case (t, i) => encode(t, i) }.toArray
}

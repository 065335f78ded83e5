package repro.ml

import breeze.linalg.{DenseMatrix, DenseVector, sum => bsum}
import scala.util.Random

/** Relational Graph Convolutional Network (Schlichtkrull et al.) implemented
  * from scratch with Breeze — the offline stand-in for the paper's
  * PyTorch-based GCTSP-Net encoder (Sec. 3.1, Eq. 3–6).
  *
  * Layer rule (Eq. 5): h_v' = ReLU( W_0 h_v + Σ_r Σ_{w∈N_r(v)} 1/c_{vw} W_r h_w )
  * with basis decomposition (Eq. 6): W_r = Σ_b a_{rb} V_b.
  *
  * Node classification head is a softmax over `outClasses` (binary phrase
  * membership uses 2 classes; event key elements use 4). Gradients are exact
  * (verified by numerical gradient check in tests) and flattened so Spark can
  * `treeAggregate` them across graphs.
  */
object RGCN {

  /** A graph encoded for the network.
    *
    * @param feats  node features, n × inDim (row per node)
    * @param rels   per relation id, flat edge pairs [v0, w0, v1, w1, …] where
    *               node v receives a message from node w
    * @param labels per-node class id
    * @param mask   nodes included in the loss
    */
  final case class EncodedGraph(feats: Array[Array[Double]], rels: Array[Array[Int]],
                                labels: Array[Int], mask: Array[Boolean]) extends Serializable {
    def n: Int = feats.length
  }

  final case class Config(inDim: Int, hidden: Int, layers: Int, relations: Int,
                          bases: Int, outClasses: Int) extends Serializable {
    /** Dims (in, out) of layer l. */
    def layerDims(l: Int): (Int, Int) = (if (l == 0) inDim else hidden, hidden)
    /** Total number of parameters in the flat vector. */
    def nParams: Int = {
      val lp = (0 until layers).map { l =>
        val (di, dout) = layerDims(l)
        di * dout /*W0*/ + bases * di * dout /*V_b*/ + relations * bases /*a*/
      }.sum
      lp + hidden * outClasses + outClasses
    }
  }

  /** Model parameters, materialized from / flattened to Array[Double]. */
  final class Params(val cfg: Config, val flat: Array[Double]) extends Serializable {
    require(flat.length == cfg.nParams, s"expected ${cfg.nParams} params, got ${flat.length}")

    // offsets into `flat` per layer
    private[ml] def view(): ParamsView = {
      var off = 0
      def take(rows: Int, cols: Int): DenseMatrix[Double] = {
        val m = new DenseMatrix(rows, cols, flat, off); off += rows * cols; m
      }
      val layers = (0 until cfg.layers).map { l =>
        val (di, dout) = cfg.layerDims(l)
        val w0 = take(di, dout)
        val vb = Array.fill(cfg.bases)(take(di, dout))
        val a = take(cfg.relations, cfg.bases)
        LayerView(w0, vb, a)
      }.toArray
      val outW = take(cfg.hidden, cfg.outClasses)
      val outB = new DenseVector(flat, off, 1, cfg.outClasses)
      ParamsView(layers, outW, outB)
    }
  }

  private[ml] final case class LayerView(w0: DenseMatrix[Double],
                                         vb: Array[DenseMatrix[Double]],
                                         a: DenseMatrix[Double])
  private[ml] final case class ParamsView(layers: Array[LayerView],
                                          outW: DenseMatrix[Double],
                                          outB: DenseVector[Double])

  /** Glorot-style initialization, deterministic in `seed`. */
  def init(cfg: Config, seed: Long): Params = {
    val rng = new Random(seed)
    val flat = new Array[Double](cfg.nParams)
    var off = 0
    def fill(rows: Int, cols: Int, scale: Double): Unit = {
      val s = if (scale > 0) scale else math.sqrt(6.0 / (rows + cols))
      for (i <- 0 until rows * cols) { flat(off) = (rng.nextDouble() * 2 - 1) * s; off += 1 }
    }
    for (l <- 0 until cfg.layers) {
      val (di, dout) = cfg.layerDims(l)
      fill(di, dout, -1)
      for (_ <- 0 until cfg.bases) fill(di, dout, -1)
      fill(cfg.relations, cfg.bases, 0.5)
    }
    fill(cfg.hidden, cfg.outClasses, -1)
    off += cfg.outClasses // out bias = 0
    new Params(cfg, flat)
  }

  /** Â_r H: aggregate neighbor rows with 1/c_v normalization (c_v = |N_r(v)|). */
  private def relAggregate(h: DenseMatrix[Double], edges: Array[Int], n: Int): DenseMatrix[Double] = {
    val out = DenseMatrix.zeros[Double](n, h.cols)
    val deg = new Array[Int](n)
    var i = 0
    while (i < edges.length) { deg(edges(i)) += 1; i += 2 }
    i = 0
    while (i < edges.length) {
      val v = edges(i); val w = edges(i + 1)
      val c = 1.0 / deg(v)
      var j = 0
      while (j < h.cols) { out(v, j) += h(w, j) * c; j += 1 }
      i += 2
    }
    out
  }

  /** Transposed propagation: out(w,:) += in(v,:)/c_v for each edge (v,w). */
  private def relAggregateT(g: DenseMatrix[Double], edges: Array[Int], n: Int): DenseMatrix[Double] = {
    val out = DenseMatrix.zeros[Double](n, g.cols)
    val deg = new Array[Int](n)
    var i = 0
    while (i < edges.length) { deg(edges(i)) += 1; i += 2 }
    i = 0
    while (i < edges.length) {
      val v = edges(i); val w = edges(i + 1)
      val c = 1.0 / deg(v)
      var j = 0
      while (j < g.cols) { out(w, j) += g(v, j) * c; j += 1 }
      i += 2
    }
    out
  }

  private def relu(m: DenseMatrix[Double]): DenseMatrix[Double] = m.map(x => if (x > 0) x else 0.0)

  /** Forward pass; returns per-layer inputs, pre-activations and final logits. */
  private def forwardInternal(g: EncodedGraph, pv: ParamsView, cfg: Config)
    : (Array[DenseMatrix[Double]], Array[DenseMatrix[Double]], DenseMatrix[Double]) = {
    val n = g.n
    var h = new DenseMatrix(cfg.inDim, n, g.feats.flatten).t.copy // n × inDim
    val inputs = new Array[DenseMatrix[Double]](cfg.layers)
    val preacts = new Array[DenseMatrix[Double]](cfg.layers)
    for (l <- 0 until cfg.layers) {
      val lv = pv.layers(l)
      inputs(l) = h
      val z = h * lv.w0
      for (r <- 0 until cfg.relations if g.rels(r).nonEmpty) {
        val m = relAggregate(h, g.rels(r), n)
        // W_r = Σ_b a_rb V_b  →  M_r W_r = Σ_b a_rb (M_r V_b)
        for (b <- 0 until cfg.bases) {
          val arb = lv.a(r, b)
          if (arb != 0.0) z += (m * lv.vb(b)) * arb
        }
      }
      preacts(l) = z
      h = relu(z)
    }
    val logits = h * pv.outW
    for (i <- 0 until n; j <- 0 until cfg.outClasses) logits(i, j) += pv.outB(j)
    (inputs, preacts, logits)
  }

  /** Per-node class probabilities. */
  def predictProbs(g: EncodedGraph, params: Params): Array[Array[Double]] = {
    val cfg = params.cfg
    val (_, _, logits) = forwardInternal(g, params.view(), cfg)
    (0 until g.n).map { i =>
      val row = (0 until cfg.outClasses).map(logits(i, _))
      val m = row.max
      val ex = row.map(x => math.exp(x - m))
      val s = ex.sum
      ex.map(_ / s).toArray
    }.toArray
  }

  /** Mean masked cross-entropy loss and flat gradient for one graph. */
  def lossAndGrad(g: EncodedGraph, params: Params): (Double, Array[Double]) = {
    val cfg = params.cfg
    val pv = params.view()
    val gradFlat = new Array[Double](cfg.nParams)
    val gp = new Params(cfg, gradFlat).view()

    val (inputs, preacts, logits) = forwardInternal(g, pv, cfg)
    val n = g.n
    val nMasked = math.max(1, g.mask.count(identity))

    // softmax CE + dLogits
    var loss = 0.0
    val dLogits = DenseMatrix.zeros[Double](n, cfg.outClasses)
    for (i <- 0 until n if g.mask(i)) {
      val row = (0 until cfg.outClasses).map(logits(i, _))
      val m = row.max
      val ex = row.map(x => math.exp(x - m))
      val s = ex.sum
      val y = g.labels(i)
      loss += -(row(y) - m - math.log(s)) / nMasked
      for (j <- 0 until cfg.outClasses)
        dLogits(i, j) = (ex(j) / s - (if (j == y) 1.0 else 0.0)) / nMasked
    }

    // output layer
    val hLast = relu(preacts(cfg.layers - 1))
    gp.outW += hLast.t * dLogits
    for (j <- 0 until cfg.outClasses) gp.outB(j) += bsum(dLogits(::, j))
    var dH = dLogits * pv.outW.t

    // backprop through layers
    for (l <- (cfg.layers - 1) to 0 by -1) {
      val lv = pv.layers(l); val gl = gp.layers(l)
      val z = preacts(l)
      val dZ = DenseMatrix.tabulate(n, z.cols)((i, j) => if (z(i, j) > 0) dH(i, j) else 0.0)
      val hIn = inputs(l)
      gl.w0 += hIn.t * dZ
      val dHin = dZ * lv.w0.t
      for (r <- 0 until cfg.relations if g.rels(r).nonEmpty) {
        val m = relAggregate(hIn, g.rels(r), n)
        val gr = m.t * dZ // d(M_r W_r)/dW_r
        var wrT: DenseMatrix[Double] = null
        for (b <- 0 until cfg.bases) {
          val arb = lv.a(r, b)
          gl.vb(b) += gr * arb
          gl.a(r, b) += bsum(gr *:* lv.vb(b))
          if (wrT == null) wrT = lv.vb(b).t * arb else wrT += lv.vb(b).t * arb
        }
        dHin += relAggregateT(dZ * wrT, g.rels(r), n)
      }
      dH = dHin
    }
    (loss, gradFlat)
  }
}

package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class RGCNSpec extends AnyFunSuite {

  private def tinyGraph(seed: Int = 3): RGCN.EncodedGraph = {
    val rng = new scala.util.Random(seed)
    val n = 5
    val feats = Array.fill(n)(Array.fill(4)(rng.nextDouble()))
    // relation 0: chain 0→1→2→3→4 (node i+1 receives from i); relation 1: star to node 0
    val r0 = (0 until n - 1).flatMap(i => Seq(i + 1, i)).toArray
    val r1 = (1 until n).flatMap(i => Seq(0, i)).toArray
    val labels = Array(0, 1, 0, 1, 0)
    RGCN.EncodedGraph(feats, Array(r0, r1), labels, Array.fill(n)(true))
  }

  private val cfg = RGCN.Config(inDim = 4, hidden = 6, layers = 3, relations = 2,
    bases = 2, outClasses = 2)

  test("nParams accounting matches flattened storage") {
    val p = RGCN.init(cfg, 1)
    assert(p.flat.length == cfg.nParams)
  }

  test("init is deterministic in the seed") {
    assert(RGCN.init(cfg, 7).flat.toSeq == RGCN.init(cfg, 7).flat.toSeq)
    assert(RGCN.init(cfg, 7).flat.toSeq != RGCN.init(cfg, 8).flat.toSeq)
  }

  test("predictProbs rows sum to one") {
    val p = RGCN.init(cfg, 1)
    val probs = RGCN.predictProbs(tinyGraph(), p)
    probs.foreach(row => assert(math.abs(row.sum - 1.0) < 1e-9))
  }

  test("loss is positive and finite") {
    val p = RGCN.init(cfg, 1)
    val (loss, grad) = RGCN.lossAndGrad(tinyGraph(), p)
    assert(loss > 0 && loss.isFinite)
    assert(grad.forall(_.isFinite))
  }

  test("analytic gradient matches numerical gradient") {
    val g = tinyGraph()
    val p = RGCN.init(cfg, 5)
    val (_, grad) = RGCN.lossAndGrad(g, p)
    val eps = 1e-6
    val rng = new scala.util.Random(0)
    val idxs = Seq.fill(40)(rng.nextInt(cfg.nParams)).distinct
    for (i <- idxs) {
      val orig = p.flat(i)
      p.flat(i) = orig + eps
      val (lp, _) = RGCN.lossAndGrad(g, p)
      p.flat(i) = orig - eps
      val (lm, _) = RGCN.lossAndGrad(g, p)
      p.flat(i) = orig
      val num = (lp - lm) / (2 * eps)
      assert(math.abs(num - grad(i)) < 1e-5,
        s"param $i: analytic ${grad(i)} vs numerical $num")
    }
  }

  test("masked nodes do not contribute to the loss") {
    val g = tinyGraph()
    val gm = g.copy(mask = Array(true, true, false, false, false),
      labels = Array(0, 1, 1, 0, 1))
    val gm2 = gm.copy(labels = Array(0, 1, 0, 1, 0)) // only masked-out labels differ
    val p = RGCN.init(cfg, 2)
    assert(RGCN.lossAndGrad(gm, p)._1 == RGCN.lossAndGrad(gm2, p)._1)
  }

  test("local training drives the loss down and fits a tiny graph") {
    val g = tinyGraph()
    val p0 = RGCN.init(cfg, 11)
    val (l0, _) = RGCN.lossAndGrad(g, p0)
    val p = RGCNTrainer.trainLocal(Seq(g), cfg, RGCNTrainer.TrainConfig(epochs = 150, seed = 11))
    val (l1, _) = RGCN.lossAndGrad(g, p)
    assert(l1 < l0 / 2, s"loss did not drop: $l0 -> $l1")
    val probs = RGCN.predictProbs(g, p)
    val preds = probs.map(r => if (r(1) > r(0)) 1 else 0)
    assert(preds.toSeq == g.labels.toSeq, "failed to overfit a single tiny graph")
  }

  test("4-class head works") {
    val cfg4 = cfg.copy(outClasses = 4)
    val g = tinyGraph().copy(labels = Array(0, 1, 2, 3, 0))
    val p = RGCNTrainer.trainLocal(Seq(g), cfg4, RGCNTrainer.TrainConfig(epochs = 200, seed = 3))
    val probs = RGCN.predictProbs(g, p)
    val preds = probs.map(r => r.zipWithIndex.maxBy(_._1)._2)
    assert(preds.toSeq == g.labels.toSeq)
  }

  test("graphs with an empty relation are handled") {
    val g = tinyGraph()
    val g2 = g.copy(rels = Array(g.rels(0), Array.empty[Int]))
    val p = RGCN.init(cfg, 1)
    val (loss, _) = RGCN.lossAndGrad(g2, p)
    assert(loss.isFinite)
  }
}

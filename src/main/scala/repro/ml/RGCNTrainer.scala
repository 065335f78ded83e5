package repro.ml

import org.apache.spark.sql.SparkSession
import org.apache.spark.rdd.RDD

/** Synchronous distributed training for [[RGCN]].
  *
  * Each epoch broadcasts the flat parameter vector, `treeAggregate`s the
  * exact full-batch gradient over the graph RDD and applies an Adam step on
  * the driver — the Spark-native analogue of the paper's GPU training loop.
  */
object RGCNTrainer {

  final case class TrainConfig(epochs: Int = 120, lr: Double = 0.01,
                               beta1: Double = 0.9, beta2: Double = 0.999,
                               eps: Double = 1e-8, weightDecay: Double = 1e-5,
                               seed: Long = 13, logEvery: Int = 0)

  /** Adam state over a flat parameter vector. */
  final class Adam(n: Int, tc: TrainConfig) {
    private val m = new Array[Double](n)
    private val v = new Array[Double](n)
    private var t = 0
    def step(params: Array[Double], grad: Array[Double]): Unit = {
      t += 1
      val bc1 = 1 - math.pow(tc.beta1, t)
      val bc2 = 1 - math.pow(tc.beta2, t)
      var i = 0
      while (i < n) {
        val g = grad(i) + tc.weightDecay * params(i)
        m(i) = tc.beta1 * m(i) + (1 - tc.beta1) * g
        v(i) = tc.beta2 * v(i) + (1 - tc.beta2) * g * g
        params(i) -= tc.lr * (m(i) / bc1) / (math.sqrt(v(i) / bc2) + tc.eps)
        i += 1
      }
    }
  }

  /** Distributed full-batch training over an RDD of encoded graphs. */
  def train(spark: SparkSession, graphs: RDD[RGCN.EncodedGraph],
            cfg: RGCN.Config, tc: TrainConfig = TrainConfig()): RGCN.Params = {
    val params = RGCN.init(cfg, tc.seed)
    val nG = graphs.count().toDouble
    require(nG > 0, "no training graphs")
    val adam = new Adam(cfg.nParams, tc)
    val sc = spark.sparkContext
    for (epoch <- 1 to tc.epochs) {
      val bc = sc.broadcast(params.flat.clone())
      val (loss, grad) = graphs.treeAggregate((0.0, new Array[Double](cfg.nParams)))(
        seqOp = { case ((l, g), graph) =>
          val p = new RGCN.Params(cfg, bc.value)
          val (li, gi) = RGCN.lossAndGrad(graph, p)
          var i = 0
          while (i < g.length) { g(i) += gi(i); i += 1 }
          (l + li, g)
        },
        combOp = { case ((l1, g1), (l2, g2)) =>
          var i = 0
          while (i < g1.length) { g1(i) += g2(i); i += 1 }
          (l1 + l2, g1)
        })
      bc.destroy()
      var i = 0
      while (i < grad.length) { grad(i) /= nG; i += 1 }
      adam.step(params.flat, grad)
      if (tc.logEvery > 0 && epoch % tc.logEvery == 0)
        Console.err.println(f"[RGCNTrainer] epoch $epoch%4d loss ${loss / nG}%.5f")
    }
    params
  }

  /** Driver-local training over a small in-memory graph collection (tests). */
  def trainLocal(graphs: Seq[RGCN.EncodedGraph], cfg: RGCN.Config,
                 tc: TrainConfig = TrainConfig()): RGCN.Params = {
    val params = RGCN.init(cfg, tc.seed)
    val adam = new Adam(cfg.nParams, tc)
    for (epoch <- 1 to tc.epochs) {
      val grad = new Array[Double](cfg.nParams)
      var loss = 0.0
      for (g <- graphs) {
        val (li, gi) = RGCN.lossAndGrad(g, params)
        loss += li
        var i = 0
        while (i < grad.length) { grad(i) += gi(i); i += 1 }
      }
      var i = 0
      while (i < grad.length) { grad(i) /= graphs.size; i += 1 }
      adam.step(params.flat, grad)
      if (tc.logEvery > 0 && epoch % tc.logEvery == 0)
        Console.err.println(f"[RGCNTrainer] epoch $epoch%4d loss ${loss / graphs.size}%.5f")
    }
    params
  }
}

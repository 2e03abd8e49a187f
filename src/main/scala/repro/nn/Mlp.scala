package repro.nn

import scala.util.Random

/** Deterministic feed-forward network — the repro's substitute for the
  * finetuned BERT cross-encoder head (see DESIGN.md §1). One hidden ReLU
  * layer, Adam optimizer, three loss modes:
  *
  *  - [[Mlp.Binary]]      sigmoid output + BCE (classification tasks)
  *  - [[Mlp.Regression]]  linear output + MSE (regression tasks)
  *  - [[Mlp.MultiLabel]]  per-label sigmoid + BCE (ECB Join)
  *
  * Inputs are standardized with train-set statistics. Training early-stops
  * on validation loss with the paper's patience of 5 epochs (§6).
  */
object Mlp {
  sealed trait Task
  case object Binary     extends Task
  case object Regression extends Task
  /** nLabels independent sigmoid outputs. */
  case class MultiLabel(nLabels: Int) extends Task

  case class Config(
      hidden: Int = 32,
      lr: Double = 5e-3,
      epochs: Int = 300,
      batchSize: Int = 64,
      patience: Int = 5,
      seed: Long = 0,
      l2: Double = 1e-5,
  )

  /** Train on (features, labels); labels row length is 1 except MultiLabel. */
  def train(task: Task,
            xTrain: Array[Array[Double]], yTrain: Array[Array[Double]],
            xValid: Array[Array[Double]], yValid: Array[Array[Double]],
            config: Config = Config()): Mlp = {
    require(xTrain.nonEmpty, "empty training set")
    val m = new Mlp(task, xTrain.head.length, config)
    m.fit(xTrain, yTrain, xValid, yValid)
    m
  }
}

final class Mlp(val task: Mlp.Task, val nIn: Int, cfg: Mlp.Config) {
  import Mlp._

  private val nOut: Int = task match {
    case MultiLabel(n) => n
    case _             => 1
  }
  private val nHid = cfg.hidden

  // Parameters: W1 (nHid x nIn), b1, W2 (nOut x nHid), b2.
  private val rng = new Random(cfg.seed)
  private val w1 = Array.fill(nHid, nIn)(rng.nextGaussian() * math.sqrt(2.0 / math.max(1, nIn)))
  private val b1 = Array.fill(nHid)(0.0)
  private val w2 = Array.fill(nOut, nHid)(rng.nextGaussian() * math.sqrt(2.0 / nHid))
  private val b2 = Array.fill(nOut)(0.0)

  // Standardization fit on train.
  private var mu: Array[Double]    = Array.fill(nIn)(0.0)
  private var sigma: Array[Double] = Array.fill(nIn)(1.0)

  // Adam state.
  private def zeros2(r: Int, c: Int) = Array.fill(r, c)(0.0)
  private val mW1 = zeros2(nHid, nIn); private val vW1 = zeros2(nHid, nIn)
  private val mB1 = new Array[Double](nHid); private val vB1 = new Array[Double](nHid)
  private val mW2 = zeros2(nOut, nHid); private val vW2 = zeros2(nOut, nHid)
  private val mB2 = new Array[Double](nOut); private val vB2 = new Array[Double](nOut)
  private var adamT = 0

  private def standardize(x: Array[Double]): Array[Double] = {
    val out = new Array[Double](nIn)
    var i = 0
    while (i < nIn) {
      val v = x(i)
      out(i) = if (v.isNaN) 0.0 else (v - mu(i)) / sigma(i)
      i += 1
    }
    out
  }

  private def fitStandardizer(xs: Array[Array[Double]]): Unit = {
    val n = xs.length
    var i = 0
    while (i < nIn) {
      var s = 0.0; var c = 0
      xs.foreach { x => if (!x(i).isNaN) { s += x(i); c += 1 } }
      mu(i) = if (c == 0) 0.0 else s / c
      var v = 0.0
      xs.foreach { x => if (!x(i).isNaN) { val d = x(i) - mu(i); v += d * d } }
      sigma(i) = if (c == 0) 1.0 else math.max(1e-8, math.sqrt(v / math.max(1, c)))
      i += 1
    }
    val _ = n
  }

  /** Forward pass on a standardized input; returns (hidden, output). */
  private def forward(z: Array[Double]): (Array[Double], Array[Double]) = {
    val h = new Array[Double](nHid)
    var j = 0
    while (j < nHid) {
      var s = b1(j)
      val row = w1(j)
      var i = 0
      while (i < nIn) { s += row(i) * z(i); i += 1 }
      h(j) = if (s > 0) s else 0.0
      j += 1
    }
    val o = new Array[Double](nOut)
    var k = 0
    while (k < nOut) {
      var s = b2(k)
      val row = w2(k)
      var j2 = 0
      while (j2 < nHid) { s += row(j2) * h(j2); j2 += 1 }
      o(k) = task match {
        case Regression => s
        case _          => 1.0 / (1.0 + math.exp(-s))
      }
      k += 1
    }
    (h, o)
  }

  /** Raw model outputs (probabilities for classification, value for regression). */
  def predict(x: Array[Double]): Array[Double] = forward(standardize(x))._2

  def predictAll(xs: Array[Array[Double]]): Array[Array[Double]] = xs.map(predict)

  /** Mean loss over a set (BCE or MSE per task). */
  def loss(xs: Array[Array[Double]], ys: Array[Array[Double]]): Double = {
    var total = 0.0
    var n = 0
    xs.indices.foreach { i =>
      val p = predict(xs(i))
      val y = ys(i)
      var k = 0
      while (k < nOut) {
        task match {
          case Regression => total += (p(k) - y(k)) * (p(k) - y(k))
          case _ =>
            val pc = math.min(1 - 1e-9, math.max(1e-9, p(k)))
            total += -(y(k) * math.log(pc) + (1 - y(k)) * math.log(1 - pc))
        }
        n += 1
        k += 1
      }
    }
    total / math.max(1, n)
  }

  private def adam(p: Array[Double], g: Array[Double], m: Array[Double], v: Array[Double]): Unit = {
    val b1c = 1 - math.pow(0.9, adamT)
    val b2c = 1 - math.pow(0.999, adamT)
    var i = 0
    while (i < p.length) {
      m(i) = 0.9 * m(i) + 0.1 * g(i)
      v(i) = 0.999 * v(i) + 0.001 * g(i) * g(i)
      p(i) -= cfg.lr * (m(i) / b1c) / (math.sqrt(v(i) / b2c) + 1e-8)
      i += 1
    }
  }

  def fit(xTrain: Array[Array[Double]], yTrain: Array[Array[Double]],
          xValid: Array[Array[Double]], yValid: Array[Array[Double]]): Unit = {
    fitStandardizer(xTrain)
    val z = xTrain.map(standardize)
    val n = z.length
    val order = Array.tabulate(n)(identity)
    var bestValid = Double.MaxValue
    var sincBest = 0
    var best: Option[Snapshot] = None

    var epoch = 0
    while (epoch < cfg.epochs && sincBest <= cfg.patience) {
      // Fisher-Yates with the model's rng: deterministic given the seed.
      var i = n - 1
      while (i > 0) { val j = rng.nextInt(i + 1); val t = order(i); order(i) = order(j); order(j) = t; i -= 1 }

      var start = 0
      while (start < n) {
        val end = math.min(n, start + cfg.batchSize)
        trainBatch(z, yTrain, order, start, end)
        start = end
      }

      val vl = if (xValid.nonEmpty) loss(xValid, yValid) else loss(xTrain, yTrain)
      if (vl < bestValid - 1e-6) { bestValid = vl; sincBest = 0; best = Some(snapshot()) }
      else sincBest += 1
      epoch += 1
    }
    best.foreach(restore)
  }

  private case class Snapshot(w1: Array[Array[Double]], b1: Array[Double],
                              w2: Array[Array[Double]], b2: Array[Double])
  private def snapshot(): Snapshot =
    Snapshot(w1.map(_.clone()), b1.clone(), w2.map(_.clone()), b2.clone())
  private def restore(s: Snapshot): Unit = {
    s.w1.indices.foreach(i => Array.copy(s.w1(i), 0, w1(i), 0, nIn))
    Array.copy(s.b1, 0, b1, 0, nHid)
    s.w2.indices.foreach(i => Array.copy(s.w2(i), 0, w2(i), 0, nHid))
    Array.copy(s.b2, 0, b2, 0, nOut)
  }

  private def trainBatch(z: Array[Array[Double]], y: Array[Array[Double]],
                         order: Array[Int], start: Int, end: Int): Unit = {
    val gW1 = Array.fill(nHid)(new Array[Double](nIn))
    val gB1 = new Array[Double](nHid)
    val gW2 = Array.fill(nOut)(new Array[Double](nHid))
    val gB2 = new Array[Double](nOut)
    val bs = end - start

    var idx = start
    while (idx < end) {
      val x = z(order(idx))
      val t = y(order(idx))
      val (h, o) = forward(x)
      // dL/do: for sigmoid+BCE and linear+MSE alike this is (o - t) (MSE
      // scaled by 2 absorbed into lr).
      val dOut = new Array[Double](nOut)
      var k = 0
      while (k < nOut) { dOut(k) = o(k) - t(k); k += 1 }

      k = 0
      while (k < nOut) {
        val gw = gW2(k); val d = dOut(k)
        var j = 0
        while (j < nHid) { gw(j) += d * h(j); j += 1 }
        gB2(k) += d
        k += 1
      }
      val dH = new Array[Double](nHid)
      var j = 0
      while (j < nHid) {
        if (h(j) > 0) {
          var s = 0.0
          k = 0
          while (k < nOut) { s += dOut(k) * w2(k)(j); k += 1 }
          dH(j) = s
        }
        j += 1
      }
      j = 0
      while (j < nHid) {
        val d = dH(j)
        if (d != 0.0) {
          val gw = gW1(j)
          var i2 = 0
          while (i2 < nIn) { gw(i2) += d * x(i2); i2 += 1 }
          gB1(j) += d
        }
        j += 1
      }
      idx += 1
    }

    adamT += 1
    var j = 0
    while (j < nHid) {
      var i2 = 0
      while (i2 < nIn) { gW1(j)(i2) = gW1(j)(i2) / bs + cfg.l2 * w1(j)(i2); i2 += 1 }
      adam(w1(j), gW1(j), mW1(j), vW1(j))
      j += 1
    }
    var i3 = 0
    while (i3 < nHid) { gB1(i3) /= bs; i3 += 1 }
    adam(b1, gB1, mB1, vB1)
    var k2 = 0
    while (k2 < nOut) {
      var j2 = 0
      while (j2 < nHid) { gW2(k2)(j2) = gW2(k2)(j2) / bs + cfg.l2 * w2(k2)(j2); j2 += 1 }
      adam(w2(k2), gW2(k2), mW2(k2), vW2(k2))
      k2 += 1
    }
    var k3 = 0
    while (k3 < nOut) { gB2(k3) /= bs; k3 += 1 }
    adam(b2, gB2, mB2, vB2)
  }
}

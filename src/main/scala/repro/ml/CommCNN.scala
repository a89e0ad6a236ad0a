package repro.ml

import scala.util.Random

/** CommCNN — the paper's community classification CNN (Section IV-B, Fig. 8),
  * implemented from scratch (no DL framework is available offline).
  *
  * Input is the k × (|I|+|f|) community feature matrix. Three convolution
  * paths process it:
  *   - square: 3×3 conv followed by two Square Convolution Modules
  *     (3×3 conv + max pool) — 7 layers total on this path;
  *   - wide:   1×d kernel (all features of one member jointly), then a 1×1
  *     conv and a global max pool — 3 layers;
  *   - long:   k×1 kernel (one feature across all members), then a 1×1
  *     conv and a global max pool — 3 layers.
  * The concatenated path outputs feed two fully connected layers and a
  * softmax. Training is minibatch Adam on softmax cross-entropy.
  */
object CommCNN {

  /** Dense 3-D tensor (channels × height × width), row-major flat storage. */
  final class Tensor3(val c: Int, val h: Int, val w: Int,
                      val data: Array[Double]) extends Serializable {
    def this(c: Int, h: Int, w: Int) = this(c, h, w, new Array[Double](c * h * w))
    @inline def idx(ci: Int, hi: Int, wi: Int): Int = (ci * h + hi) * w + wi
    @inline def apply(ci: Int, hi: Int, wi: Int): Double = data(idx(ci, hi, wi))
    @inline def update(ci: Int, hi: Int, wi: Int, v: Double): Unit = data(idx(ci, hi, wi)) = v
    def size: Int = data.length
    def sameShape: Tensor3 = new Tensor3(c, h, w)
  }

  /** A differentiable layer over Tensor3s. Forward caches what backward
    * needs; instances are therefore NOT thread-safe — Spark inference must
    * deep-copy the model per partition (see [[Model.copyModel]]). */
  sealed trait Layer extends Serializable {
    def forward(x: Tensor3): Tensor3
    def backward(gradOut: Tensor3): Tensor3
    def params: Seq[Array[Double]] = Nil
    def grads: Seq[Array[Double]] = Nil
    def outShape(c: Int, h: Int, w: Int): (Int, Int, Int)
  }

  /** Valid 2-D convolution, `outC` filters of size inC × kh × kw. */
  final class Conv2D(inC: Int, outC: Int, kh: Int, kw: Int, rng: Random) extends Layer {
    val weight: Array[Double] = {
      val fanIn = inC * kh * kw
      Array.fill(outC * inC * kh * kw)(rng.nextGaussian() * math.sqrt(2.0 / fanIn))
    }
    val bias: Array[Double] = new Array[Double](outC)
    val wGrad: Array[Double] = new Array[Double](weight.length)
    val bGrad: Array[Double] = new Array[Double](outC)
    @inline private def wIdx(o: Int, i: Int, a: Int, b: Int): Int = ((o * inC + i) * kh + a) * kw + b

    private var lastIn: Tensor3 = _

    override def params: Seq[Array[Double]] = Seq(weight, bias)
    override def grads: Seq[Array[Double]] = Seq(wGrad, bGrad)
    override def outShape(c: Int, h: Int, w: Int): (Int, Int, Int) = (outC, h - kh + 1, w - kw + 1)

    def forward(x: Tensor3): Tensor3 = {
      require(x.c == inC && x.h >= kh && x.w >= kw,
        s"conv input ${x.c}x${x.h}x${x.w} vs kernel ${inC}x${kh}x$kw")
      lastIn = x
      val out = new Tensor3(outC, x.h - kh + 1, x.w - kw + 1)
      var o = 0
      while (o < outC) {
        var oh = 0
        while (oh < out.h) {
          var ow = 0
          while (ow < out.w) {
            var s = bias(o)
            var i = 0
            while (i < inC) {
              var a = 0
              while (a < kh) {
                var b = 0
                while (b < kw) {
                  s += weight(wIdx(o, i, a, b)) * x(i, oh + a, ow + b)
                  b += 1
                }
                a += 1
              }
              i += 1
            }
            out(o, oh, ow) = s
            ow += 1
          }
          oh += 1
        }
        o += 1
      }
      out
    }

    def backward(gradOut: Tensor3): Tensor3 = {
      val x = lastIn
      val gradIn = x.sameShape
      var o = 0
      while (o < outC) {
        var oh = 0
        while (oh < gradOut.h) {
          var ow = 0
          while (ow < gradOut.w) {
            val g = gradOut(o, oh, ow)
            if (g != 0.0) {
              bGrad(o) += g
              var i = 0
              while (i < inC) {
                var a = 0
                while (a < kh) {
                  var b = 0
                  while (b < kw) {
                    wGrad(wIdx(o, i, a, b)) += g * x(i, oh + a, ow + b)
                    gradIn(i, oh + a, ow + b) = gradIn(i, oh + a, ow + b) + g * weight(wIdx(o, i, a, b))
                    b += 1
                  }
                  a += 1
                }
                i += 1
              }
            }
            ow += 1
          }
          oh += 1
        }
        o += 1
      }
      gradIn
    }
  }

  /** Elementwise ReLU. */
  final class ReLU extends Layer {
    private var mask: Array[Boolean] = _
    override def outShape(c: Int, h: Int, w: Int): (Int, Int, Int) = (c, h, w)
    def forward(x: Tensor3): Tensor3 = {
      val out = x.sameShape
      mask = new Array[Boolean](x.size)
      var i = 0
      while (i < x.size) {
        if (x.data(i) > 0) { out.data(i) = x.data(i); mask(i) = true }
        i += 1
      }
      out
    }
    def backward(gradOut: Tensor3): Tensor3 = {
      val gradIn = gradOut.sameShape
      var i = 0
      while (i < gradOut.size) { if (mask(i)) gradIn.data(i) = gradOut.data(i); i += 1 }
      gradIn
    }
  }

  /** Max pooling with kernel = stride = (ph, pw); trailing rows/cols that do
    * not fill a full window are dropped (floor semantics). */
  final class MaxPool(ph: Int, pw: Int) extends Layer {
    private var argmax: Array[Int] = _
    private var inShape: (Int, Int, Int) = _
    override def outShape(c: Int, h: Int, w: Int): (Int, Int, Int) = (c, h / ph, w / pw)
    def forward(x: Tensor3): Tensor3 = {
      inShape = (x.c, x.h, x.w)
      val out = new Tensor3(x.c, x.h / ph, x.w / pw)
      argmax = new Array[Int](out.size)
      var c = 0
      while (c < out.c) {
        var oh = 0
        while (oh < out.h) {
          var ow = 0
          while (ow < out.w) {
            var best = Double.NegativeInfinity
            var bestIdx = -1
            var a = 0
            while (a < ph) {
              var b = 0
              while (b < pw) {
                val v = x(c, oh * ph + a, ow * pw + b)
                if (v > best) { best = v; bestIdx = x.idx(c, oh * ph + a, ow * pw + b) }
                b += 1
              }
              a += 1
            }
            out(c, oh, ow) = best
            argmax(out.idx(c, oh, ow)) = bestIdx
            ow += 1
          }
          oh += 1
        }
        c += 1
      }
      out
    }
    def backward(gradOut: Tensor3): Tensor3 = {
      val gradIn = new Tensor3(inShape._1, inShape._2, inShape._3)
      var i = 0
      while (i < gradOut.size) { gradIn.data(argmax(i)) += gradOut.data(i); i += 1 }
      gradIn
    }
  }

  /** Global max pooling: (c, h, w) → (c, 1, 1). */
  final class GlobalMaxPool extends Layer {
    private var argmax: Array[Int] = _
    private var inShape: (Int, Int, Int) = _
    override def outShape(c: Int, h: Int, w: Int): (Int, Int, Int) = (c, 1, 1)
    def forward(x: Tensor3): Tensor3 = {
      inShape = (x.c, x.h, x.w)
      val out = new Tensor3(x.c, 1, 1)
      argmax = new Array[Int](x.c)
      var c = 0
      while (c < x.c) {
        var best = Double.NegativeInfinity
        var bestIdx = -1
        var h = 0
        while (h < x.h) {
          var w = 0
          while (w < x.w) {
            val v = x(c, h, w)
            if (v > best) { best = v; bestIdx = x.idx(c, h, w) }
            w += 1
          }
          h += 1
        }
        out(c, 0, 0) = best
        argmax(c) = bestIdx
        c += 1
      }
      out
    }
    def backward(gradOut: Tensor3): Tensor3 = {
      val gradIn = new Tensor3(inShape._1, inShape._2, inShape._3)
      var c = 0
      while (c < gradOut.c) { gradIn.data(argmax(c)) += gradOut(c, 0, 0); c += 1 }
      gradIn
    }
  }

  /** Fully connected layer on flat vectors. */
  final class Dense(val in: Int, val out: Int, rng: Random) extends Serializable {
    val weight: Array[Double] = Array.fill(out * in)(rng.nextGaussian() * math.sqrt(2.0 / in))
    val bias: Array[Double] = new Array[Double](out)
    val wGrad: Array[Double] = new Array[Double](weight.length)
    val bGrad: Array[Double] = new Array[Double](out)
    private var lastIn: Array[Double] = _

    def forward(x: Array[Double]): Array[Double] = {
      require(x.length == in, s"dense input ${x.length} vs $in")
      lastIn = x
      val y = new Array[Double](out)
      var o = 0
      while (o < out) {
        var s = bias(o)
        var i = 0
        while (i < in) { s += weight(o * in + i) * x(i); i += 1 }
        y(o) = s
        o += 1
      }
      y
    }

    def backward(gradOut: Array[Double]): Array[Double] = {
      val gradIn = new Array[Double](in)
      var o = 0
      while (o < out) {
        val g = gradOut(o)
        bGrad(o) += g
        var i = 0
        while (i < in) {
          wGrad(o * in + i) += g * lastIn(i)
          gradIn(i) += g * weight(o * in + i)
          i += 1
        }
        o += 1
      }
      gradIn
    }
  }

  /** One convolution path: a layer sequence with shape bookkeeping. */
  final class Path(val layers: Seq[Layer], inC: Int, inH: Int, inW: Int) extends Serializable {
    /** flattened output length. */
    val outLen: Int = {
      var (c, h, w) = (inC, inH, inW)
      layers.foreach { l => val s = l.outShape(c, h, w); c = s._1; h = s._2; w = s._3 }
      c * h * w
    }
    private var outShape3: (Int, Int, Int) = _
    def forward(x: Tensor3): Array[Double] = {
      var t = x
      layers.foreach { l => t = l.forward(t) }
      outShape3 = (t.c, t.h, t.w)
      t.data
    }
    def backward(grad: Array[Double]): Tensor3 = {
      var g = new Tensor3(outShape3._1, outShape3._2, outShape3._3, grad.clone())
      layers.reverseIterator.foreach { l => g = l.backward(g) }
      g
    }
  }

  final case class Config(k: Int = 20, d: Int = 9, numClasses: Int = 3,
                          filters: Int = 8, hidden: Int = 32,
                          learningRate: Double = 1e-3, epochs: Int = 40,
                          batchSize: Int = 32, seed: Long = 17)

  /** The assembled network. Single-threaded; see [[Model.copyModel]]. */
  final class Network(val cfg: Config) extends Serializable {
    require(cfg.k >= 5 && cfg.d >= 5, s"CommCNN needs k>=5 and d>=5, got k=${cfg.k} d=${cfg.d}")
    private val rng = new Random(cfg.seed)
    val f: Int = cfg.filters

    // wide path: 1×d conv → 1×1 conv → global max pool (3 layers of Fig. 8)
    val wide = new Path(Seq(
      new Conv2D(1, f, 1, cfg.d, rng), new ReLU,
      new Conv2D(f, f, 1, 1, rng), new ReLU,
      new GlobalMaxPool), 1, cfg.k, cfg.d)

    // long path: k×1 conv → 1×1 conv → global max pool
    val long = new Path(Seq(
      new Conv2D(1, f, cfg.k, 1, rng), new ReLU,
      new Conv2D(f, f, 1, 1, rng), new ReLU,
      new GlobalMaxPool), 1, cfg.k, cfg.d)

    // square path: 3×3 conv + two (conv + pool) modules; kernel/pool sizes
    // clamp to the remaining spatial extent so any k,d >= 5 works.
    val square: Path = {
      val layers = Seq.newBuilder[Layer]
      var (c, h, w) = (1, cfg.k, cfg.d)
      def addConv(kh: Int, kw: Int, outC: Int): Unit = {
        val l = new Conv2D(c, outC, kh, kw, rng)
        layers += l += new ReLU
        val s = l.outShape(c, h, w); c = s._1; h = s._2; w = s._3
      }
      def addPool(): Unit = {
        val ph = if (h >= 2) 2 else 1
        val pw = if (w >= 2) 2 else 1
        val l = new MaxPool(ph, pw)
        layers += l
        val s = l.outShape(c, h, w); h = s._2; w = s._3
      }
      addConv(3, 3, f)
      var m = 0
      while (m < 2) {
        addConv(math.min(3, h), math.min(3, w), f)
        addPool()
        m += 1
      }
      new Path(layers.result(), 1, cfg.k, cfg.d)
    }

    val concatLen: Int = wide.outLen + long.outLen + square.outLen
    val fc1 = new Dense(concatLen, cfg.hidden, rng)
    val fc2 = new Dense(cfg.hidden, cfg.numClasses, rng)
    private var fc1Mask: Array[Boolean] = _

    def paramArrays: Seq[Array[Double]] =
      (wide.layers ++ long.layers ++ square.layers).flatMap(_.params) ++
        Seq(fc1.weight, fc1.bias, fc2.weight, fc2.bias)
    def gradArrays: Seq[Array[Double]] =
      (wide.layers ++ long.layers ++ square.layers).flatMap(_.grads) ++
        Seq(fc1.wGrad, fc1.bGrad, fc2.wGrad, fc2.bGrad)

    def zeroGrads(): Unit = gradArrays.foreach(g => java.util.Arrays.fill(g, 0.0))

    def forwardLogits(x: Tensor3): Array[Double] = {
      val cat = wide.forward(x) ++ long.forward(x) ++ square.forward(x)
      val h1 = fc1.forward(cat)
      fc1Mask = h1.map(_ > 0)
      fc2.forward(h1.map(v => math.max(v, 0.0)))
    }

    def softmax(z: Array[Double]): Array[Double] = {
      val mx = z.max
      val e = z.map(v => math.exp(v - mx))
      val s = e.sum
      e.map(_ / s)
    }

    /** Cross-entropy loss for one sample; accumulates parameter gradients. */
    def lossAndBackward(x: Tensor3, label: Int): Double = {
      val logits = forwardLogits(x)
      val p = softmax(logits)
      val loss = -math.log(math.max(p(label), 1e-12))
      val gradLogits = p.clone()
      gradLogits(label) -= 1.0
      val gH1 = fc2.backward(gradLogits)
      var i = 0
      while (i < gH1.length) { if (!fc1Mask(i)) gH1(i) = 0.0; i += 1 }
      val gCat = fc1.backward(gH1)
      wide.backward(gCat.slice(0, wide.outLen))
      long.backward(gCat.slice(wide.outLen, wide.outLen + long.outLen))
      square.backward(gCat.slice(wide.outLen + long.outLen, concatLen))
      loss
    }
  }

  /** Adam optimizer over the network's parameter arrays. */
  final class Adam(net: Network, lr: Double) {
    private val ps = net.paramArrays
    private val gs = net.gradArrays
    private val m = ps.map(p => new Array[Double](p.length))
    private val v = ps.map(p => new Array[Double](p.length))
    private var t = 0
    def step(batchSize: Int): Unit = {
      t += 1
      val bc1 = 1.0 - math.pow(0.9, t)
      val bc2 = 1.0 - math.pow(0.999, t)
      var a = 0
      while (a < ps.length) {
        val p = ps(a); val g = gs(a); val ma = m(a); val va = v(a)
        var i = 0
        while (i < p.length) {
          val gi = g(i) / batchSize
          ma(i) = 0.9 * ma(i) + 0.1 * gi
          va(i) = 0.999 * va(i) + 0.001 * gi * gi
          p(i) -= lr * (ma(i) / bc1) / (math.sqrt(va(i) / bc2) + 1e-8)
          i += 1
        }
        a += 1
      }
    }
  }

  /** Convert a k×d row matrix to the network's input tensor. */
  def toTensor(mat: Array[Array[Double]]): Tensor3 = {
    val k = mat.length; val d = mat(0).length
    val t = new Tensor3(1, k, d)
    var i = 0
    while (i < k) {
      var j = 0
      while (j < d) { t(0, i, j) = mat(i)(j); j += 1 }
      i += 1
    }
    t
  }

  /** Train CommCNN; `mats` are k×d matrices (already tightness-ordered and
    * zero-padded by Phase II), `labels` are class indices into `classes`. */
  def train(mats: Array[Array[Array[Double]]], labels: Array[Int],
            classes: Array[String], cfg: Config): Model = {
    require(mats.length == labels.length && mats.nonEmpty, "empty or mismatched training data")
    val net = new Network(cfg.copy(numClasses = classes.length))
    val adam = new Adam(net, cfg.learningRate)
    val tensors = mats.map(toTensor)
    val idx = Array.tabulate(mats.length)(identity)
    val rng = new Random(cfg.seed + 1)

    var epoch = 0
    while (epoch < cfg.epochs) {
      shuffleInPlace(idx, rng)
      var start = 0
      while (start < idx.length) {
        val end = math.min(start + cfg.batchSize, idx.length)
        net.zeroGrads()
        var i = start
        while (i < end) { net.lossAndBackward(tensors(idx(i)), labels(idx(i))); i += 1 }
        adam.step(end - start)
        start = end
      }
      epoch += 1
    }
    new Model(net, classes)
  }

  /** Mean training loss — used by tests to verify learning. */
  def meanLoss(model: Model, mats: Array[Array[Array[Double]]], labels: Array[Int]): Double = {
    var s = 0.0
    var i = 0
    while (i < mats.length) {
      val p = model.predictProba(mats(i))
      s += -math.log(math.max(p(labels(i)), 1e-12))
      i += 1
    }
    s / mats.length
  }

  private def shuffleInPlace(a: Array[Int], rng: Random): Unit = {
    var i = a.length - 1
    while (i > 0) {
      val j = rng.nextInt(i + 1)
      val t = a(i); a(i) = a(j); a(j) = t
      i -= 1
    }
  }

  /** Trained CommCNN. `predictProba` is synchronized because layer forward
    * passes cache state; for parallel Spark inference use [[copyModel]] once
    * per partition. */
  final class Model(val net: Network, val classes: Array[String]) extends Serializable {
    def predictProba(mat: Array[Array[Double]]): Array[Double] = this.synchronized {
      net.softmax(net.forwardLogits(toTensor(mat)))
    }
    def predictLabel(mat: Array[Array[Double]]): String = {
      val p = predictProba(mat)
      classes(p.indexOf(p.max))
    }
    /** Deep copy via serialization — gives each Spark partition its own
      * thread-confined network. */
    def copyModel: Model = {
      val bos = new java.io.ByteArrayOutputStream()
      val oos = new java.io.ObjectOutputStream(bos)
      oos.writeObject(this); oos.close()
      val ois = new java.io.ObjectInputStream(new java.io.ByteArrayInputStream(bos.toByteArray))
      ois.readObject().asInstanceOf[Model]
    }
  }
}

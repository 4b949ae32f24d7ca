package repro.nn

/** Fully connected layer with optional ReLU and per-layer Adam state.
  *
  * Weight layout is (in x out) so the forward pass is a single
  * `X(batch x in) * W(in x out)` matmul. The layer owns its optimizer
  * moments — MHAS's weight-sharing bank hands the *same* `Dense` instance
  * to every sampled child model that uses the slot, which is exactly how
  * ENAS shares parameters across architectures.
  */
final class Dense(val in: Int, val out: Int, val relu: Boolean, seed: Long) extends Serializable {
  val w: Mat = Mat.randn(in, out, seed)
  val b: Array[Float] = new Array[Float](out)

  // Adam moments.
  @transient private var mW: Array[Float] = _
  @transient private var vW: Array[Float] = _
  @transient private var mB: Array[Float] = _
  @transient private var vB: Array[Float] = _

  // Pending gradients from the last backward().
  @transient private var gW: Mat = _
  @transient private var gB: Array[Float] = _

  def paramCount: Long = in.toLong * out + out

  def forward(x: Mat): Mat = {
    val y = Mat.addRowInPlace(Mat.mul(x, w), b)
    if (relu) Mat.reluInPlace(y) else y
  }

  /** Backward for the most recent forward on (x, y=forward(x)).
    * Stores dW/db internally; returns dX. */
  def backward(x: Mat, y: Mat, dy: Mat): Mat = {
    val g = if (relu) Mat.reluBackwardInPlace(dy, y) else dy
    gW = Mat.transAmul(x, g)
    gB = Mat.colSum(g)
    Mat.mulTransB(g, w)
  }

  /** Pending gradients — exposed for gradient-checking tests. */
  private[repro] def pendingGradW: Mat = gW
  private[repro] def pendingGradB: Array[Float] = gB

  /** Adam update with the gradients accumulated by backward(). */
  def step(lr: Float, t: Int, beta1: Float = 0.9f, beta2: Float = 0.999f, eps: Float = 1e-8f): Unit = {
    if (gW == null) return
    if (mW == null) {
      mW = new Array[Float](w.data.length); vW = new Array[Float](w.data.length)
      mB = new Array[Float](b.length); vB = new Array[Float](b.length)
    }
    val bc1 = (1.0 - math.pow(beta1, t)).toFloat
    val bc2 = (1.0 - math.pow(beta2, t)).toFloat
    var i = 0
    val wd = w.data; val gwd = gW.data
    while (i < wd.length) {
      val g = gwd(i)
      mW(i) = beta1 * mW(i) + (1 - beta1) * g
      vW(i) = beta2 * vW(i) + (1 - beta2) * g * g
      wd(i) -= lr * (mW(i) / bc1) / (math.sqrt((vW(i) / bc2).toDouble).toFloat + eps)
      i += 1
    }
    i = 0
    while (i < b.length) {
      val g = gB(i)
      mB(i) = beta1 * mB(i) + (1 - beta1) * g
      vB(i) = beta2 * vB(i) + (1 - beta2) * g * g
      b(i) -= lr * (mB(i) / bc1) / (math.sqrt((vB(i) / bc2).toDouble).toFloat + eps)
      i += 1
    }
    gW = null; gB = null
  }

  /** Serialized float32 size in bytes — what "size(M)" charges per Eq. 1. */
  def byteSize: Long = paramCount * 4L
}

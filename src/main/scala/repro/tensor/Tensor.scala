package repro.tensor

/** Dense 1-d tensors, the data substrate of the reproduction.
  *
  * Mirrors the paper's data model (§3.1, §4.1): every relational column is a
  * dense tensor of a single element type. `I64Tensor` backs integers, keys,
  * dates (epoch-day), and dictionary codes; `F64Tensor` backs doubles;
  * `BoolTensor` backs bitmaps (filter masks); strings live in
  * [[StringTensor]] as `(n×m)` padded byte matrices.
  *
  * All operations are in [[TensorOps]]; tensors themselves are immutable
  * wrappers over primitive arrays (zero-copy views of the backing array are
  * never handed out mutably).
  */
trait Tensor {
  def length: Int
  /** Bytes occupied by one element, for the profiler/cost model. */
  def elemBytes: Int
  def sizeBytes: Long = length.toLong * elemBytes
}

final case class I64Tensor(data: Array[Long]) extends Tensor {
  def length: Int    = data.length
  def elemBytes: Int = 8
  def apply(i: Int): Long = data(i)
}

final case class F64Tensor(data: Array[Double]) extends Tensor {
  def length: Int    = data.length
  def elemBytes: Int = 8
  def apply(i: Int): Double = data(i)
}

final case class BoolTensor(data: Array[Boolean]) extends Tensor {
  def length: Int    = data.length
  def elemBytes: Int = 1
  def apply(i: Int): Boolean = data(i)
}

object I64Tensor {
  def fill(n: Int, v: Long): I64Tensor = {
    val a = new Array[Long](n); java.util.Arrays.fill(a, v); I64Tensor(a)
  }
}

object F64Tensor {
  def fill(n: Int, v: Double): F64Tensor = {
    val a = new Array[Double](n); java.util.Arrays.fill(a, v); F64Tensor(a)
  }
}

object BoolTensor {
  def fill(n: Int, v: Boolean): BoolTensor = {
    val a = new Array[Boolean](n); java.util.Arrays.fill(a, v); BoolTensor(a)
  }
}

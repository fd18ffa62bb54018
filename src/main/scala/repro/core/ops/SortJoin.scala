package repro.core.ops

import repro.tensor._

/** Sort-based equi-join — the paper's Algorithm 1, verbatim on our tensor
  * ops. Inputs are dense join-key codes (see [[KeyEncoder.encodeJoint]]);
  * output is the pair of index tensors (late materialization, §5.2): for
  * every row of the join result, which left row and which right row
  * produced it.
  */
object SortJoin {

  /** @param leftCodes  left join-key codes in `[0, k)`
    * @param rightCodes right join-key codes in `[0, k)`
    * @param k          number of distinct key codes
    * @return (leftOutIdx, rightOutIdx)
    */
  def join(leftCodes: I64Tensor, rightCodes: I64Tensor, k: Int): (I64Tensor, I64Tensor) = {
    if (k == 0 || leftCodes.length == 0 || rightCodes.length == 0)
      return (I64Tensor(Array.empty), I64Tensor(Array.empty))

    // 1–3: sort join keys, keeping the permutations.
    val (leftSorted, leftIdx)   = TensorOps.sort(leftCodes)
    val (rightSorted, rightIdx) = TensorOps.sort(rightCodes)

    // 4: histograms of the left and right key columns.
    val leftHist  = TensorOps.bincount(leftSorted, k)
    val rightHist = TensorOps.bincount(rightSorted, k)

    // 5: rows produced per matching key (bucket sizes).
    val histMul = TensorOps.mul(leftHist, rightHist)

    // 6–8: prefix sums.
    val cumLeftHist  = TensorOps.cumsum(leftHist)
    val cumRightHist = TensorOps.cumsum(rightHist)
    val cumHistMul   = TensorOps.cumsum(histMul)

    // 9–10: output size and output offsets.
    val outSizeL = cumHistMul.data(k - 1)
    require(outSizeL <= Int.MaxValue, s"join output too large: $outSizeL")
    val outSize = outSizeL.toInt
    if (outSize == 0) return (I64Tensor(Array.empty), I64Tensor(Array.empty))
    var offset = TensorOps.arange(outSize)

    // 11: parallel binary search — bucket of matching keys per output row.
    val outBucket = TensorOps.bucketize(offset, cumHistMul)

    // 12: offset within each bucket.
    val cumAtB  = TensorOps.indexSelect(cumHistMul, outBucket)
    val mulAtB  = TensorOps.indexSelect(histMul, outBucket)
    offset = TensorOps.sub(offset, TensorOps.sub(cumAtB, mulAtB))

    // 13–14: indexes from left and right for every output row.
    val rightHistAtB = TensorOps.indexSelect(rightHist, outBucket)
    val leftBase  = TensorOps.sub(TensorOps.indexSelect(cumLeftHist, outBucket),
                                  TensorOps.indexSelect(leftHist, outBucket))
    val rightBase = TensorOps.sub(TensorOps.indexSelect(cumRightHist, outBucket), rightHistAtB)
    val leftPos   = TensorOps.add(leftBase, TensorOps.floorDiv(offset, rightHistAtB))
    val rightPos  = TensorOps.add(rightBase, TensorOps.remainder(offset, rightHistAtB))
    val leftOutIdx  = TensorOps.indexSelect(leftIdx, leftPos)
    val rightOutIdx = TensorOps.indexSelect(rightIdx, rightPos)
    (leftOutIdx, rightOutIdx)
  }
}

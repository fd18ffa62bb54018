package repro.core.ops

import repro.tensor._

/** Hash-based equi-join — the paper's Algorithm 2: build and probe are
  * interleaved and repeated once per maximum hash-bucket occupancy, using a
  * scatter-built open hash table with an extra (m+1)-th bucket that absorbs
  * already-scattered build rows.
  */
object HashJoin {

  /** @return (leftOutIdx, rightOutIdx) index pairs of matching rows. */
  def join(left: I64Tensor, right: I64Tensor): (I64Tensor, I64Tensor) = {
    val nL = left.length
    val nR = right.length
    if (nL == 0 || nR == 0) return (I64Tensor(Array.empty), I64Tensor(Array.empty))

    // m: hash table size (power of two, ~2x build side).
    val m = Integer.highestOneBit(math.max(16, nL * 2 - 1)) * 2

    // 2: row indexes.
    val leftIdx  = TensorOps.arange(nL)
    val rightIdx = TensorOps.arange(nR)

    // 3: hash values.
    var leftHash  = TensorOps.remainder(left, m.toLong)
    val rightHash = TensorOps.remainder(right, m.toLong)

    // 4–5: histogram of build-side hashes → number of rounds.
    val hashBincount      = TensorOps.bincount(leftHash, m)
    val maxHashBucketSize = TensorOps.max(hashBincount).toInt

    var leftOut  = I64Tensor(Array.emptyLongArray)
    var rightOut = I64Tensor(Array.emptyLongArray)

    var round = 0
    while (round < maxHashBucketSize) {
      // 7–8: build — scatter row indexes; last write per bucket wins.
      val hashTable = TensorOps.scatterOverwrite(I64Tensor.fill(m + 1, -1L), leftHash, leftIdx)

      // 9–10: rows that made it into the table are redirected to bucket m so
      // they are skipped by future rounds (skip when collision-free).
      if (maxHashBucketSize > 1) {
        val inTable    = TensorOps.narrow(hashTable, 0, m)
        val leftIdxSct = TensorOps.maskedSelect(inTable, TensorOps.ge(inTable, I64Tensor.fill(m, 0L)))
        leftHash = TensorOps.scatterOverwrite(leftHash, leftIdxSct, I64Tensor.fill(leftIdxSct.length, m.toLong))
      }

      // 11–14: probe.
      val leftCandIdx   = TensorOps.indexSelect(hashTable, rightHash)
      val validKeyMask  = TensorOps.ge(leftCandIdx, I64Tensor.fill(nR, 0L))
      val validLeftIdx  = TensorOps.maskedSelect(leftCandIdx, validKeyMask)
      val validRightIdx = TensorOps.maskedSelect(rightIdx, validKeyMask)

      // 15–17: verify keys (hash buckets can alias different keys).
      val matchMask     = TensorOps.eq(TensorOps.indexSelect(left, validLeftIdx),
                                       TensorOps.indexSelect(right, validRightIdx))
      val leftMatchIdx  = TensorOps.maskedSelect(validLeftIdx, matchMask)
      val rightMatchIdx = TensorOps.maskedSelect(validRightIdx, matchMask)

      // 18–19: accumulate (skip the cat when collision-free).
      if (maxHashBucketSize == 1) {
        leftOut = leftMatchIdx; rightOut = rightMatchIdx
      } else {
        leftOut = TensorOps.cat(leftOut, leftMatchIdx)
        rightOut = TensorOps.cat(rightOut, rightMatchIdx)
      }
      round += 1
    }
    (leftOut, rightOut)
  }
}

package repro.rechunk

/** Auto Rechunk (paper §V-D, Algorithm 1).
  *
  * Given a raw array shape, per-dimension constraints (`dimToSize`: a
  * dimension that must be chunked at exactly that many elements, e.g.
  * `{1 → 10000}` to force tall-and-skinny chunks for QR), the element
  * byte width, and a chunk byte limit, compute the list of chunk lengths
  * along every dimension.
  *
  * Reproduces the paper's worked example: shape (10000, 10000),
  * `dimToSize = {1 → 10000}`, itemsize 8, limit 128 MiB →
  * dim 0 chunks = (1677, 1677, 1677, 1677, 1677, 1615).
  */
object AutoRechunk {

  /** @param shape      raw array shape
    * @param dimToSize  fixed chunk length per constrained dimension
    * @param itemSize   bytes per element
    * @param chunkLimit max bytes per chunk
    * @return chunk lengths per dimension (index-aligned with `shape`)
    */
  def autoRechunk(
      shape: Seq[Long],
      dimToSize: Map[Int, Long],
      itemSize: Long,
      chunkLimit: Long = 128L << 20,
  ): Map[Int, Vector[Long]] = {
    require(shape.forall(_ > 0), s"invalid shape $shape")
    require(itemSize > 0 && chunkLimit > 0)
    dimToSize.foreach { case (d, s) =>
      require(d >= 0 && d < shape.size, s"dim $d out of range for $shape")
      require(s > 0 && s <= shape(d), s"fixed size $s invalid for dim $d of $shape")
    }

    val dims = shape.indices
    val result = scala.collection.mutable.Map[Int, Vector[Long]]()
    dimToSize.foreach { case (d, s) =>
      // Constrained dims chunk at exactly s (last chunk may be shorter).
      result(d) = splitEvery(shape(d), s)
    }

    // Free dims start empty and are filled greedily (Algorithm 1 loop).
    val leftDims = scala.collection.mutable.LinkedHashMap[Int, Vector[Long]]()
    val leftUnsplit = scala.collection.mutable.Map[Int, Long]()
    dims.filterNot(dimToSize.contains).foreach { d =>
      leftDims(d) = Vector.empty
      leftUnsplit(d) = shape(d)
    }
    if (leftDims.isEmpty) return result.toMap

    // Bytes fixed by the constrained dimensions (per chunk).
    val fixedElems = dimToSize.values.product.max(1L)
    var guard = 0
    while (leftDims.nonEmpty && guard < 1000000) {
      guard += 1
      val nbytes = fixedElems * itemSize
      val divided = math.max(1L, chunkLimit / math.max(1L, nbytes))
      val freeCount = leftDims.size
      val curSize = math.max(1L, math.pow(divided.toDouble, 1.0 / freeCount).toLong)
      leftDims.keys.toVector.foreach { d =>
        val unsplit = leftUnsplit(d)
        val take = math.min(unsplit, curSize)
        leftDims(d) = leftDims(d) :+ take
        leftUnsplit(d) = unsplit - take
        if (leftUnsplit(d) <= 0) {
          result(d) = leftDims(d)
          leftDims.remove(d)
        }
      }
    }
    require(leftDims.isEmpty, "auto rechunk failed to converge")
    result.toMap
  }

  /** Convenience: chunk lengths along dim 0 for a 2-D tall-and-skinny
    * constraint (columns unsplit), the QR/SVD use case.
    */
  def tallSkinnyRowChunks(rows: Long, cols: Long, itemSize: Long, chunkLimit: Long = 128L << 20): Vector[Long] =
    autoRechunk(Seq(rows, cols), Map(1 -> cols), itemSize, chunkLimit)(0)

  private def splitEvery(total: Long, each: Long): Vector[Long] = {
    val full = total / each
    val rem = total - full * each
    Vector.fill(full.toInt)(each) ++ (if (rem > 0) Vector(rem) else Vector.empty)
  }
}

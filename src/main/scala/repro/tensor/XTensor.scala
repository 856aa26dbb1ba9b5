package repro.tensor

import breeze.linalg.DenseMatrix
import org.apache.spark.rdd.RDD
import org.apache.spark.sql.SparkSession

import repro.rechunk.AutoRechunk

/** One chunk of a distributed 2-D tensor: block (r, c) of the logical
  * matrix (the Tensor analog of the paper's distributed index, Fig 4).
  */
final case class MatChunk(r: Int, c: Int, m: DenseMatrix[Double])

/** Distributed dense 2-D tensor, chunked along rows (tall matrices are
  * the paper's array-workload shape: QR, linear regression).
  *
  * The chunk payloads are Breeze matrices inside an RDD — Breeze plays
  * the role of NumPy as the single-node backend for array chunks.
  *
  * @param rows      total logical rows
  * @param cols      logical columns (never split: tall-and-skinny layout)
  * @param rowChunks chunk lengths along dim 0 (from AutoRechunk)
  */
final class XTensor(
    val spark: SparkSession,
    val rows: Long,
    val cols: Int,
    val rowChunks: Vector[Long],
    val rdd: RDD[MatChunk],
) {
  def numChunks: Int = rowChunks.size

  /** Element-wise map over chunks (lazy). */
  def mapElements(f: Double => Double): XTensor =
    new XTensor(spark, rows, cols, rowChunks, rdd.map(c => MatChunk(c.r, c.c, c.m.map(f))))

  def scale(a: Double): XTensor = mapElements(_ * a)

  /** Materialize to a local Breeze matrix (small results only). */
  def toLocal(): DenseMatrix[Double] = {
    val chunks = rdd.collect().sortBy(_.r)
    val out = DenseMatrix.zeros[Double](rows.toInt, cols)
    var off = 0
    chunks.foreach { c =>
      out((off until off + c.m.rows), ::) := c.m
      off += c.m.rows
    }
    out
  }

  /** Frobenius norm via a distributed reduce. */
  def frobeniusNorm(): Double =
    math.sqrt(rdd.map(c => breeze.linalg.sum(c.m.map(x => x * x))).sum())
}

object XTensor {

  /** Deterministic pseudo-random tall matrix, chunked by AutoRechunk
    * given the tall-and-skinny constraint `{1 → cols}` (§V-D): the user
    * never specifies a chunk size — the paper's headline array UX.
    */
  def randn(
      spark: SparkSession,
      rows: Long,
      cols: Int,
      seed: Long = 42,
      chunkLimit: Long = 2L << 20,
  ): XTensor = {
    val chunks = AutoRechunk.tallSkinnyRowChunks(rows, cols, itemSize = 8, chunkLimit = chunkLimit)
    fromChunkLengths(spark, rows, cols, chunks, seed)
  }

  /** Like `randn` but with a caller-chosen row chunk length — the Dask
    * manual-`rechunk` path (Listing 1 in the paper). Throws if the
    * resulting chunks are not tall-and-skinny, reproducing Dask's
    * qr chunking restriction.
    */
  def randnManual(
      spark: SparkSession,
      rows: Long,
      cols: Int,
      chunkRows: Long,
      seed: Long = 42,
  ): XTensor = {
    require(chunkRows >= cols,
      s"qr requires tall-and-skinny chunks: chunkRows=$chunkRows < cols=$cols " +
        "(rechunk first — this is the Dask restriction the paper's auto rechunk removes)")
    val lens = Vector.unfold(rows) { left =>
      if (left <= 0) None else Some((math.min(chunkRows, left), left - math.min(chunkRows, left)))
    }
    fromChunkLengths(spark, rows, cols, lens, seed)
  }

  private def fromChunkLengths(
      spark: SparkSession,
      rows: Long,
      cols: Int,
      lens: Vector[Long],
      seed: Long,
  ): XTensor = {
    require(lens.sum == rows, s"chunk lengths ${lens.sum} != rows $rows")
    val nCols = cols
    val sc = spark.sparkContext
    val withIdx = lens.zipWithIndex
    val rdd = sc.parallelize(withIdx, math.min(withIdx.size, sc.defaultParallelism)).map {
      case (len, r) =>
        // Chunk-local deterministic RNG: seed mixes the global seed and
        // the chunk index so regeneration is stable.
        val rng = new java.util.Random(seed * 1000003L + r)
        val m = DenseMatrix.fill[Double](len.toInt, nCols)(rng.nextGaussian())
        MatChunk(r, 0, m)
    }
    new XTensor(spark, rows, cols, lens, rdd)
  }
}

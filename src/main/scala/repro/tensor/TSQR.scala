package repro.tensor

import breeze.linalg.{qr, DenseMatrix}

/** Direct Tall-and-Skinny QR in the MapReduce style of Benson, Gleich &
  * Demmel (the algorithm both Xorbits and Dask use for `qr`, §VI-C).
  *
  * Map stage: each row chunk A_i → local QR = Q_i R_i (R_i is n×n).
  * Reduce stage: the stacked R_i (kn×n, small) gets one more local QR,
  * R_stack = Q2 R. Then Q = diag(Q_1…Q_k) · Q2 block-rows, distributed.
  *
  * The result satisfies A = Q R with Q having orthonormal columns and R
  * upper-triangular (up to column sign conventions of the local QR).
  */
object TSQR {

  final case class QRResult(q: XTensor, r: DenseMatrix[Double])

  /** @param materializeStages when true, persist + count every stage
    *   (the no-graph-fusion baseline behavior used in the Dask-like arm
    *   of the array benchmarks); when false, stages stay lazy and fuse
    *   into single Spark jobs.
    */
  def qrDecompose(a: XTensor, materializeStages: Boolean = false): QRResult = {
    val n = a.cols
    require(a.rowChunks.forall(_ >= n),
      s"TSQR requires tall-and-skinny chunks (min chunk ${a.rowChunks.min} < cols $n)")

    // Map: local QR per chunk. The factored stage feeds BOTH the R
    // reduction and the Q back-multiply, so it is always cached (this is
    // the tensor-side equivalent of the storage service holding an
    // intermediate chunk consumed by two successors).
    val factored = a.rdd.map { c =>
      val qr.QR(qi, ri) = qr.reduced(c.m)
      (c.r, qi, ri)
    }.persist()
    if (materializeStages) {
      // Baseline arm: eager per-stage barriers (input + map stage), the
      // no-graph-fusion execution style.
      a.rdd.persist()
      a.rdd.count()
      factored.count()
    }

    // Reduce: stack the small R factors on the driver (k·n×n), QR again.
    val rFactors = factored.map { case (r, _, ri) => (r, ri) }.collect().sortBy(_._1)
    val k = rFactors.size
    val stacked = DenseMatrix.zeros[Double](k * n, n)
    rFactors.zipWithIndex.foreach { case ((_, ri), i) =>
      stacked((i * n until (i + 1) * n), ::) := ri
    }
    val qr.QR(q2, rFinal) = qr.reduced(stacked)

    // Back-multiply: Q block-row i = Q_i · Q2[i·n:(i+1)·n, :].
    val sc = a.spark.sparkContext
    val q2b = sc.broadcast(q2)
    val qRdd = factored.map { case (r, qi, _) =>
      val block = q2b.value((r * n until (r + 1) * n), ::)
      MatChunk(r, 0, qi * block)
    }
    QRResult(new XTensor(a.spark, a.rows, a.cols, a.rowChunks, qRdd), rFinal)
  }
}

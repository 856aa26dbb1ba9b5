package repro.tensor

import breeze.linalg.{qr, DenseMatrix, sum => bsum}

import repro.SparkSpec

class TensorSpec extends SparkSpec {

  test("randn auto-chunks via AutoRechunk (tall-and-skinny)") {
    val t = XTensor.randn(spark, rows = 5000, cols = 16, chunkLimit = 64 << 10)
    // 64 KiB / (16 cols × 8 B) = 512 rows per chunk
    assert(t.rowChunks.forall(_ <= 512))
    assert(t.rowChunks.sum == 5000)
    assert(t.numChunks == t.rdd.count())
  }

  test("chunk indices are contiguous and ordered") {
    val t = XTensor.randn(spark, 2000, 8, chunkLimit = 32 << 10)
    val idx = t.rdd.map(_.r).collect().sorted.toVector
    assert(idx == idx.indices.toVector)
  }

  test("generation is deterministic in (seed, chunking)") {
    val a = XTensor.randn(spark, 1000, 4, seed = 3, chunkLimit = 16 << 10).toLocal()
    val b = XTensor.randn(spark, 1000, 4, seed = 3, chunkLimit = 16 << 10).toLocal()
    assert(a == b)
    val c = XTensor.randn(spark, 1000, 4, seed = 4, chunkLimit = 16 << 10).toLocal()
    assert(a != c)
  }

  test("mapElements applies element-wise") {
    val t = XTensor.randn(spark, 500, 4, chunkLimit = 8 << 10)
    val doubled = t.scale(2.0).toLocal()
    val base = t.toLocal()
    assert(math.abs(bsum(doubled) - bsum(base) * 2.0) < 1e-9)
    assert(doubled.rows == 500 && doubled.cols == 4)
  }

  test("frobeniusNorm matches the local norm") {
    val t = XTensor.randn(spark, 800, 6, chunkLimit = 8 << 10)
    val local = t.toLocal()
    val want = math.sqrt(bsum(local.map(x => x * x)))
    assert(math.abs(t.frobeniusNorm() - want) < 1e-9)
  }

  test("manual chunking rejects non-tall-and-skinny chunks (Dask's restriction)") {
    assertThrows[IllegalArgumentException] {
      XTensor.randnManual(spark, rows = 1000, cols = 64, chunkRows = 32)
    }
  }

  test("manual chunking with valid sizes works") {
    val t = XTensor.randnManual(spark, 1000, 8, chunkRows = 300)
    assert(t.rowChunks == Vector(300L, 300L, 300L, 100L))
  }

  test("TSQR: R is upper triangular") {
    val a = XTensor.randn(spark, 3000, 12, chunkLimit = 32 << 10)
    val TSQR.QRResult(_, r) = TSQR.qrDecompose(a)
    assert(r.rows == 12 && r.cols == 12)
    for (i <- 0 until 12; j <- 0 until i)
      assert(math.abs(r(i, j)) < 1e-10, s"R($i,$j) not ~0")
  }

  test("TSQR: Q has orthonormal columns") {
    val a = XTensor.randn(spark, 3000, 12, chunkLimit = 32 << 10)
    val TSQR.QRResult(q, _) = TSQR.qrDecompose(a)
    val qLocal = q.toLocal()
    val qtq = qLocal.t * qLocal
    val eye = DenseMatrix.eye[Double](12)
    assert(breeze.linalg.max(breeze.numerics.abs(qtq - eye)) < 1e-8)
  }

  test("TSQR: Q * R reconstructs A") {
    val a = XTensor.randn(spark, 2000, 8, chunkLimit = 16 << 10)
    val TSQR.QRResult(q, r) = TSQR.qrDecompose(a)
    val recon = q.toLocal() * r
    val orig = a.toLocal()
    assert(breeze.linalg.max(breeze.numerics.abs(recon - orig)) < 1e-8)
  }

  test("TSQR matches across chunkings (same matrix content)") {
    // R is unique up to row signs; compare |R|.
    val a1 = XTensor.randn(spark, 1024, 4, seed = 11, chunkLimit = 8 << 10)
    val local = a1.toLocal()
    val TSQR.QRResult(_, r1) = TSQR.qrDecompose(a1)
    val qr.QR(_, r2) = qr.reduced(local)
    assert(breeze.linalg.max(breeze.numerics.abs(
      breeze.numerics.abs(r1) - breeze.numerics.abs(r2))) < 1e-8)
  }

  test("TSQR requires tall-and-skinny chunks") {
    val t = XTensor.randnManual(spark, 100, 10, chunkRows = 10)
    // chunkRows == cols is allowed (square chunks are the boundary)
    TSQR.qrDecompose(t)
    succeed
  }

  test("TSQR with stage materialization (baseline arm) gives the same R") {
    val a = XTensor.randn(spark, 1500, 6, seed = 21, chunkLimit = 16 << 10)
    val TSQR.QRResult(_, rFused) = TSQR.qrDecompose(a, materializeStages = false)
    val TSQR.QRResult(_, rMat) = TSQR.qrDecompose(a, materializeStages = true)
    assert(breeze.linalg.max(breeze.numerics.abs(
      breeze.numerics.abs(rFused) - breeze.numerics.abs(rMat))) < 1e-10)
  }
}

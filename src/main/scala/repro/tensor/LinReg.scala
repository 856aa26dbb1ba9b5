package repro.tensor

import breeze.linalg.{DenseMatrix, DenseVector}

/** Distributed ordinary-least-squares linear regression via normal
  * equations — the paper's classical ML array workload (§VI-C).
  *
  * XᵀX and Xᵀy are accumulated per chunk (map), combined with a tree
  * reduce (the combine stage of the map-combine-reduce model), and the
  * d×d solve happens on the driver.
  */
object LinReg {

  /** Fit β for y = X β + ε. `x` and `y` must share row chunking.
    *
    * @param treeDepth treeAggregate depth; depth 2 is the combine-stage
    *   arm, depth 1 is the plain MapReduce (no combine) baseline
    */
  def fit(x: XTensor, y: XTensor, treeDepth: Int = 2): DenseVector[Double] = {
    require(x.rows == y.rows && y.cols == 1, "y must be a column vector with x's rows")
    require(x.rowChunks == y.rowChunks, "x and y must share chunking")
    val d = x.cols
    val paired = x.rdd.map(c => (c.r, c.m)).join(y.rdd.map(c => (c.r, c.m)))
    val zero = (DenseMatrix.zeros[Double](d, d), DenseVector.zeros[Double](d))
    val (xtx, xty) = paired.treeAggregate(zero)(
      seqOp = { case ((mAcc, vAcc), (_, (xm, ym))) =>
        (mAcc + xm.t * xm, vAcc + xm.t * ym(::, 0))
      },
      combOp = { case ((m1, v1), (m2, v2)) => (m1 + m2, v1 + v2) },
      depth = math.max(1, treeDepth),
    )
    xtx \ xty
  }

  /** Deterministic synthetic regression data: X ~ N(0,1), y = Xβ + noise. */
  def syntheticProblem(
      spark: org.apache.spark.sql.SparkSession,
      rows: Long,
      cols: Int,
      beta: DenseVector[Double],
      noise: Double = 0.01,
      seed: Long = 7,
      chunkLimit: Long = 2L << 20,
  ): (XTensor, XTensor) = {
    val x = XTensor.randn(spark, rows, cols, seed, chunkLimit)
    val sc = spark.sparkContext
    val betaB = sc.broadcast(beta)
    val yRdd = x.rdd.map { c =>
      val rng = new java.util.Random(seed * 7919L + c.r)
      val ym = c.m * betaB.value.toDenseMatrix.t
      (0 until ym.rows).foreach(i => ym(i, 0) += rng.nextGaussian() * noise)
      MatChunk(c.r, 0, ym)
    }
    (x, new XTensor(spark, x.rows, 1, x.rowChunks, yRdd))
  }
}

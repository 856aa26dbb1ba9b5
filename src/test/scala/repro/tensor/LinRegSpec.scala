package repro.tensor

import breeze.linalg.DenseVector

import repro.SparkSpec

class LinRegSpec extends SparkSpec {

  test("recovers known coefficients on low-noise data") {
    val beta = DenseVector(2.0, -1.5, 0.5, 3.0)
    val (x, y) = LinReg.syntheticProblem(spark, rows = 20000, cols = 4, beta, noise = 0.01,
      chunkLimit = 64 << 10)
    val fit = LinReg.fit(x, y)
    (0 until 4).foreach(i => assert(math.abs(fit(i) - beta(i)) < 0.01, s"beta($i)=${fit(i)}"))
  }

  test("tree depth does not change the result (combine stage is associative)") {
    val beta = DenseVector(1.0, 1.0)
    val (x, y) = LinReg.syntheticProblem(spark, 5000, 2, beta, noise = 0.05, chunkLimit = 16 << 10)
    val f1 = LinReg.fit(x, y, treeDepth = 1)
    val f2 = LinReg.fit(x, y, treeDepth = 3)
    (0 until 2).foreach(i => assert(math.abs(f1(i) - f2(i)) < 1e-9))
  }

  test("noise-free data is recovered almost exactly") {
    val beta = DenseVector(0.25, -4.0, 10.0)
    val (x, y) = LinReg.syntheticProblem(spark, 3000, 3, beta, noise = 0.0, chunkLimit = 16 << 10)
    val fit = LinReg.fit(x, y)
    (0 until 3).foreach(i => assert(math.abs(fit(i) - beta(i)) < 1e-8))
  }

  test("mismatched chunking is rejected") {
    val beta = DenseVector(1.0)
    val (x, _) = LinReg.syntheticProblem(spark, 1000, 1, beta, chunkLimit = 8 << 10)
    val (_, y2) = LinReg.syntheticProblem(spark, 1000, 1, beta, chunkLimit = 4 << 10)
    assertThrows[IllegalArgumentException](LinReg.fit(x, y2))
  }

  test("y must be a column vector of matching rows") {
    val beta = DenseVector(1.0, 2.0)
    val (x, _) = LinReg.syntheticProblem(spark, 1000, 2, beta, chunkLimit = 8 << 10)
    assertThrows[IllegalArgumentException](LinReg.fit(x, x))
  }
}

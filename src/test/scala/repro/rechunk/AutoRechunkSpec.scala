package repro.rechunk

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

class AutoRechunkSpec extends AnyFunSuite {

  private def checkProp(prop: Prop, tests: Int = 100): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(tests), prop)
    assert(res.passed, res.status.toString)
  }

  test("paper worked example: (10000,10000), {1→10000}, itemsize 8, 128 MiB") {
    val chunks = AutoRechunk.autoRechunk(Seq(10000L, 10000L), Map(1 -> 10000L), 8, 128L << 20)
    assert(chunks(1) == Vector(10000L))
    assert(chunks(0) == Vector(1677L, 1677L, 1677L, 1677L, 1677L, 1615L))
  }

  test("tallSkinnyRowChunks matches the worked example") {
    val rows = AutoRechunk.tallSkinnyRowChunks(10000, 10000, 8, 128L << 20)
    assert(rows == Vector(1677L, 1677L, 1677L, 1677L, 1677L, 1615L))
  }

  test("chunk lengths cover each dimension exactly") {
    val chunks = AutoRechunk.autoRechunk(Seq(1000L, 64L), Map(1 -> 64L), 8, 64 << 10)
    assert(chunks(0).sum == 1000L)
    assert(chunks(1).sum == 64L)
  }

  test("each chunk respects the byte limit when the limit allows >= 1 row") {
    val limit = 64L << 10
    val chunks = AutoRechunk.autoRechunk(Seq(5000L, 32L), Map(1 -> 32L), 8, limit)
    chunks(0).foreach(len => assert(len * 32 * 8 <= limit))
  }

  test("single free dimension with no constraints") {
    val chunks = AutoRechunk.autoRechunk(Seq(1000L), Map.empty, 8, 800)
    assert(chunks(0).sum == 1000L)
    assert(chunks(0).forall(_ <= 100)) // 800 / 8 = 100 elements per chunk
  }

  test("two free dimensions split roughly square") {
    val chunks = AutoRechunk.autoRechunk(Seq(100L, 100L), Map.empty, 8, 8 * 25 * 25)
    assert(chunks(0).sum == 100L && chunks(1).sum == 100L)
    assert(chunks(0).head == 25 && chunks(1).head == 25)
  }

  test("constrained dim larger than shape rejected") {
    assertThrows[IllegalArgumentException] {
      AutoRechunk.autoRechunk(Seq(10L, 10L), Map(1 -> 20L), 8, 1024)
    }
  }

  test("invalid dims rejected") {
    assertThrows[IllegalArgumentException] {
      AutoRechunk.autoRechunk(Seq(10L), Map(3 -> 5L), 8, 1024)
    }
  }

  test("zero-size shape rejected") {
    assertThrows[IllegalArgumentException] {
      AutoRechunk.autoRechunk(Seq(0L), Map.empty, 8, 1024)
    }
  }

  test("tiny limit still yields at least one element per chunk") {
    val chunks = AutoRechunk.autoRechunk(Seq(10L, 8L), Map(1 -> 8L), 8, 1)
    assert(chunks(0).forall(_ == 1L))
    assert(chunks(0).size == 10)
  }

  test("property: tall-skinny chunks always cover the shape and stay positive") {
    val gen = for {
      rows <- Gen.choose(1L, 100000L)
      cols <- Gen.choose(1L, 512L)
      limit <- Gen.choose(1L << 10, 8L << 20)
    } yield (rows, cols, limit)
    checkProp(Prop.forAll(gen) { case (rows, cols, limit) =>
      val chunks = AutoRechunk.autoRechunk(Seq(rows, cols), Map(1 -> cols), 8, limit)
      chunks(0).sum == rows && chunks(0).forall(_ > 0) && chunks(1) == Vector(cols)
    })
  }

  test("property: unconstrained 1-D chunking covers and bounds") {
    val gen = for {
      n <- Gen.choose(1L, 1000000L)
      limit <- Gen.choose(64L, 1L << 20)
    } yield (n, limit)
    checkProp(Prop.forAll(gen) { case (n, limit) =>
      val chunks = AutoRechunk.autoRechunk(Seq(n), Map.empty, 8, limit)
      val per = math.max(1L, limit / 8)
      chunks(0).sum == n && chunks(0).forall(_ <= per)
    })
  }

  test("all-constrained dims return the fixed splits") {
    val chunks = AutoRechunk.autoRechunk(Seq(10L, 7L), Map(0 -> 4L, 1 -> 7L), 8, 1024)
    assert(chunks(0) == Vector(4L, 4L, 2L))
    assert(chunks(1) == Vector(7L))
  }
}

package repro.embed

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Rng

class MultiscaleSpec extends AnyFunSuite {

  test("Box rejects degenerate coordinates") {
    assertThrows[IllegalArgumentException](Box(1, 0, 0, 5))
  }

  test("Box area and dimensions") {
    val b = Box(1, 2, 4, 6)
    assert(b.width == 3 && b.height == 4 && b.area == 12)
  }

  test("intersectionArea of disjoint boxes is 0") {
    assert(Box(0, 0, 1, 1).intersectionArea(Box(2, 2, 3, 3)) == 0.0)
  }

  test("intersectionArea of touching boxes is 0 (end-exclusive)") {
    assert(Box(0, 0, 1, 1).intersectionArea(Box(1, 0, 2, 1)) == 0.0)
    assert(!Box(0, 0, 1, 1).overlaps(Box(1, 0, 2, 1)))
  }

  test("intersectionArea of nested boxes is inner area") {
    assert(Box(0, 0, 10, 10).intersectionArea(Box(2, 2, 4, 4)) == 4.0)
  }

  test("intersectionArea is symmetric") {
    for (s <- 0 until 50) {
      def rb(k: Long): Box = {
        val x0 = Rng.uniform(Rng.key(k, 0L), 0, 50)
        val y0 = Rng.uniform(Rng.key(k, 1L), 0, 50)
        Box(x0, y0, x0 + Rng.uniform(Rng.key(k, 2L), 1, 50), y0 + Rng.uniform(Rng.key(k, 3L), 1, 50))
      }
      val a = rb(Rng.key(1, s)); val b = rb(Rng.key(2, s))
      assert(math.abs(a.intersectionArea(b) - b.intersectionArea(a)) < 1e-9)
      assert(a.intersectionArea(b) <= math.min(a.area, b.area) + 1e-9)
    }
  }

  test("paper example: a 448x448 image yields 1 coarse + 9 fine patches") {
    val ps = Multiscale.patches(448, 448)
    assert(ps.length == 10)
    assert(ps.head == Box(0, 0, 448, 448))
    val fine = ps.tail
    assert(fine.forall(b => b.width == 224 && b.height == 224))
    assert(fine.map(b => (b.x0, b.y0)).toSet ==
      (for (y <- Seq(0, 112, 224); x <- Seq(0, 112, 224)) yield (x.toDouble, y.toDouble)).toSet)
  }

  test("a 224x224 image (ObjectNet) yields only the coarse patch") {
    assert(Multiscale.patches(224, 224) == IndexedSeq(Box(0, 0, 224, 224)))
  }

  test("small images yield only the coarse patch") {
    assert(Multiscale.patches(100, 100).length == 1)
    assert(Multiscale.patches(300, 200).length == 1) // short side <= 224
  }

  test("multiscale=false always yields only the coarse patch") {
    assert(Multiscale.patches(1280, 720, multiscale = false).length == 1)
  }

  test("BDD-size 1280x720 yields ~20x vectors like the paper's ratio") {
    val n = Multiscale.patches(1280, 720).length
    assert(n == 19, s"got $n") // 6x3 fine tiles + coarse; paper ratio 1.6M/80K = 20
  }

  test("COCO-size 640x480 yields ~13x vectors like the paper's ratio") {
    val n = Multiscale.patches(640, 480).length
    assert(n == 13, s"got $n") // 4x3 fine tiles + coarse; paper ratio 1.6M/120K = 13.3
  }

  test("fine tiles are at least the native size where the image allows") {
    for ((w, h) <- Seq((450, 450), (640, 480), (1280, 720), (2000, 1000))) {
      val fine = Multiscale.patches(w, h).tail
      fine.foreach { b =>
        assert(b.width >= 1 && b.height >= 1)
        assert(b.width <= math.max(Multiscale.NativeSize, math.min(w, h) / 2))
      }
    }
  }

  test("all patches lie within the image") {
    for ((w, h) <- Seq((448, 448), (640, 480), (1280, 720), (999, 501), (225, 10000))) {
      Multiscale.patches(w, h).foreach { b =>
        assert(b.x0 >= 0 && b.y0 >= 0 && b.x1 <= w && b.y1 <= h, s"($w,$h): $b")
      }
    }
  }

  test("patches cover the full image (union bound check via corners)") {
    // Every corner region of the image must be covered by some patch
    // (the coarse patch guarantees it, fine tiles must not be required).
    for ((w, h) <- Seq((448, 448), (640, 480))) {
      val ps = Multiscale.patches(w, h)
      for ((px, py) <- Seq((0.5, 0.5), (w - 0.5, h - 0.5), (w / 2.0, h / 2.0))) {
        assert(ps.exists(b => px >= b.x0 && px < b.x1 && py >= b.y0 && py < b.y1))
      }
    }
  }

  test("coarse patch is always index 0") {
    for ((w, h) <- Seq((448, 448), (1280, 720), (224, 224)))
      assert(Multiscale.patches(w, h).head == Box(0, 0, w, h))
  }

  test("invalid image sizes are rejected") {
    assertThrows[IllegalArgumentException](Multiscale.patches(0, 10))
  }

  test("tiling is deterministic") {
    assert(Multiscale.patches(640, 480) == Multiscale.patches(640, 480))
  }
}

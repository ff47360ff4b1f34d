package repro.clean

import org.scalatest.funsuite.AnyFunSuite

class IsolationForestSpec extends AnyFunSuite {

  test("c(n) path normalization has the published values") {
    assert(IsolationForest.c(1) == 0.0)
    assert(IsolationForest.c(2) > 0.0)
    // c(256) ~ 2*(ln(255) + 0.5772) - 2*255/256 ~ 10.244
    assert(math.abs(IsolationForest.c(256) - 10.244) < 0.01)
  }

  test("planted outliers score higher than inliers") {
    val rng = new scala.util.Random(1)
    val inliers  = Array.fill(500)(rng.nextGaussian())
    val outliers = Array(15.0, -14.0, 22.0)
    val forest = IsolationForest.fit(inliers ++ outliers, seed = 42)
    val maxInlier = inliers.map(forest.score).max
    outliers.foreach { o =>
      assert(forest.score(o) > maxInlier, s"outlier $o not separated")
    }
  }

  test("scores are in (0, 1) and higher further from the bulk") {
    val rng = new scala.util.Random(2)
    val data = Array.fill(400)(rng.nextGaussian())
    val forest = IsolationForest.fit(data, seed = 7)
    for (x <- Seq(-30.0, -3.0, 0.0, 3.0, 30.0)) {
      val s = forest.score(x)
      assert(s > 0.0 && s < 1.0)
    }
    assert(forest.score(30.0) > forest.score(1.0))
    assert(forest.score(-30.0) > forest.score(-1.0))
  }

  test("threshold at contamination 0.01 flags about 1% of training points") {
    val rng = new scala.util.Random(3)
    val data = Array.fill(1000)(rng.nextGaussian())
    val forest = IsolationForest.fit(data, seed = 11)
    val thr = IsolationForest.threshold(forest, data, 0.01)
    val flagged = data.count(forest.score(_) > thr)
    assert(flagged <= 15, s"flagged=$flagged")
  }

  test("fit is deterministic in the seed") {
    val rng = new scala.util.Random(4)
    val data = Array.fill(300)(rng.nextGaussian())
    val f1 = IsolationForest.fit(data, seed = 5)
    val f2 = IsolationForest.fit(data, seed = 5)
    val f3 = IsolationForest.fit(data, seed = 6)
    val probe = Seq(-2.5, 0.0, 4.0)
    probe.foreach(x => assert(f1.score(x) == f2.score(x)))
    assert(probe.exists(x => f1.score(x) != f3.score(x)))
  }

  test("constant data degenerates gracefully") {
    val data = Array.fill(100)(5.0)
    val forest = IsolationForest.fit(data, seed = 1)
    val s = forest.score(5.0)
    assert(!s.isNaN && s > 0.0 && s <= 1.0)
  }

  test("tiny samples do not crash") {
    val forest = IsolationForest.fit(Array(1.0), seed = 1)
    assert(!forest.score(1.0).isNaN)
  }
}

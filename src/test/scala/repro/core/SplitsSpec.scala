package repro.core

import repro.SparkSpec
import repro.data.Datasets

class SplitsSpec extends SparkSpec {

  private lazy val df = Datasets.byName("EEG").clean(spark).cache()

  test("train/test is roughly 70/30") {
    val (tr, te) = Splits.trainTest(df, 0)
    val total = df.count().toDouble
    val frac = tr.count() / total
    assert(frac > 0.62 && frac < 0.78, s"train frac=$frac")
    assert(tr.count() + te.count() == df.count())
  }

  test("split is deterministic") {
    val (tr1, _) = Splits.trainTest(df, 3)
    val (tr2, _) = Splits.trainTest(df, 3)
    assert(tr1.select("rid").collect().map(_.getLong(0)).sorted
      .sameElements(tr2.select("rid").collect().map(_.getLong(0)).sorted))
  }

  test("train and test are disjoint") {
    val (tr, te) = Splits.trainTest(df, 1)
    assert(tr.join(te, "rid").count() == 0)
  }

  test("different seeds give different splits") {
    val (tr0, _) = Splits.trainTest(df, 0)
    val (tr1, _) = Splits.trainTest(df, 1)
    val a = tr0.select("rid").collect().map(_.getLong(0)).toSet
    val b = tr1.select("rid").collect().map(_.getLong(0)).toSet
    assert(a != b)
    // Roughly independent: overlap near 70% of 70%.
    val overlap = a.intersect(b).size.toDouble / a.size
    assert(overlap > 0.5 && overlap < 0.9, s"overlap=$overlap")
  }

  test("sub/val split is roughly 80/20, disjoint, deterministic") {
    val (tr, _) = Splits.trainTest(df, 0)
    val (sub, valF) = Splits.subVal(tr, 17)
    val frac = sub.count().toDouble / tr.count()
    assert(frac > 0.72 && frac < 0.88, s"sub frac=$frac")
    assert(sub.join(valF, "rid").count() == 0)
    assert(sub.count() + valF.count() == tr.count())
    val (sub2, _) = Splits.subVal(tr, 17)
    assert(sub.count() == sub2.count())
  }

  test("validation split is independent of the train/test hash") {
    // Same salt on different base sets still gives ~80/20.
    val (tr, te) = Splits.trainTest(df, 5)
    val (s1, v1) = Splits.subVal(tr, 99)
    val (s2, v2) = Splits.subVal(te, 99)
    assert(v1.count() > 0 && v2.count() > 0)
    assert(s1.count() > 3 * v1.count() / 2)
    assert(s2.count() > 3 * v2.count() / 2)
  }
}

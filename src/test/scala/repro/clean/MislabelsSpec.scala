package repro.clean

import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.core.ErrorType
import repro.data.Datasets

class MislabelsSpec extends SparkSpec {

  test("fix restores all labels to ground truth") {
    for (v <- repro.core.MislabelVariants.all) {
      val dirty = Datasets.byName("EEG").dirty(spark, ErrorType.Mislabels, v)
      assert(dirty.filter(col("label") =!= col("label_gt")).count() > 0, v)
      val fixed = Mislabels.fix(dirty)
      assert(fixed.filter(col("label") =!= col("label_gt")).count() == 0, v)
    }
  }

  test("clean() fixes both train and test") {
    val ds = Datasets.byName("USCensus")
    val dirty = ds.dirty(spark, ErrorType.Mislabels, "uniform")
    val (train, test) = repro.core.Splits.trainTest(dirty, 0)
    val (trC, teC) = Mislabels.clean(ds.spec, train, test)
    assert(trC.filter(col("label") =!= col("label_gt")).count() == 0)
    assert(teC.filter(col("label") =!= col("label_gt")).count() == 0)
  }

  test("fix only changes labels, never features") {
    val ds = Datasets.byName("EEG")
    val dirty = ds.dirty(spark, ErrorType.Mislabels, "uniform")
    val fixed = Mislabels.fix(dirty)
    val joined = fixed.alias("a").join(dirty.alias("b"), "rid")
    val featureDiff = ds.spec.numeric.map(c =>
      sum(when(col(s"a.$c") =!= col(s"b.$c"), 1L).otherwise(0L))).reduce(_ + _)
    assert(joined.agg(featureDiff).head().getLong(0) == 0)
  }

  test("method names match the paper (ground truth detection, flip repair)") {
    assert(Mislabels.method.detect == "ground_truth")
    assert(Mislabels.method.repair == "flip")
  }
}

package repro.ml

import org.apache.spark.ml.linalg.Vector
import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.data.Datasets

class FeaturesSpec extends SparkSpec {

  test("pipeline produces a features vector for every dataset") {
    Datasets.all.foreach { ds =>
      val df = ds.clean(spark)
      val model = Features.fit(ds.spec, df)
      val out = model.transform(df)
      assert(out.columns.contains(Features.FeaturesCol), ds.spec.name)
      val v = out.select(Features.FeaturesCol).head().getAs[Vector](0)
      assert(v.size > 0, ds.spec.name)
    }
  }

  test("numeric features are standardized to ~zero mean, unit variance") {
    val ds = Datasets.byName("EEG")
    val df = ds.clean(spark)
    val model = Features.fit(ds.spec, df)
    val vecs = model.transform(df).select(Features.FeaturesCol)
      .collect().map(_.getAs[Vector](0).toArray)
    val dim0 = vecs.map(_(0))
    val mean = dim0.sum / dim0.length
    val sd = math.sqrt(dim0.map(x => (x - mean) * (x - mean)).sum / (dim0.length - 1))
    assert(math.abs(mean) < 0.05, s"mean=$mean")
    assert(math.abs(sd - 1.0) < 0.1, s"sd=$sd")
  }

  test("one-hot encoding: categorical dataset gets one slot per category") {
    val ds = Datasets.byName("Titanic")
    val df = ds.clean(spark)
    val model = Features.fit(ds.spec, df)
    val dim = model.transform(df).select(Features.FeaturesCol).head()
      .getAs[Vector](0).size
    // 4 numeric + (2 sex + 3 pclass + 3 embarked) one-hot (+1 "keep" slot each).
    assert(dim >= 4 + 2 + 3 + 3, s"dim=$dim")
  }

  test("unseen test categories survive via handleInvalid=keep") {
    import spark.implicits._
    val ds = Datasets.byName("Titanic")
    val train = ds.clean(spark)
    val model = Features.fit(ds.spec, train)
    val weird = train.withColumn("embarked", lit("nowhere"))
    val out = model.transform(weird) // must not throw
    assert(out.count() == train.count())
  }

  test("text pipeline gives different vectors to different titles") {
    val ds = Datasets.byName("Citation")
    val df = ds.clean(spark)
    val model = Features.fit(ds.spec, df)
    val out = model.transform(df).select("rid", Features.FeaturesCol).collect()
    val distinct = out.map(_.getAs[Vector](1).toString).distinct
    assert(distinct.length > out.length / 2)
  }

  test("downsample balances the imbalanced analogs") {
    val ds = Datasets.byName("Credit")
    val df = ds.clean(spark)
    val balanced = Features.downsample(ds.spec, df, seed = 1)
    val counts = balanced.groupBy("label").count().collect()
      .map(r => r.getDouble(0) -> r.getLong(1)).toMap
    val ratio = counts.values.min.toDouble / counts.values.max
    assert(ratio > 0.7, s"ratio=$ratio counts=$counts")
    assert(balanced.count() < df.count())
  }

  test("downsample is identity for balanced datasets") {
    val ds = Datasets.byName("EEG")
    val df = ds.clean(spark)
    assert(Features.downsample(ds.spec, df, 1).count() == df.count())
  }

  test("pipeline statistics are arm-local: scaling differs with corrupted train") {
    val ds = Datasets.byName("EEG")
    val clean = ds.clean(spark)
    val corrupted = clean.withColumn("f1", col("f1") * 100)
    val mClean = Features.fit(ds.spec, clean)
    val mCorr  = Features.fit(ds.spec, corrupted)
    val probe = clean.limit(5)
    val a = mClean.transform(probe).select(Features.FeaturesCol).head().getAs[Vector](0)(0)
    val b = mCorr.transform(probe).select(Features.FeaturesCol).head().getAs[Vector](0)(0)
    assert(math.abs(a) > math.abs(b) * 10, s"a=$a b=$b")
  }
}

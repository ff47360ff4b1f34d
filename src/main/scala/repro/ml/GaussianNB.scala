package repro.ml

import org.apache.spark.ml.linalg.Vector
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** From-scratch Gaussian naive Bayes (paper §3.3). Implemented directly
  * (rather than via MLlib's multinomial NB) because standardized features
  * are negative and one-hot columns can be constant within a class —
  * handled here with scikit-learn-style variance smoothing
  * (eps = 1e-9 · max variance).
  */
object GaussianNB {

  def fit(train: DataFrame): DataFrame => DataFrame = {
    val data = train.select(col(Features.FeaturesCol), col("label"))
      .collect()
      .map(r => (r.getAs[Vector](0).toArray, r.getDouble(1)))
    require(data.nonEmpty, "GaussianNB: empty training set")
    val dim = data.head._1.length
    val byClass = data.groupBy(_._2)
    val n = data.length.toDouble

    val params: Map[Double, (Double, Array[Double], Array[Double])] =
      byClass.map { case (cls, rows) =>
        val m  = rows.length.toDouble
        val mu = new Array[Double](dim)
        rows.foreach { case (x, _) =>
          var i = 0; while (i < dim) { mu(i) += x(i); i += 1 }
        }
        var i = 0; while (i < dim) { mu(i) /= m; i += 1 }
        val vr = new Array[Double](dim)
        rows.foreach { case (x, _) =>
          var j = 0
          while (j < dim) { val d = x(j) - mu(j); vr(j) += d * d; j += 1 }
        }
        var j = 0; while (j < dim) { vr(j) /= m; j += 1 }
        cls -> (math.log(m / n), mu, vr)
      }

    val maxVar = params.values.flatMap(_._3).foldLeft(0.0)(math.max)
    val eps = math.max(1e-9 * maxVar, 1e-12)
    val spark = train.sparkSession
    val bc = spark.sparkContext.broadcast(params)

    val predictUdf = udf { (v: Vector) =>
      val x = v.toArray
      bc.value.toSeq
        .map { case (cls, (logPrior, mu, vr)) =>
          var ll = logPrior
          var i = 0
          val d = math.min(x.length, mu.length)
          while (i < d) {
            val s2 = vr(i) + eps
            val diff = x(i) - mu(i)
            ll += -0.5 * math.log(2 * math.Pi * s2) - diff * diff / (2 * s2)
            i += 1
          }
          (ll, cls)
        }
        .maxBy { case (ll, cls) => (ll, -cls) }._2
    }
    df => df.withColumn("prediction", predictUdf(col(Features.FeaturesCol)))
  }
}

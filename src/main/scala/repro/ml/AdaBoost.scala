package repro.ml

import scala.collection.mutable.ArrayBuffer

import org.apache.spark.ml.classification.{DecisionTreeClassificationModel, DecisionTreeClassifier}
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** From-scratch binary AdaBoost (discrete SAMME; paper §3.3 — MLlib has no
  * AdaBoost). Base learners are weighted MLlib decision trees; the sample
  * weights live in a DataFrame column and are re-normalized each round, so
  * boosting itself is expressed as DataFrame transforms.
  */
object AdaBoost {

  /** Fit on a featurized training set (must carry `rid`, `features`,
    * `label`); returns a transform adding `prediction`.
    */
  def fit(train: DataFrame, rounds: Int, baseDepth: Int, seed: Long): DataFrame => DataFrame = {
    val n = train.count().toDouble
    require(n > 0, "AdaBoost: empty training set")
    var cur = train.select(col("rid"), col(Features.FeaturesCol), col("label"))
      .withColumn("__w", lit(1.0 / n))
      .cache()
    cur.count()
    val trees = ArrayBuffer.empty[(DecisionTreeClassificationModel, Double)]

    var t = 0
    var stop = false
    while (t < rounds && !stop) {
      val dt = new DecisionTreeClassifier()
        .setFeaturesCol(Features.FeaturesCol).setLabelCol("label")
        .setWeightCol("__w").setMaxDepth(baseDepth).setSeed(seed + t)
      val model  = dt.fit(cur)
      val scored = model.transform(cur)
      val row = scored.agg(
        sum(when(col("prediction") =!= col("label"), col("__w")).otherwise(0.0)),
        sum(col("__w"))).head()
      val err = row.getDouble(0) / row.getDouble(1)
      if (err <= 1e-10) {
        // Perfect base learner: take it with a large vote and stop.
        trees += ((model, 5.0)); stop = true
      } else if (err >= 0.5) {
        // No better than chance under current weights; keep earlier rounds
        // (or this one alone with a tiny vote if it is the first).
        if (trees.isEmpty) trees += ((model, 1e-3))
        stop = true
      } else {
        val alpha = 0.5 * math.log((1.0 - err) / err)
        trees += ((model, alpha))
        val unnorm = scored
          .withColumn("__w",
            col("__w") * exp(lit(alpha) * when(col("prediction") =!= col("label"), 2.0).otherwise(-2.0) * lit(0.5)))
          .select(col("rid"), col(Features.FeaturesCol), col("label"), col("__w"))
        val total = unnorm.agg(sum(col("__w"))).head().getDouble(0)
        val next = unnorm.withColumn("__w", col("__w") / lit(total)).cache()
        next.count()
        cur.unpersist(blocking = false)
        cur = next
      }
      t += 1
    }
    cur.unpersist(blocking = false)
    val fitted = trees.toSeq

    df => {
      var acc = df.withColumn("__score", lit(0.0))
      fitted.foreach { case (m, a) =>
        acc = m.transform(acc)
          .withColumn("__score", col("__score") + lit(a) * (col("prediction") * 2.0 - 1.0))
          .drop("prediction", "rawPrediction", "probability")
      }
      acc.withColumn("prediction", when(col("__score") > 0, 1.0).otherwise(0.0))
        .drop("__score")
    }
  }
}

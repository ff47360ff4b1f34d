package repro.core

import scala.collection.mutable.ArrayBuffer
import scala.util.{Random, Try}

import org.apache.spark.ml.PipelineModel
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.clean.CleaningMethods
import repro.core.ErrorType._
import repro.data.{BenchDataset, DataSpec}
import repro.ml.{Evaluate, Features, ModelAdapter, Models}

/** Runs the experiments of one *cell* — a (dataset, error type, variant,
  * split) — producing the raw measurements for every cleaning method,
  * scenario, model, and search seed (paper §4.1).
  */
object Experiment {

  /** A fitted model: its validation score and a predictor over raw rows. */
  final case class Fitted(valScore: Double, predict: DataFrame => DataFrame)

  /** A featurized training arm: the preprocessing pipeline fit on this
    * arm's training set, the downsampled sub-train and the validation fold
    * (cached), and the arm's class histogram for degenerate-case guards.
    */
  final case class Arm(spec: DataSpec, pipeline: PipelineModel,
                       sub: DataFrame, valFold: DataFrame,
                       classCounts: Map[Double, Long])

  /** Build (and cache) a training arm from raw training rows. */
  def buildArm(spec: DataSpec, trainRaw: DataFrame, split: Int,
               cached: ArrayBuffer[DataFrame]): Arm = {
    val pipeline = Features.fit(spec, trainRaw)
    val featurized = pipeline.transform(trainRaw)
      .select(col("rid"), col(Features.FeaturesCol), col("label"))
    val (sub0, valFold0) = Splits.subVal(featurized, salt = split * 131 + 17)
    val sub = Features.downsample(spec, sub0, seed = split.toLong).cache()
    val valFold = valFold0.cache()
    cached += sub; cached += valFold
    val classCounts = sub.groupBy("label").count().collect()
      .map(r => r.getDouble(0) -> r.getLong(1)).toMap
    valFold.count()
    Arm(spec, pipeline, sub, valFold, classCounts)
  }

  /** Fit one model on an arm with random hyperparameter search (searchK
    * configs; the config with the best validation score wins). Falls back
    * to a majority-class predictor on degenerate arms or failed fits.
    */
  def fitModel(arm: Arm, adapter: ModelAdapter, metric: String,
               split: Int, seed: Int, cfg: RunConfig): Fitted = {
    val majority: Double =
      if (arm.classCounts.isEmpty) 0.0
      else arm.classCounts.maxBy { case (l, n) => (n, -l) }._1
    def constant: Fitted = {
      val fn = (df: DataFrame) => df.withColumn("prediction", lit(majority))
      Fitted(Evaluate.score(fn(arm.valFold), metric), raw => fn(arm.pipeline.transform(raw)))
    }
    if (arm.classCounts.size < 2 || arm.classCounts.values.sum < 8) return constant

    val rng = new Random(Gen.seedMix(arm.spec.name, adapter.name, split, seed))
    val configs =
      if (cfg.searchK <= 1) Seq(adapter.defaults)
      else (0 until cfg.searchK).map(_ => adapter.sample(rng))
    val modelSeed = split.toLong * 7919 + seed * 131 + adapter.name.hashCode

    val fitted = configs.flatMap { params =>
      Try {
        val fn = adapter.fit(arm.sub, params, modelSeed)
        val v  = Evaluate.score(fn(arm.valFold), metric)
        Fitted(v, raw => fn(arm.pipeline.transform(raw)))
      }.toOption
    }
    if (fitted.isEmpty) constant
    else fitted.maxBy(_.valScore)
  }

  private object Gen {
    def seedMix(parts: Any*): Long =
      parts.foldLeft(1125899906842597L)((h, p) => 31 * h + p.hashCode())
  }

  /** Test-set score of a fitted model on raw test rows. */
  def evalOn(f: Fitted, testRaw: DataFrame, metric: String): Double =
    Evaluate.score(f.predict(testRaw), metric)

  /** Run one cell: all methods × scenarios × models × seeds at one split. */
  def runCell(ds: BenchDataset, error: ErrorType, variant: String,
              full: DataFrame, split: Int, cfg: RunConfig): Seq[Measurement] = {
    val spec   = ds.spec
    val dsName = ds.relName(error, variant)
    val metric = spec.metric
    val cached = ArrayBuffer.empty[DataFrame]
    val out    = ArrayBuffer.empty[Measurement]
    try {
      val (trainRaw0, testRaw0) = Splits.trainTest(full, split)
      val trainRaw = trainRaw0.cache(); val testRaw = testRaw0.cache()
      cached += trainRaw; cached += testRaw
      trainRaw.count(); testRaw.count()
      val models = cfg.models.map(Models.byName)
      val cleaners = CleaningMethods.forError(error).filter(c =>
        cfg.methodFilter.forall(_.contains((c.method.detect, c.method.repair))))

      error match {
        case MissingValues =>
          // Table 5 semantics: B = deletion-trained, D = imputation-trained,
          // both evaluated on the method's imputed test set; scenario BD only.
          val (delTrain, _) = clean.MissingValues.Deletion.clean(spec, trainRaw, testRaw)
          val armB = buildArm(spec, delTrain, split, cached)
          val arms = cleaners.map { c =>
            val (trC0, teC) = c.clean(spec, trainRaw, testRaw)
            // Cache the cleaned train: the feature pipeline makes several
            // passes over it, and the cleaning transforms (iforest UDFs,
            // per-cell repairs) are expensive to recompute.
            val trC = trC0.cache(); cached += trC
            val teCached = teC.cache(); cached += teCached; teCached.count()
            (c.method, buildArm(spec, trC, split, cached), teCached)
          }
          for (m <- models; seed <- 0 until cfg.seeds) {
            val fB = fitModel(armB, m, metric, split, seed, cfg)
            arms.foreach { case (method, armD, teC) =>
              val fD = fitModel(armD, m, metric, split, seed, cfg)
              out += Measurement(dsName, error.name, method.detect, method.repair,
                Scenario.BD.name, m.name, split, seed,
                fB.valScore, evalOn(fB, teC, metric),
                fD.valScore, evalOn(fD, teC, metric))
            }
          }

        case _ =>
          val armDirty = buildArm(spec, trainRaw, split, cached)
          val arms = cleaners.map { c =>
            val (trC0, teC) = c.clean(spec, trainRaw, testRaw)
            val trC = trC0.cache(); cached += trC
            val teCached = teC.cache(); cached += teCached; teCached.count()
            (c.method, buildArm(spec, trC, split, cached), teCached)
          }
          for (m <- models; seed <- 0 until cfg.seeds) {
            val fDirty = fitModel(armDirty, m, metric, split, seed, cfg)
            arms.foreach { case (method, armC, teC) =>
              val fClean = fitModel(armC, m, metric, split, seed, cfg)
              val cleanOnCleanTest = evalOn(fClean, teC, metric)
              out += Measurement(dsName, error.name, method.detect, method.repair,
                Scenario.BD.name, m.name, split, seed,
                fDirty.valScore, evalOn(fDirty, teC, metric),
                fClean.valScore, cleanOnCleanTest)
              out += Measurement(dsName, error.name, method.detect, method.repair,
                Scenario.CD.name, m.name, split, seed,
                fClean.valScore, evalOn(fClean, testRaw, metric),
                fClean.valScore, cleanOnCleanTest)
            }
          }
      }
      out.toSeq
    } finally {
      cached.foreach(_.unpersist(blocking = false))
    }
  }

  // Local aliases to keep the match arms readable.
  private object clean {
    val MissingValues = repro.clean.MissingValues
  }
}

package repro.core

import repro.clean.CleaningMethods
import repro.core.ErrorType._
import repro.data.{BenchDataset, Datasets}

/** Enumeration of the benchmark's experiment specifications (paper §4).
  *
  * With all seven models the counts reproduce the paper exactly:
  * |R1| = 1330, |R2| = 190, |R3| = 50 specifications — i.e. 3990 / 570 /
  * 150 hypotheses at three t-tests each (§4.3).
  */
object Specs {

  final case class R1Spec(dataset: String, error: String, detect: String,
                          repair: String, model: String, scenario: String)
  final case class R2Spec(dataset: String, error: String, detect: String,
                          repair: String, scenario: String)
  final case class R3Spec(dataset: String, error: String, scenario: String)

  /** Scenarios per error type: missing values are BD-only (paper §3.4). */
  def scenariosFor(e: ErrorType): Seq[Scenario] =
    if (e == MissingValues) Seq(Scenario.BD) else Scenario.all

  /** (dataset, error, variant) cells of the benchmark grid. */
  def cells(errors: Set[ErrorType],
            datasets: Seq[BenchDataset] = Datasets.all): Seq[(BenchDataset, ErrorType, String)] =
    for {
      ds <- datasets
      e  <- ErrorType.all if errors.contains(e) && ds.spec.errors.contains(e)
      v  <- if (e == Mislabels) MislabelVariants.all else Seq("")
    } yield (ds, e, v)

  def r1(models: Seq[String] = RunConfig.AllModels,
         errors: Set[ErrorType] = ErrorType.all.toSet,
         datasets: Seq[BenchDataset] = Datasets.all): Seq[R1Spec] =
    for {
      (ds, e, v) <- cells(errors, datasets)
      c  <- CleaningMethods.forError(e)
      sc <- scenariosFor(e)
      m  <- models
    } yield R1Spec(ds.relName(e, v), e.name, c.method.detect, c.method.repair, m, sc.name)

  def r2(errors: Set[ErrorType] = ErrorType.all.toSet,
         datasets: Seq[BenchDataset] = Datasets.all): Seq[R2Spec] =
    r1(Seq("_"), errors, datasets)
      .map(s => R2Spec(s.dataset, s.error, s.detect, s.repair, s.scenario)).distinct

  def r3(errors: Set[ErrorType] = ErrorType.all.toSet,
         datasets: Seq[BenchDataset] = Datasets.all): Seq[R3Spec] =
    r2(errors, datasets).map(s => R3Spec(s.dataset, s.error, s.scenario)).distinct
}

package repro.data

import scala.collection.mutable.ArrayBuffer

import repro.data.Gen.{MRow, Rng}

/** Error-injection utilities. Each function takes the clean rows and
  * returns rows with one error type injected; the injection mechanisms are
  * chosen to match the paper's documented dataset properties (DESIGN.md §5).
  */
object Inject {

  /** Missing-cell injection (MCAR per cell). */
  def missingCells(rows: IndexedSeq[MRow], cols: Seq[String], rate: Double,
                   rng: Rng): IndexedSeq[MRow] = {
    rows.foreach { r =>
      cols.foreach { c => if (rng.bern(rate)) r(c) = null }
    }
    rows
  }

  /** Row-level missingness coupled with label noise: a fraction of rows is
    * "doubly dirty" — their `cols` go missing AND their label flips with
    * probability `flipProb`. This is the USCensus-analog mechanism that
    * makes deletion beat imputation (deleting removes the noisy labels).
    */
  def missingRowsWithLabelNoise(rows: IndexedSeq[MRow], cols: Seq[String],
                                rowRate: Double, flipProb: Double,
                                rng: Rng): IndexedSeq[MRow] = {
    rows.foreach { r =>
      if (rng.bern(rowRate)) {
        cols.foreach(c => r(c) = null)
        if (rng.bern(flipProb)) {
          val l = r("label").asInstanceOf[Double]
          r("label") = 1.0 - l
          // label_gt intentionally NOT updated: this is dirtiness in the
          // wild, not the mislabel experiment — no cleaner sees it.
        }
      }
    }
    rows
  }

  /** Corruption outliers: multiply a fraction of cells by `factor`
    * (scale/unit errors). The corrupted value replaces the true one, so no
    * ground truth survives — exactly the paper's "real errors" setting.
    */
  def corruptionOutliers(rows: IndexedSeq[MRow], cols: Seq[String],
                         cellRate: Double, factor: Double,
                         rng: Rng): IndexedSeq[MRow] = {
    rows.foreach { r =>
      cols.foreach { c =>
        r.get(c) match {
          case Some(d: Double) if rng.bern(cellRate) =>
            r(c) = d * factor + math.signum(factor) * 1.0
          case _ => ()
        }
      }
    }
    rows
  }

  /** Duplicate injection: appends `rate * n` copies of existing rows,
    * sharing the entity key. `jitterFrac` scales per-column Gaussian jitter
    * (in units of the column's stddev) applied to numeric features of the
    * copies — 0 gives exact copies, >0 makes duplicates act like noisy but
    * valid extra samples. `biasClass` concentrates duplication on one label
    * value with weight `biasWeight`.
    *
    * Label-noise knobs model sloppy re-entry, giving dedup real effects:
    *   - `sourceLabelNoise`: the FIRST record of a duplicated entity keeps a
    *     wrong label while its re-entries are correct — keep-first dedup
    *     then deletes the correcting copies (negative impact, Movie).
    *   - `copyLabelNoise`: re-entered copies carry wrong labels — dedup
    *     removes the noise (positive impact, Restaurant).
    */
  def duplicates(rows: IndexedSeq[MRow], numericCols: Seq[String],
                 rate: Double, jitterFrac: Double,
                 biasClass: Option[Double], biasWeight: Double,
                 rng: Rng, sourceLabelNoise: Double = 0.0,
                 copyLabelNoise: Double = 0.0): IndexedSeq[MRow] = {
    val n    = rows.size
    val nDup = math.round(rate * n).toInt
    val sds  = numericCols.map(c => c -> Gen.stddev(Gen.numericValues(rows, c))).toMap
    val weights = rows.map { r =>
      biasClass match {
        case Some(cls) if r("label") == cls => biasWeight
        case Some(_)                        => 1.0
        case None                           => 1.0
      }
    }
    val cum = weights.scanLeft(0.0)(_ + _).tail
    val total = cum.last
    var nextRid = rows.map(_("rid").asInstanceOf[Long]).max + 1
    val out = ArrayBuffer(rows: _*)
    val flippedSources = scala.collection.mutable.Set.empty[Int]
    (0 until nDup).foreach { _ =>
      val u   = rng.r.nextDouble() * total
      val idx = cum.indexWhere(_ >= u) match { case -1 => n - 1; case i => i }
      val src = rows(idx)
      val copy = Gen.newRow()
      src.foreach { case (k, v) => copy(k) = v }
      copy("rid") = nextRid
      nextRid += 1
      // Copies always carry the entity's true label; noise is applied on
      // top of it per the knobs below.
      copy("label") = src("label_gt")
      if (jitterFrac > 0) {
        numericCols.foreach { c =>
          copy.get(c) match {
            case Some(d: Double) => copy(c) = d + rng.gaussian(0, jitterFrac * sds(c))
            case _               => ()
          }
        }
      }
      if (copyLabelNoise > 0 && rng.bern(copyLabelNoise)) {
        copy("label") = 1.0 - copy("label").asInstanceOf[Double]
      }
      if (sourceLabelNoise > 0 && !flippedSources.contains(idx) && rng.bern(sourceLabelNoise)) {
        flippedSources += idx
        src("label") = 1.0 - src("label_gt").asInstanceOf[Double]
      }
      out += copy
    }
    out.toIndexedSeq
  }

  /** Inconsistency injection: replaces a fraction of values in `col` with a
    * random variant spelling. Variants are case/punctuation/token-order
    * mutations of the canonical value so the fingerprint cleaner can
    * rediscover the clusters.
    */
  def inconsistencies(rows: IndexedSeq[MRow], col: String,
                      variants: Map[String, Seq[String]], rate: Double,
                      rng: Rng): IndexedSeq[MRow] = {
    rows.foreach { r =>
      r.get(col) match {
        case Some(v: String) if variants.contains(v) && rng.bern(rate) =>
          r(col) = rng.pick(variants(v))
        case _ => ()
      }
    }
    rows
  }

  /** Mislabel injection per paper §3.1.5: `variant` is "uniform" (flip 5%
    * in each class), "major" (flip 5% of the majority-class labels), or
    * "minor" (flip 5% of the minority-class labels). `label_gt` keeps the
    * true label, which the ground-truth cleaner uses for repair.
    */
  def mislabels(rows: IndexedSeq[MRow], variant: String, rng: Rng,
                rate: Double = 0.05): IndexedSeq[MRow] = {
    val byClass  = rows.groupBy(_("label").asInstanceOf[Double])
    val counts   = byClass.view.mapValues(_.size).toMap
    val majority = counts.maxBy(_._2)._1
    val minority = counts.minBy(_._2)._1
    val targets: Seq[Double] = variant match {
      case "uniform" => counts.keys.toSeq
      case "major"   => Seq(majority)
      case "minor"   => Seq(minority)
      case other     => sys.error(s"unknown mislabel variant: $other")
    }
    targets.foreach { cls =>
      val members = byClass(cls)
      val nFlip   = math.max(1, math.round(rate * members.size).toInt)
      rng.r.shuffle(members.indices.toList).take(nFlip).foreach { i =>
        members(i)("label") = 1.0 - cls
      }
    }
    rows
  }
}

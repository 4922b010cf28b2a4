package repro.ml

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._
import repro.data.Datasets.CatCol

/** Fits featurizers and trains whole pipelines, mirroring the paper's
  * sklearn training setup (§7): numeric inputs standard-scaled, categorical
  * inputs one-hot encoded over their full domain, then a traditional model;
  * trained over a sample of the (unscaled) dataset.
  */
object PipelineTrainer {

  sealed trait ModelKind
  object ModelKind {
    final case class LR(alpha: Double = 0.001) extends ModelKind
    final case class DT(maxDepth: Int = 8) extends ModelKind
    final case class RF(nTrees: Int = 10, maxDepth: Int = 8) extends ModelKind
    final case class GB(nTrees: Int = 20, maxDepth: Int = 3) extends ModelKind
  }

  /** Fit StandardScaler parameters from data; OHE domains come from the spec. */
  def fitOps(train: DataFrame, numeric: Seq[String], categorical: Seq[CatCol]): Vector[FeatOp] = {
    val scaleOps: Vector[FeatOp] =
      if (numeric.isEmpty) Vector.empty
      else {
        val aggs = numeric.flatMap(c =>
          Seq(avg(col(c)).as(s"m_$c"), stddev_pop(col(c)).as(s"s_$c")))
        val row = train.agg(aggs.head, aggs.tail: _*).collect()(0)
        numeric.zipWithIndex.map { case (c, i) =>
          val mean = row.getDouble(2 * i)
          val std  = row.getDouble(2 * i + 1)
          ScaleOp(c, mean, if (std > 1e-12) 1.0 / std else 1.0)
        }.toVector
      }
    val oheOps: Vector[FeatOp] = categorical.map(cc => OneHotOp(cc.name, cc.domain)).toVector
    scaleOps ++ oheOps
  }

  /** Collect and featurize a training sample to a dense matrix on the driver
    * (the paper trains offline in sklearn; training is not the measured path).
    */
  def collectMatrix(
      train: DataFrame,
      ops: Vector[FeatOp],
      labelCol: String,
      maxRows: Int,
  ): (Array[Array[Double]], Array[Double]) = {
    val probe  = Pipeline(ops, LinearModel(Vector.fill(ops.map(_.width).sum)(0.0), 0.0))
    val cols   = probe.inputCols
    val rows   = train.select((cols :+ labelCol).map(col): _*).limit(maxRows).collect()
    val colIdx = cols.zipWithIndex.toMap
    val x = new Array[Array[Double]](rows.length)
    val y = new Array[Double](rows.length)
    var i = 0
    while (i < rows.length) {
      val r = rows(i)
      val vals = new Array[Any](cols.size)
      var j = 0
      while (j < cols.size) { vals(j) = r.get(j); j += 1 }
      x(i) = probe.featurizeWith(vals, colIdx)
      y(i) = r.get(cols.size) match {
        case n: java.lang.Number => n.doubleValue()
        case other               => other.toString.toDouble
      }
      i += 1
    }
    (x, y)
  }

  /** Train a full pipeline on a DataFrame sample. */
  def train(
      trainDf: DataFrame,
      numeric: Seq[String],
      categorical: Seq[CatCol],
      labelCol: String,
      kind: ModelKind,
      maxRows: Int = 20000,
  ): Pipeline = {
    val ops = fitOps(trainDf, numeric, categorical)
    val (x, y) = collectMatrix(trainDf, ops, labelCol, maxRows)
    val model: Model = kind match {
      case ModelKind.LR(alpha)      => Logistic.train(x, y, Logistic.Params(alpha = alpha))
      case ModelKind.DT(d)          => Cart.trainClassifier(x, y, maxDepth = d)
      case ModelKind.RF(n, d)       => Forest.train(x, y, Forest.Params(nTrees = n, maxDepth = d))
      case ModelKind.GB(n, d)       => Boosting.train(x, y, Boosting.Params(nTrees = n, maxDepth = d))
    }
    Pipeline(ops, model)
  }
}

package repro.baselines

import org.apache.spark.ml.{Pipeline => MlPipeline, PipelineModel}
import org.apache.spark.ml.classification.{DecisionTreeClassifier, GBTClassifier, LogisticRegression}
import org.apache.spark.ml.feature.{OneHotEncoder, StandardScaler, StringIndexer, VectorAssembler}
import org.apache.spark.sql.DataFrame
import repro.ml.PipelineTrainer.ModelKind

/** The paper's SparkML comparison system (§7.1.1): a genuine Spark MLlib
  * pipeline "with the same operators and settings as the scikit-learn
  * pipelines" — StringIndexer + OneHotEncoder for categoricals,
  * VectorAssembler + StandardScaler for numerics, then the matching
  * classifier. Trained on a sample, scored distributed.
  */
object SparkMlBaseline {

  def fit(
      train: DataFrame,
      numeric: Seq[String],
      categorical: Seq[String],
      labelCol: String,
      kind: ModelKind,
  ): PipelineModel = {
    val stages = scala.collection.mutable.ArrayBuffer.empty[org.apache.spark.ml.PipelineStage]
    val catVecs = categorical.map { c =>
      stages += new StringIndexer().setInputCol(c).setOutputCol(s"${c}_idx").setHandleInvalid("keep")
      stages += new OneHotEncoder().setInputCol(s"${c}_idx").setOutputCol(s"${c}_oh")
      s"${c}_oh"
    }
    val numVec: Seq[String] =
      if (numeric.isEmpty) Seq.empty
      else {
        stages += new VectorAssembler().setInputCols(numeric.toArray).setOutputCol("num_vec")
        stages += new StandardScaler().setInputCol("num_vec").setOutputCol("num_scaled")
        Seq("num_scaled")
      }
    stages += new VectorAssembler()
      .setInputCols((numVec ++ catVecs).toArray).setOutputCol("features")
    stages += (kind match {
      case ModelKind.LR(_)    =>
        new LogisticRegression().setFeaturesCol("features").setLabelCol(labelCol)
          .setRegParam(0.001).setElasticNetParam(1.0)
      case ModelKind.DT(d)    =>
        new DecisionTreeClassifier().setFeaturesCol("features").setLabelCol(labelCol).setMaxDepth(d)
      case ModelKind.RF(n, d) =>
        new org.apache.spark.ml.classification.RandomForestClassifier()
          .setFeaturesCol("features").setLabelCol(labelCol).setNumTrees(n).setMaxDepth(d)
      case ModelKind.GB(n, d) =>
        new GBTClassifier().setFeaturesCol("features").setLabelCol(labelCol)
          .setMaxIter(n).setMaxDepth(d)
    })
    new MlPipeline().setStages(stages.toArray).fit(train)
  }

  /** Score and return a DataFrame with MLlib's `prediction` column. */
  def predict(model: PipelineModel, df: DataFrame): DataFrame = model.transform(df)
}

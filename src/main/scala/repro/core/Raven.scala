package repro.core

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.dnn.DnnRuntime
import repro.mlruntime.MlRuntime

/** One equi-join edge of a prediction query: `left.leftKey = right.rightKey`. */
final case class JoinSpec(left: String, leftKey: String, right: String, rightKey: String)

/** A batch prediction query (paper Fig. 2): relational data processing
  * (scans, joins, WHERE predicates) feeding a trained pipeline through a
  * PREDICT invocation, optionally filtered on the prediction.
  *
  * @param refIntegrity when true, every fact key matches exactly one dim row
  *                     (PK-FK), so a join whose payload is fully pruned can
  *                     be eliminated without changing cardinality.
  */
final case class PredictionQuery(
    tables: Map[String, DataFrame],
    fact: String,
    joins: Seq[JoinSpec],
    predicates: Seq[ColPredicate],
    pipeline: Pipeline,
    outputPredicate: Option[OutputPredicate] = None,
    refIntegrity: Boolean = true,
    /** Non-feature columns the query's SELECT list retains (e.g. row ids). */
    passthrough: Seq[String] = Seq.empty,
)

/** Raven optimizer configuration: which rule families are enabled and how the
  * physical variant is chosen (fixed for micro-experiments, or one of the
  * §5.2 data-driven strategies).
  */
final case class RavenConfig(
    /** Predicate-based model pruning (§4.1, data-to-model). */
    predicatePruning: Boolean = true,
    /** Model-projection pushdown (§4.1, model-to-data). */
    projectionPushdown: Boolean = true,
    strategy: Strategy = FixedStrategy(PhysicalChoice.NoTransform),
    /** Simulated-GPU execution for MLtoDNN (paper §7.3). */
    dnnOnGpu: Boolean = false,
    batchSize: Int = MlRuntime.DefaultBatchSize,
    runtimeStyle: MlRuntime.Style = MlRuntime.Style.Ort,
) {
  def crossOptimizations: Boolean = predicatePruning || projectionPushdown
}

object RavenConfig {
  /** Raven (no-opt) baseline: black-box UDF over the unmodified pipeline. */
  val NoOpt: RavenConfig =
    RavenConfig(predicatePruning = false, projectionPushdown = false)
}

/** The optimized form of a query, before execution. */
final case class OptimizedPlan(
    pipeline: Pipeline,
    choice: PhysicalChoice,
    /** Input columns the pipeline no longer needs (pruned by the logical
      * optimizations); Raven projects them out below the joins.
      */
    prunedInputs: Set[String],
    /** Joins eliminated because every payload column of the dim was pruned. */
    droppedJoins: Seq[JoinSpec],
    /** Whether an output predicate got fused into the model. */
    fusedOutputPredicate: Boolean,
)

/** The Raven co-optimizer and executor (paper §5.2, §6): applies the logical
  * optimizations in strict order (predicate-based pruning, then
  * model-projection pushdown — the former enables the latter), then picks the
  * physical variant via the configured strategy, and builds the final Spark
  * plan (Catalyst further optimizes it, as in the paper where Raven runs
  * before the engine optimizer).
  */
object Raven {

  def optimize(q: PredictionQuery, config: RavenConfig): OptimizedPlan = {
    if (!config.crossOptimizations)
      // no logical opts; the strategy still picks the runtime (this is the
      // "MLtoSQL alone" configuration of the §7.2 micro-experiments)
      return OptimizedPlan(q.pipeline, config.strategy.choose(q.pipeline),
        Set.empty, Seq.empty, fusedOutputPredicate = false)

    // 1. predicate-based model pruning (always beneficial; applied first)
    val pruned =
      if (config.predicatePruning) ModelPruning(q.pipeline, q.predicates)
      else ModelPruning.Result(q.pipeline, Set.empty)
    // 1b. output-predicate fusion for single trees
    val (afterOut, fused) = q.outputPredicate match {
      case Some(op) if config.predicatePruning =>
        pruned.pipeline.model match {
          case te: TreeEnsembleModel =>
            ModelPruning.fuseOutputPredicate(te, op) match {
              case Some(m) => (pruned.pipeline.copy(model = m), true)
              case None    => (pruned.pipeline, false)
            }
          case _ => (pruned.pipeline, false)
        }
      case _ => (pruned.pipeline, false)
    }
    // 2. model-projection pushdown
    val pushed =
      if (config.projectionPushdown) ProjectionPushdown(afterOut)
      else ProjectionPushdown.Result(afterOut, Set.empty)
    val prunedCols = pruned.constantInputs ++ pushed.droppedInputs

    // joins whose dim payload is fully pruned can be dropped under RI
    val needed = pushed.pipeline.inputCols.toSet ++ q.predicates.map(_.col)
    val droppedJoins =
      if (!q.refIntegrity) Seq.empty
      else q.joins.filter { j =>
        val dimCols = q.tables(j.right).columns.toSet - j.rightKey
        dimCols.intersect(needed).isEmpty
      }

    // 3. logical-to-physical: strategy picks the runtime
    val choice = config.strategy.choose(pushed.pipeline)
    OptimizedPlan(pushed.pipeline, choice, prunedCols, droppedJoins, fused)
  }

  /** Build the relational part: scans (with Raven's pushed-down projections),
    * joins (minus eliminated ones), and WHERE filters.
    */
  def relationalPlan(q: PredictionQuery, plan: OptimizedPlan): DataFrame = {
    val needed: Set[String] =
      plan.pipeline.inputCols.toSet ++ q.predicates.map(_.col) ++ q.passthrough ++
        q.joins.diff(plan.droppedJoins).flatMap(j => Seq(j.leftKey, j.rightKey))

    def scan(t: String): DataFrame = {
      val df = q.tables(t)
      val keep = df.columns.filter(needed.contains)
      if (keep.isEmpty) df else df.select(keep.map(col).toSeq: _*)
    }

    var df = scan(q.fact)
    q.joins.foreach { j =>
      if (!plan.droppedJoins.contains(j)) {
        val dim = scan(j.right)
        df =
          if (j.leftKey == j.rightKey) df.join(dim, Seq(j.leftKey))
          else df.join(dim, col(j.leftKey) === col(j.rightKey)).drop(j.rightKey)
      }
    }
    q.predicates.foldLeft(df)((d, p) => d.filter(predicateColumn(p)))
  }

  def predicateColumn(p: ColPredicate): Column = p match {
    case EqString(c, v)      => col(c) === v
    case EqNum(c, v)         => col(c) === v
    case RangeNum(c, lo, hi) => col(c) >= lo && col(c) <= hi
  }

  /** Execute the full prediction query; returns a DataFrame with a
    * `prediction` column (post output-filter if one was given).
    */
  def execute(
      q: PredictionQuery,
      spark: SparkSession,
      config: RavenConfig,
      dnnMetrics: Option[DnnRuntime.Metrics] = None,
  ): DataFrame = {
    val plan = optimize(q, config)
    val rel  = relationalPlan(q, plan)
    val withPred = plan.choice match {
      case PhysicalChoice.MLtoSQL =>
        rel.withColumn("prediction", MLtoSQL.classifyColumn(plan.pipeline))
      case PhysicalChoice.MLtoDNN =>
        val m = dnnMetrics.getOrElse(DnnRuntime.newMetrics(spark))
        DnnRuntime.predict(rel, plan.pipeline, m, config.batchSize)
      case PhysicalChoice.NoTransform =>
        MlRuntime.predict(rel, plan.pipeline, config.runtimeStyle, config.batchSize)
    }
    q.outputPredicate match {
      case None => withPred
      case Some(op) =>
        if (plan.fusedOutputPredicate)
          // the fused model returns 1.0 iff the row satisfies the predicate;
          // the surviving rows' prediction is the constant predicate class
          withPred.filter(col("prediction") === 1.0)
            .withColumn("prediction", lit(op.predictedClass))
        else withPred.filter(col("prediction") === op.predictedClass)
    }
  }
}

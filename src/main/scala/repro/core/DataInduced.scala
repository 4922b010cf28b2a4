package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Data-induced optimizations (paper §4.2).
  *
  * Raven exploits stored data statistics — min/max per numeric column,
  * distinct values per categorical column — to *induce* predicates that were
  * never written in the query, then feeds them into the same cross-
  * optimization machinery: a tree whose root tests `age > 60` can drop a
  * whole subtree if the data contains no row with `age <= 60`.
  *
  * Taking it a step further, when data is partitioned, Raven compiles one
  * optimized model per partition from that partition's statistics.
  */
object DataInduced {

  /** Column statistics: numeric [min,max]; categorical distinct values. */
  final case class ColumnStats(
      numeric: Map[String, Interval],
      categorical: Map[String, Set[String]],
  ) {
    /** Induced predicates in the cross-optimization predicate algebra. */
    def inducedPredicates: Seq[ColPredicate] = {
      val nums = numeric.toSeq.map { case (c, iv) => RangeNum(c, iv.lo, iv.hi) }
      val cats = categorical.toSeq.collect {
        case (c, vs) if vs.size == 1 => EqString(c, vs.head)
      }
      nums ++ cats
    }
  }

  /** Compute stats for the given columns of a DataFrame. */
  def computeStats(
      df: DataFrame,
      numericCols: Seq[String],
      categoricalCols: Seq[String],
  ): ColumnStats = {
    val numeric: Map[String, Interval] =
      if (numericCols.isEmpty) Map.empty
      else {
        val aggs = numericCols.flatMap(c =>
          Seq(min(col(c)).cast("double").as(s"min_$c"), max(col(c)).cast("double").as(s"max_$c")))
        val row = df.agg(aggs.head, aggs.tail: _*).collect()(0)
        numericCols.zipWithIndex.map { case (c, i) =>
          c -> Interval(row.getDouble(2 * i), row.getDouble(2 * i + 1))
        }.toMap
      }
    val categorical: Map[String, Set[String]] =
      categoricalCols.map { c =>
        // distinct-set stats are only useful when small; cap the collect
        val vs = df.select(col(c)).distinct().limit(64).collect().map(_.get(0).toString).toSet
        c -> vs
      }.toMap
    ColumnStats(numeric, categorical)
  }

  /** Optimize a pipeline for one stats snapshot: induce predicates, prune the
    * model, then run model-projection pushdown (the paper's note that data-
    * induced predicates compose with the other cross-optimizations).
    */
  def optimizeForStats(pipeline: Pipeline, stats: ColumnStats): ProjectionPushdown.Result = {
    val pruned = ModelPruning(pipeline, stats.inducedPredicates)
    ProjectionPushdown(pruned.pipeline)
  }

  /** One optimized model per partition of `partitionCol` (paper: "Raven
    * compiles an optimized model for each partition, leveraging the data
    * distribution of that partition").
    *
    * @return partition value -> (optimized pipeline, dropped input columns)
    */
  def perPartitionModels(
      df: DataFrame,
      partitionCol: String,
      numericCols: Seq[String],
      categoricalCols: Seq[String],
      pipeline: Pipeline,
  ): Map[String, ProjectionPushdown.Result] = {
    val statCols = numericCols.filter(pipeline.inputCols.contains)
    val catCols  = categoricalCols.filter(pipeline.inputCols.contains)
    val aggs = statCols.flatMap(c =>
      Seq(min(col(c)).cast("double").as(s"min_$c"), max(col(c)).cast("double").as(s"max_$c")))
    require(aggs.nonEmpty || catCols.nonEmpty, "no stats columns overlap the pipeline inputs")
    val grouped =
      if (aggs.nonEmpty) df.groupBy(col(partitionCol)).agg(aggs.head, aggs.tail: _*).collect()
      else df.select(col(partitionCol)).distinct().collect()
    grouped.map { row =>
      val pv = String.valueOf(row.get(0))
      val numeric = statCols.zipWithIndex.map { case (c, i) =>
        c -> Interval(row.getDouble(1 + 2 * i), row.getDouble(2 + 2 * i))
      }.toMap
      // the partition column itself is pinned within its partition
      val catStats: Map[String, Set[String]] =
        if (catCols.contains(partitionCol)) Map(partitionCol -> Set(pv)) else Map.empty
      pv -> optimizeForStats(pipeline, ColumnStats(numeric, catStats))
    }.toMap
  }

  /** Average number of input columns pruned across partition models — the
    * metric of paper Table 2.
    */
  def avgPrunedColumns(original: Pipeline, perPartition: Map[String, ProjectionPushdown.Result]): Double =
    if (perPartition.isEmpty) 0.0
    else perPartition.values.map(r => (original.inputCols.toSet diff r.pipeline.inputCols.toSet).size).sum.toDouble /
      perPartition.size
}

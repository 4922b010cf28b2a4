package repro.core

import scala.util.Random

/** Shared fixtures for core tests: small hand-built pipelines mirroring the
  * paper's running example (Fig. 2/3), and random-row generators.
  */
object TestFixtures {

  /** A hospital-like pipeline: 2 scaled numerics + 2 categoricals, tree model.
    * Encoded layout: 0=age(scaled), 1=bpm(scaled), 2..3=asthma(v0,v1),
    * 4..6=rcount(v0,v1,v2).
    */
  def covidTreePipeline: Pipeline = {
    val ops: Vector[FeatOp] = Vector(
      ScaleOp("age", 40.0, 0.1),
      ScaleOp("bpm", 80.0, 0.05),
      OneHotOp("asthma", Vector("v0", "v1")),
      OneHotOp("rcount", Vector("v0", "v1", "v2")),
    )
    // root tests scaled age; left tests asthma=v1; right tests rcount=v2
    val tree = Split(0, 2.0, // age <= 60
      Split(3, 0.5, Leaf(0.1), Leaf(0.9)),   // asthma_v1 <= 0.5 ? low : high
      Split(6, 0.5, Leaf(0.2), Leaf(0.8)))   // rcount_v2
    Pipeline(ops, TreeEnsembleModel(Vector(tree), EnsembleKind.SingleTree, 7))
  }

  /** Same featurizers with a linear model using only some features. */
  def covidLinearPipeline: Pipeline = {
    val ops: Vector[FeatOp] = Vector(
      ScaleOp("age", 40.0, 0.1),
      ScaleOp("bpm", 80.0, 0.05),
      OneHotOp("asthma", Vector("v0", "v1")),
      OneHotOp("rcount", Vector("v0", "v1", "v2")),
    )
    // bpm and rcount_v1 unused (zero weights) — pushdown fodder
    val w = Vector(0.8, 0.0, -0.5, 1.2, 0.3, 0.0, -0.7)
    Pipeline(ops, LinearModel(w, -0.1))
  }

  /** Random input row for a pipeline, as (values in inputCols order). */
  def randomRow(p: Pipeline, rng: Random): Array[Any] = {
    val byCol: Map[String, FeatOp] = p.ops.map(op => op.col -> op).toMap
    p.inputCols.map { c =>
      byCol(c) match {
        case OneHotOp(_, cats) => cats(rng.nextInt(cats.size)): Any
        case _                 => (rng.nextDouble() * 100 - 20): Any
      }
    }.toArray
  }

  /** Random row satisfying the given predicates. */
  def randomRowSatisfying(p: Pipeline, preds: Seq[ColPredicate], rng: Random): Array[Any] = {
    val row = randomRow(p, rng)
    preds.foreach { pred =>
      val i = p.inputCols.indexOf(pred.col)
      if (i >= 0) pred match {
        case EqString(_, v)      => row(i) = v
        case EqNum(_, v)         => row(i) = v
        case RangeNum(_, lo, hi) =>
          val l = if (lo.isNegInfinity) -1e3 else lo
          val h = if (hi.isPosInfinity) 1e3 else hi
          row(i) = l + rng.nextDouble() * (h - l)
      }
    }
    row
  }
}

package repro.core

import java.util.concurrent.ConcurrentHashMap

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.api.java.UDF1
import org.apache.spark.sql.catalyst.expressions.{
  Attribute, Cast, CreateNamedStruct, EqualTo, Expression, GreaterThan, GreaterThanOrEqual,
  LessThan, LessThanOrEqual, Literal, ScalaUDF,
}
import org.apache.spark.sql.catalyst.plans.logical.{Filter, LogicalPlan}
import org.apache.spark.sql.catalyst.rules.Rule
import org.apache.spark.sql.functions.{col, struct, udf}
import org.apache.spark.sql.Row
import org.apache.spark.sql.types.{DoubleType, StringType}

/** Catalyst integration of the Raven optimizer (paper §6, Fig. 5).
  *
  * The paper exposes PREDICT in SparkSQL and triggers its co-optimizer from a
  * rule inside Catalyst. We reproduce the same architecture with Spark's
  * extensibility framework, no Spark source changes:
  *
  *   - [[RavenUdf.predict]] is the PREDICT surface: a registered ScalaUDF
  *     named `raven_predict:<modelId>` applied to a named struct of the
  *     pipeline's input columns (structs lift the 22-argument UDF limit,
  *     like the paper's vectorized UDF taking whole batches);
  *   - [[RavenRule]] is a `Rule[LogicalPlan]` installed via
  *     `spark.experimental.extraOptimizations`. When it finds a
  *     `raven_predict` UDF it harvests the conjunctive equality/range
  *     predicates from the plan's Filters, runs predicate-based model pruning
  *     and model-projection pushdown, and splices the chosen physical form
  *     back: the MLtoSQL Catalyst expression (so the engine sees native
  *     CASE/arithmetic and can prune scans below it), or a densified UDF
  *     over only the surviving input columns.
  */
object RavenUdf {

  private val registry = new ConcurrentHashMap[String, Pipeline]()

  /** The physical choice the rule applies; `None` keeps a (pruned) UDF. */
  @volatile var ruleChoice: PhysicalChoice = PhysicalChoice.MLtoSQL

  def register(modelId: String, pipeline: Pipeline): Unit = registry.put(modelId, pipeline)
  def lookup(modelId: String): Option[Pipeline] = Option(registry.get(modelId))

  val NamePrefix = "raven_predict:"

  /** Build the PREDICT invocation column over `df` for a registered model. */
  def predict(df: DataFrame, modelId: String): Column = {
    val pipeline = registry.get(modelId)
    require(pipeline != null, s"model $modelId not registered")
    val fields = pipeline.inputCols.map(c => col(c).as(c))
    scorer(pipeline).withName(NamePrefix + modelId)(struct(fields: _*))
  }

  /** Black-box row scorer UDF (what executes when the rule does not rewrite). */
  private[core] def scorer(p: Pipeline) = {
    val cols = p.inputCols
    udf(
      new UDF1[Row, java.lang.Double] {
        override def call(row: Row): java.lang.Double = {
          val vals = new Array[Any](cols.size)
          var i = 0
          while (i < cols.size) { vals(i) = row.get(i); i += 1 }
          if (p.scoreRow(vals) >= 0.5) 1.0 else 0.0
        }
      },
      DoubleType,
    )
  }
}

/** The co-optimizer rule; see [[RavenUdf]]. */
object RavenRule extends Rule[LogicalPlan] {

  override def apply(plan: LogicalPlan): LogicalPlan = {
    if (!plan.expressions.exists(_.exists(isRavenUdf))) return plan
    val predicates = harvestPredicates(plan)
    plan.transformAllExpressions {
      case u: ScalaUDF if isRavenUdf(u) => rewrite(u, predicates)
    }
  }

  private def isRavenUdf(e: Expression): Boolean = e match {
    case u: ScalaUDF => u.udfName.exists(_.startsWith(RavenUdf.NamePrefix))
    case _           => false
  }

  /** Conjunctive attribute-vs-literal predicates anywhere in the plan's
    * Filters (the paper's rule receives the query's WHERE predicates).
    */
  private[core] def harvestPredicates(plan: LogicalPlan): Seq[ColPredicate] = {
    val out = Seq.newBuilder[ColPredicate]
    plan.foreach {
      case Filter(cond, _) =>
        splitConjuncts(cond).foreach {
          case EqualTo(a: Attribute, Literal(v, StringType)) =>
            out += EqString(a.name, v.toString)
          case EqualTo(Literal(v, StringType), a: Attribute) =>
            out += EqString(a.name, v.toString)
          case EqualTo(a: Attribute, l @ Literal(_, t)) if t.isInstanceOf[org.apache.spark.sql.types.NumericType] =>
            out += EqNum(a.name, numOf(l))
          case GreaterThanOrEqual(a: Attribute, l @ Literal(_, _: org.apache.spark.sql.types.NumericType)) =>
            out += RangeNum(a.name, numOf(l), Double.PositiveInfinity)
          case LessThanOrEqual(a: Attribute, l @ Literal(_, _: org.apache.spark.sql.types.NumericType)) =>
            out += RangeNum(a.name, Double.NegativeInfinity, numOf(l))
          case GreaterThan(a: Attribute, l @ Literal(_, _: org.apache.spark.sql.types.NumericType)) =>
            out += RangeNum(a.name, numOf(l), Double.PositiveInfinity)
          case LessThan(a: Attribute, l @ Literal(_, _: org.apache.spark.sql.types.NumericType)) =>
            out += RangeNum(a.name, Double.NegativeInfinity, numOf(l))
          case _ => ()
        }
      case _ => ()
    }
    out.result()
  }

  private def splitConjuncts(e: Expression): Seq[Expression] = e match {
    case org.apache.spark.sql.catalyst.expressions.And(l, r) =>
      splitConjuncts(l) ++ splitConjuncts(r)
    case other => Seq(other)
  }

  private def numOf(l: Literal): Double = l.value match {
    case n: java.lang.Number => n.doubleValue()
    case other               => other.toString.toDouble
  }

  private def rewrite(u: ScalaUDF, predicates: Seq[ColPredicate]): Expression = {
    val modelId = u.udfName.get.stripPrefix(RavenUdf.NamePrefix)
    val pipeline = RavenUdf.lookup(modelId).getOrElse(return u)
    val cns = u.children match {
      case Seq(s: CreateNamedStruct) => s
      case _                         => return u
    }
    val fieldExprs: Map[String, Expression] =
      cns.names.map(_.toString).zip(cns.valExprs).toMap

    // logical optimizations, exactly as in the DataFrame path
    val pruned = ModelPruning(pipeline, predicates)
    val pushed = ProjectionPushdown(pruned.pipeline)
    val p      = pushed.pipeline

    val categorical = p.ops.collect { case OneHotOp(c, _) => c }.toSet
    def resolver(name: String): Expression = {
      val e = fieldExprs(name)
      if (categorical.contains(name)) e
      else if (e.dataType == DoubleType) e
      else Cast(e, DoubleType)
    }

    RavenUdf.ruleChoice match {
      case PhysicalChoice.MLtoSQL =>
        // native Catalyst expression referencing only the used attributes —
        // the engine's column pruning takes it from here
        SqlExpr.toCatalyst(MLtoSQL.classifyExpr(p), resolver)
      case _ =>
        // keep a UDF, but densified: fewer struct fields cross the boundary
        val keep = p.inputCols
        val newStruct = CreateNamedStruct(keep.flatMap(c =>
          Seq(Literal.create(c), fieldExprs(c))).toSeq)
        val cols = keep
        val fn = (row: Row) => {
          val vals = new Array[Any](cols.size)
          var i = 0
          while (i < cols.size) { vals(i) = row.get(i); i += 1 }
          java.lang.Double.valueOf(if (p.scoreRow(vals) >= 0.5) 1.0 else 0.0)
        }
        u.copy(function = fn, children = Seq(newStruct),
               inputEncoders = Seq(None),
               udfName = Some(RavenUdf.NamePrefix + modelId + ":densified"))
    }
  }
}

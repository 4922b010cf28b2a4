package repro.duck

import java.sql.{Connection, DriverManager}

import repro.core._

/** Single-node "SQL Server" substrate over DuckDB (substitution documented in
  * DESIGN.md): an in-process columnar engine with a cost-based optimizer and
  * intra-query parallelism, standing in for SQL Server with clustered
  * columnstore in the paper's §7.1.2 experiments.
  *
  *   - degree-of-parallelism (DOP 1 / DOP 16) maps to `SET threads`;
  *   - the *unoptimized* PREDICT path runs the relational part in DuckDB and
  *     evaluates the pipeline with the interpreter over the fetched rows
  *     (SQL Server invoking ONNX Runtime per batch);
  *   - the *Raven-optimized* path runs the whole query — MLtoSQL expression
  *     included — inside DuckDB;
  *   - [[MadlibSim]] models MADlib on PostgreSQL: single-threaded, with the
  *     featurization output materialized to a table before the model runs,
  *     and the PostgreSQL 1600-column limit enforced.
  */
object DuckEngine {

  /** Relational query shape against loaded DuckDB tables. */
  final case class RelQuery(
      fact: String,
      joins: Seq[JoinSpec],
      predicates: Seq[ColPredicate],
  )

  final case class Timing(seconds: Double, checksum: Double, rows: Long)

  def withConnection[T](f: Connection => T): T = {
    Class.forName("org.duckdb.DuckDBDriver")
    val conn = DriverManager.getConnection("jdbc:duckdb:")
    try f(conn)
    finally conn.close()
  }

  def loadParquet(conn: Connection, table: String, dir: String): Unit = {
    val st = conn.createStatement()
    try st.execute(s"CREATE OR REPLACE TABLE $table AS SELECT * FROM read_parquet('$dir/*.parquet')")
    finally st.close()
  }

  def setThreads(conn: Connection, n: Int): Unit = {
    val st = conn.createStatement()
    try st.execute(s"SET threads=$n")
    finally st.close()
  }

  def predicateSql(p: ColPredicate): String = p match {
    case EqString(c, v)      => s"$c = '${v.replace("'", "''")}'"
    case EqNum(c, v)         => s"$c = $v"
    case RangeNum(c, lo, hi) =>
      val loS = if (lo.isNegInfinity) None else Some(s"$c >= $lo")
      val hiS = if (hi.isPosInfinity) None else Some(s"$c <= $hi")
      (loS.toSeq ++ hiS.toSeq).mkString("(", " AND ", ")")
  }

  /** FROM...JOIN...WHERE clause for the query (no SELECT list). */
  def fromWhereSql(q: RelQuery): String = {
    val joins = q.joins.map { j =>
      if (j.leftKey == j.rightKey) s"JOIN ${j.right} USING (${j.leftKey})"
      else s"JOIN ${j.right} ON ${j.left}.${j.leftKey} = ${j.right}.${j.rightKey}"
    }
    val where =
      if (q.predicates.isEmpty) ""
      else " WHERE " + q.predicates.map(predicateSql).mkString(" AND ")
    s"FROM ${q.fact} " + joins.mkString(" ") + where
  }

  private def timed[T](body: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r  = body
    (r, (System.nanoTime() - t0) / 1e9)
  }

  /** Unoptimized PREDICT: relational part in the engine, pipeline evaluated
    * by the ML runtime over the fetched rows with `dop` evaluation threads.
    * Returns the paper's reported aggregate (SUM of predictions).
    */
  def unoptimizedPredict(
      conn: Connection,
      q: RelQuery,
      pipeline: Pipeline,
      dop: Int,
  ): Timing = {
    setThreads(conn, dop)
    val cols = pipeline.inputCols
    val sql  = s"SELECT ${cols.mkString(", ")} " + fromWhereSql(q)
    val ((rows, n), fetchSec) = timed {
      val st = conn.createStatement()
      try {
        val rs  = st.executeQuery(sql)
        val buf = Vector.newBuilder[Array[Any]]
        var count = 0L
        while (rs.next()) {
          val r = new Array[Any](cols.size)
          var i = 0
          while (i < cols.size) { r(i) = rs.getObject(i + 1); i += 1 }
          buf += r
          count += 1
        }
        (buf.result(), count)
      } finally st.close()
    }
    val (sum, evalSec) = timed {
      val arr = rows.toArray
      val colIdx = cols.zipWithIndex.toMap
      val partials = new Array[Double](dop)
      val threads = (0 until dop).map { t =>
        new Thread(() => {
          var s = 0.0
          var i = t
          while (i < arr.length) {
            s += (if (pipeline.model.score(pipeline.featurizeWith(arr(i), colIdx)) >= 0.5) 1.0 else 0.0)
            i += dop
          }
          partials(t) = s
        })
      }
      threads.foreach(_.start())
      threads.foreach(_.join())
      partials.sum
    }
    Timing(fetchSec + evalSec, sum, n)
  }

  /** Raven-optimized: the whole query, MLtoSQL included, inside the engine. */
  def ravenOptimized(
      conn: Connection,
      q: RelQuery,
      pipeline: Pipeline,
      dop: Int,
  ): Timing = {
    setThreads(conn, dop)
    val sql = s"SELECT SUM(prediction) AS s, COUNT(*) AS n FROM (" +
      s"SELECT ${MLtoSQL.classifySql(pipeline)} AS prediction " + fromWhereSql(q) + ")"
    val (res, sec) = timed {
      val st = conn.createStatement()
      try {
        val rs = st.executeQuery(sql)
        rs.next()
        (rs.getDouble(1), rs.getLong(2))
      } finally st.close()
    }
    Timing(sec, res._1, res._2)
  }
}

/** MADlib-on-PostgreSQL simulation; see [[DuckEngine]]. */
object MadlibSim {

  /** PostgreSQL's max columns per table — the reason the paper skips Expedia
    * and Flights for MADlib.
    */
  val MaxColumns = 1600

  /** Whether MADlib(-sim) can run this pipeline at all. */
  def supports(pipeline: Pipeline): Boolean = pipeline.encodedWidth <= MaxColumns

  /** Materialize featurization, then model-over-featurized — single-threaded. */
  def predict(
      conn: Connection,
      q: DuckEngine.RelQuery,
      pipeline: Pipeline,
  ): DuckEngine.Timing = {
    require(supports(pipeline),
      s"featurized width ${pipeline.encodedWidth} exceeds PostgreSQL's $MaxColumns-column limit")
    DuckEngine.setThreads(conn, 1)
    val t0 = System.nanoTime()
    val st = conn.createStatement()
    try {
      val selectList = MLtoSQL.featurizeSelectList(pipeline)
        .map { case (alias, e) => s"${e.render} AS $alias" }
        .mkString(", ")
      st.execute(s"CREATE OR REPLACE TEMP TABLE madlib_feat AS SELECT $selectList " +
        DuckEngine.fromWhereSql(q))
      val modelSql = MLtoSQL.classifyExprDense(pipeline.model).render
      val rs = st.executeQuery(
        s"SELECT SUM($modelSql) AS s, COUNT(*) AS n FROM madlib_feat")
      rs.next()
      val out = DuckEngine.Timing((System.nanoTime() - t0) / 1e9, rs.getDouble(1), rs.getLong(2))
      st.execute("DROP TABLE madlib_feat")
      out
    } finally st.close()
  }
}

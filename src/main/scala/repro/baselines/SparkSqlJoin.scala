package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.hypergraph.Hypergraph

/** The SparkSQL baseline (Sec. VII-A): the query is decomposed by vanilla
  * Catalyst into a sequence of distributed binary joins, shuffling
  * intermediate results between rounds — the multi-round strategy ADJ's
  * one-round evaluation is compared against.
  */
object SparkSqlJoin {

  /** SQL text for a subgraph query over an edge table: one alias per atom,
    * equality predicates tying each attribute's occurrences together, and
    * one output column per attribute.
    */
  def sql(query: Hypergraph, edgeTable: String): String = {
    val aliases = query.atoms.indices.map(i => s"e$i")
    val from    = aliases.map(a => s"$edgeTable $a").mkString(", ")
    // Each attribute id -> list of (alias, column) positions referencing it.
    val occ = for {
      (atom, i) <- query.atoms.zipWithIndex
      (attr, c) <- atom.attrs.zipWithIndex
    } yield (query.attrId(attr), s"e$i.${if (c == 0) "src" else "dst"}")
    val byAttr = occ.groupBy(_._1).view.mapValues(_.map(_._2)).toMap
    val preds = byAttr.values.flatMap { cols =>
      cols.tail.map(c => s"${cols.head} = $c")
    }
    val select = query.attributes.map { name =>
      s"${byAttr(query.attrId(name)).head} AS $name"
    }
    // No DISTINCT needed: the inputs are sets and the output binds every
    // attribute, so result tuples are unique by construction.
    val where = if (preds.isEmpty) "" else preds.mkString(" WHERE ", " AND ", "")
    s"SELECT ${select.mkString(", ")} FROM $from$where"
  }

  /** Runs the query on a graph DataFrame (columns src, dst) through plain
    * Spark SQL; result columns carry the query's attribute names.
    */
  def run(spark: SparkSession, query: Hypergraph, graph: DataFrame): DataFrame = {
    val view = s"edges_${System.nanoTime()}"
    graph.createOrReplaceTempView(view)
    spark.sql(sql(query, view))
  }
}

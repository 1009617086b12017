package repro.core.catalyst

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{SparkSession, SparkSessionExtensions}
import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.{Attribute, AttributeReference, EqualTo, Expression, UnsafeProjection}
import org.apache.spark.sql.catalyst.plans.Inner
import org.apache.spark.sql.catalyst.plans.logical.{Filter, Join, LogicalPlan, Project}
import org.apache.spark.sql.execution.{SparkPlan, SparkStrategy}
import org.apache.spark.sql.types.LongType

import repro.core.adj.Adj
import repro.core.hypergraph.{Atom, Hypergraph}

/** Catalyst planner integration: ADJ as a physical planning `Strategy`.
  *
  * The strategy recognizes a multiway equi-join — a tree of inner joins
  * (possibly under a residual Filter) whose predicates are conjunctions of
  * attribute equalities and whose leaves expose only Long columns — and
  * replaces the whole subtree with a single [[AdjJoinExec]] that runs the
  * co-optimized one-round join. Ordinary (< 3-way, non-Long, or non-equi)
  * joins are left to Spark's built-in planner.
  *
  * Wire it up either per session via
  * `spark.experimental.extraStrategies :+= AdjStrategy(spark)` or globally
  * with `spark.sql.extensions=repro.core.catalyst.AdjExtensions`.
  */
final case class AdjStrategy(session: SparkSession) extends SparkStrategy {

  override def apply(plan: LogicalPlan): Seq[SparkPlan] = {
    if (!enabled) return Nil
    flatten(plan) match {
      case Some((leaves, eqs)) if leaves.length >= 3 && eqs.nonEmpty =>
        buildExec(plan, leaves, eqs).toSeq
      case _ => Nil
    }
  }

  private def enabled: Boolean =
    session.conf.get("spark.repro.adj.enabled", "true").toBoolean

  private def strategyCfg: Adj.Config = {
    val strat = session.conf.get("spark.repro.adj.strategy", "co-optimization") match {
      case "communication-first" => Adj.CommunicationFirst
      case _                     => Adj.CoOptimization
    }
    Adj.Config(
      strategy = strat,
      samples = session.conf.get("spark.repro.adj.samples", "200").toInt,
    )
  }

  /** Flattens nested inner joins (and residual filters) into leaf plans plus
    * attribute-equality predicates; returns None on any non-conforming node.
    */
  private def flatten(plan: LogicalPlan): Option[(Vector[LogicalPlan], Vector[(Attribute, Attribute)])] =
    plan match {
      case Join(l, r, Inner, cond, _) =>
        for {
          (ll, le) <- flatten(l)
          (rl, re) <- flatten(r)
          eqs      <- cond.map(extractEqualities).getOrElse(Some(Vector.empty))
        } yield (ll ++ rl, le ++ re ++ eqs)
      case Filter(cond, child @ Join(_, _, Inner, _, _)) =>
        for {
          (ls, es) <- flatten(child)
          eqs      <- extractEqualities(cond)
        } yield (ls, es ++ eqs)
      // Column-pruning projections between joins are transparent: dropping a
      // column never changes multiplicities here because the executor emits
      // one row per full attribute binding.
      case Project(projList, child @ Join(_, _, Inner, _, _))
          if projList.forall(_.isInstanceOf[AttributeReference]) =>
        flatten(child)
      case leaf if leaf.output.nonEmpty && leaf.output.forall(_.dataType == LongType) =>
        Some((Vector(leaf), Vector.empty))
      case _ => None
    }

  private def extractEqualities(cond: Expression): Option[Vector[(Attribute, Attribute)]] = {
    def split(e: Expression): Seq[Expression] = e match {
      case org.apache.spark.sql.catalyst.expressions.And(l, r) => split(l) ++ split(r)
      case other                                               => Seq(other)
    }
    val conjuncts = split(cond)
    val pairs = conjuncts.map {
      case EqualTo(a: Attribute, b: Attribute) => Some((a, b))
      case _                                   => None
    }
    if (pairs.forall(_.isDefined)) Some(pairs.flatten.toVector) else None
  }

  /** Union-find over attribute exprIds induced by the equality predicates:
    * each class becomes one query attribute of the hypergraph.
    */
  private def buildExec(
      plan: LogicalPlan,
      leaves: Vector[LogicalPlan],
      eqs: Vector[(Attribute, Attribute)],
  ): Option[SparkPlan] = {
    val allAttrs = leaves.flatMap(_.output)
    val idx      = allAttrs.map(_.exprId).zipWithIndex.toMap
    if (idx.size != allAttrs.length) return None // duplicated exprIds — bail
    val parent = Array.tabulate(allAttrs.length)(identity)
    def find(x: Int): Int = { var r = x; while (parent(r) != r) r = parent(r); parent(x) = r; r }
    for ((a, b) <- eqs) {
      (idx.get(a.exprId), idx.get(b.exprId)) match {
        case (Some(i), Some(j)) =>
          val (ri, rj) = (find(i), find(j)); if (ri != rj) parent(ri) = rj
        case _ => return None // equality references an attribute outside the leaves
      }
    }
    // Class ids in first-appearance order, so the hypergraph's attribute ids
    // line up with the executor's ascending-attribute-id output columns.
    val classOfRoot = collection.mutable.LinkedHashMap.empty[Int, Int]
    val classOf     = allAttrs.indices.map { i =>
      classOfRoot.getOrElseUpdate(find(i), classOfRoot.size)
    }
    // A leaf binding the same class twice is a within-relation selection the
    // hypergraph cannot express — bail to the default planner.
    var off   = 0
    val atoms = leaves.zipWithIndex.map { case (leaf, li) =>
      val classes = leaf.output.indices.map(c => classOf(off + c))
      off += leaf.output.length
      if (classes.distinct.length != classes.length) return None
      Atom(s"L$li", classes.map(c => s"x$c").toVector)
    }
    val query = Hypergraph(atoms.toVector)
    // Map the matched plan's own output columns (which may be a pruned
    // subset of the leaf columns) to their attribute classes.
    val outputClasses = plan.output.map(a => classOf(idx(a.exprId))).toVector
    Some(AdjJoinExec(plan.output, outputClasses, query, leaves.map(planLater), strategyCfg))
  }
}

/** Physical operator running the ADJ pipeline for a recognized multiway
  * equi-join. Children produce the input relations; the operator output
  * mirrors the logical join's column list (one value per attribute class).
  */
final case class AdjJoinExec(
    output: Seq[Attribute],
    columnClass: Seq[Int],
    query: Hypergraph,
    children: Seq[SparkPlan],
    cfg: Adj.Config,
) extends SparkPlan {

  override protected def doExecute(): RDD[InternalRow] = {
    val spark = SparkSession.active
    val data = children.toVector.map { child =>
      child.execute().map { row =>
        val arr = new Array[Long](row.numFields)
        var i = 0
        while (i < arr.length) { arr(i) = row.getLong(i); i += 1 }
        arr
      }
    }
    val (result, report) = Adj.run(spark, query, data, cfg)
    logInfo(s"ADJ report: $report")
    // Result columns are ascending attribute id == class id; each output
    // column reads its class's value.
    val outClasses = columnClass.toArray
    val types      = output.map(_.dataType).toArray
    result.mapPartitions { it =>
      val proj = UnsafeProjection.create(types)
      it.map { t =>
        val row = InternalRow.fromSeq(outClasses.map(c => t(c)).toSeq)
        proj(row).copy()
      }
    }
  }

  override protected def withNewChildrenInternal(newChildren: IndexedSeq[SparkPlan]): SparkPlan =
    copy(children = newChildren)
}

/** `spark.sql.extensions` entry point injecting [[AdjStrategy]]. */
class AdjExtensions extends (SparkSessionExtensions => Unit) {
  override def apply(extensions: SparkSessionExtensions): Unit =
    extensions.injectPlannerStrategy(session => AdjStrategy(session))
}

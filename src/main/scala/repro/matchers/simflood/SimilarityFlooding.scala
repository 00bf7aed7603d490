package repro.matchers.simflood

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.text.Levenshtein

/** Similarity Flooding [Melnik, Garcia-Molina, Rahm — ICDE'02], schema-based.
  *
  * A relational schema becomes a directed labeled graph:
  * {{{
  *   Table --name--> Literal(tableName)
  *   Table --column--> Column
  *   Column --name--> Literal(colName)
  *   Column --type--> Type(t)
  * }}}
  * The two graphs are combined into a pairwise connectivity graph whose map
  * pairs propagate similarity to neighbors each round. We implement fixpoint
  * formula **C** — σ^{i+1} = normalize(σ⁰ + σⁱ + φ(σ⁰ + σⁱ)) — with
  * `inverse_average` propagation coefficients, the configuration in
  * Table II. Initial similarities come from Levenshtein on literal labels
  * (the paper's choice where the original left the string matcher open).
  */
final case class SimilarityFlooding(maxIters: Int = 100, epsilon: Double = 1e-4) extends Matcher {

  override val name: String = "SimilarityFlooding(inverse_average,C)"
  override val family: String = "SimilarityFlooding"
  override val matchTypes: Set[MatchType] =
    Set(MatchType.AttributeOverlap, MatchType.DataType)

  /** Graph node of one schema. */
  sealed trait Node
  case class TableNode(table: String) extends Node
  case class ColumnNode(column: String) extends Node
  case class TypeNode(tpe: String) extends Node
  case class LiteralNode(text: String) extends Node

  private case class Edge(from: Node, label: String, to: Node)

  private def schemaGraph(t: TableData): Seq[Edge] = {
    val tab = TableNode(t.name)
    Seq(Edge(tab, "name", LiteralNode(t.name))) ++
      t.columns.flatMap { c =>
        val cn = ColumnNode(c)
        Seq(
          Edge(tab, "column", cn),
          Edge(cn, "name", LiteralNode(c)),
          Edge(cn, "type", TypeNode(t.profile(c).inferredType)),
        )
      }
  }

  /** Initial similarity σ⁰ of a map pair. */
  private def sigma0(a: Node, b: Node): Double = (a, b) match {
    case (LiteralNode(x), LiteralNode(y)) => Levenshtein.similarityIgnoreCase(x, y)
    case (TypeNode(x), TypeNode(y))       => if (x == y) 1.0 else 0.0
    case (TableNode(_), TableNode(_))     => 0.1
    case _                                => 0.0
  }

  override def matchColumns(spark: SparkSession, src: TableData, tgt: TableData): Seq[ScoredMatch] = {
    val g1 = schemaGraph(src)
    val g2 = schemaGraph(tgt)

    // Pairwise connectivity graph: ((a,b) -l-> (a',b')) for matching labels.
    type MapPair = (Node, Node)
    val pcgEdges: Seq[(MapPair, String, MapPair)] = for {
      e1 <- g1
      e2 <- g2 if e1.label == e2.label
    } yield ((e1.from, e2.from), e1.label, (e1.to, e2.to))

    val nodes: Seq[MapPair] =
      (pcgEdges.flatMap(e => Seq(e._1, e._3))).distinct

    // Out-degrees per (node, label) in each original graph, for the
    // inverse_average coefficient 2 / (outdeg_l(a) + outdeg_l(b)).
    def degrees(g: Seq[Edge]): Map[(Node, String), Int] =
      g.groupBy(e => (e.from, e.label)).view.mapValues(_.size).toMap ++
        Map.empty // forward only; reverse handled below
    def degreesIn(g: Seq[Edge]): Map[(Node, String), Int] =
      g.groupBy(e => (e.to, e.label)).view.mapValues(_.size).toMap
    val out1 = degrees(g1); val out2 = degrees(g2)
    val in1 = degreesIn(g1); val in2 = degreesIn(g2)

    // Weighted propagation edges, both directions (flooding is symmetric).
    val weighted: Seq[(MapPair, MapPair, Double)] = pcgEdges.flatMap {
      case (p @ (a, b), l, q @ (a2, b2)) =>
        val fw = 2.0 / (out1.getOrElse((a, l), 1) + out2.getOrElse((b, l), 1))
        val bw = 2.0 / (in1.getOrElse((a2, l), 1) + in2.getOrElse((b2, l), 1))
        Seq((p, q, fw), (q, p, bw))
    }
    val incoming: Map[MapPair, Seq[(MapPair, Double)]] =
      weighted.groupBy(_._2).view.mapValues(_.map(e => (e._1, e._3))).toMap

    val idx = nodes.zipWithIndex.toMap
    val s0 = nodes.map { case (a, b) => sigma0(a, b) }.toArray
    var sigma = s0.clone()

    var iter = 0
    var residual = Double.MaxValue
    while (iter < maxIters && residual > epsilon) {
      val combined = Array.tabulate(nodes.size)(i => s0(i) + sigma(i))
      val next = new Array[Double](nodes.size)
      nodes.zipWithIndex.foreach { case (p, i) =>
        var acc = combined(i)
        incoming.getOrElse(p, Nil).foreach { case (q, w) => acc += combined(idx(q)) * w }
        next(i) = acc
      }
      val mx = next.max
      if (mx > 0) { var i = 0; while (i < next.length) { next(i) /= mx; i += 1 } }
      residual = math.sqrt(nodes.indices.map(i => math.pow(next(i) - sigma(i), 2)).sum)
      sigma = next
      iter += 1
    }

    val ms = nodes.zipWithIndex.collect {
      case (((ColumnNode(sc), ColumnNode(tc))), i) => ScoredMatch(sc, tc, sigma(i))
    }
    Matcher.ranked(ms)
  }
}

object SimilarityFlooding {
  /** Table II: single configuration — inverse_average coefficients, fixpoint
    * formula C.
    */
  def grid: Seq[SimilarityFlooding] = Seq(SimilarityFlooding())
  def default: SimilarityFlooding = SimilarityFlooding()
}

package repro.live

import repro.ml.StringSim
import Stores.{InvertedIndex, KVStore, Record}

/** KGQ (§4.2): the live graph query language. Expressive enough for the
  * semantics of NL queries (entity search with multi-hop traversal
  * constraints), deliberately *less* expressive than general graph query
  * languages so query cost stays bounded. Supports virtual operators:
  * complex expressions encapsulated as reusable named operators.
  *
  * Grammar:
  * {{{
  *   query  := FIND (type | *) [WHERE cond (AND cond)*] RETURN pred (, pred)* [LIMIT n]
  *   cond   := pred = "value"            exact (normalized) match
  *           | pred ~ "value"            token containment
  *           | pred -> ( cond (AND cond)* )   hop: object entity satisfies
  *           | $name("arg", ...)         virtual operator expansion
  * }}}
  */
object KGQ {

  // ---------------------------------------------------------------- AST
  sealed trait Cond
  final case class Eq(pred: String, value: String) extends Cond
  final case class Contains(pred: String, value: String) extends Cond
  final case class Hop(pred: String, sub: Seq[Cond]) extends Cond

  final case class Query(etype: Option[String], conds: Seq[Cond],
                         ret: Seq[String], limit: Int = 25)

  /** A virtual operator: expands to a condition list given its args. */
  type VirtualOp = Seq[String] => Seq[Cond]

  // -------------------------------------------------------------- parser
  final class ParseException(msg: String) extends IllegalArgumentException(msg)

  private def tokenize(s: String): List[String] = {
    val out = scala.collection.mutable.ListBuffer[String]()
    var i = 0
    while (i < s.length) {
      s(i) match {
        case c if c.isWhitespace => i += 1
        case '"' =>
          val end = s.indexOf('"', i + 1)
          if (end < 0) throw new ParseException(s"unterminated string at $i")
          out += ("\"" + s.substring(i + 1, end)); i = end + 1
        case '-' if i + 1 < s.length && s(i + 1) == '>' => out += "->"; i += 2
        case c @ ('(' | ')' | '=' | '~' | ',') => out += c.toString; i += 1
        case _ =>
          // read a bare word until the next delimiter
          var k = i
          while (k < s.length && !s(k).isWhitespace && !"()=~,\"".contains(s(k)) &&
                 !(s(k) == '-' && k + 1 < s.length && s(k + 1) == '>')) k += 1
          out += s.substring(i, k); i = k
      }
    }
    out.toList
  }

  /** Parse a KGQ query, expanding virtual operators from `ops`. */
  def parse(text: String, ops: Map[String, VirtualOp] = Map.empty): Query = {
    var toks = tokenize(text)
    def peek: Option[String] = toks.headOption
    def next(): String = { val h = toks.head; toks = toks.tail; h }
    def expect(t: String): Unit = {
      val h = next()
      if (!h.equalsIgnoreCase(t)) throw new ParseException(s"expected $t, got $h")
    }
    def str(t: String): String =
      if (t.startsWith("\"")) t.drop(1) else throw new ParseException(s"expected quoted value, got $t")

    def cond(): Seq[Cond] = {
      val head = next()
      if (head.startsWith("$")) {
        val name = head.drop(1)
        val op = ops.getOrElse(name, throw new ParseException(s"unknown virtual operator $$$name"))
        expect("(")
        val args = scala.collection.mutable.ListBuffer[String]()
        while (peek.exists(_ != ")")) {
          val a = next()
          if (a != ",") args += str(a)
        }
        expect(")")
        op(args.toSeq)
      } else peek match {
        case Some("=") => next(); Seq(Eq(head, str(next())))
        case Some("~") => next(); Seq(Contains(head, str(next())))
        case Some("->") =>
          next(); expect("(")
          val subs = scala.collection.mutable.ListBuffer[Cond]()
          subs ++= cond()
          while (peek.exists(_.equalsIgnoreCase("AND"))) { next(); subs ++= cond() }
          expect(")")
          Seq(Hop(head, subs.toSeq))
        case other => throw new ParseException(s"expected = ~ or -> after $head, got $other")
      }
    }

    expect("FIND")
    val ty = next() match { case "*" => None; case t => Some(t) }
    val conds = scala.collection.mutable.ListBuffer[Cond]()
    if (peek.exists(_.equalsIgnoreCase("WHERE"))) {
      next()
      conds ++= cond()
      while (peek.exists(_.equalsIgnoreCase("AND"))) { next(); conds ++= cond() }
    }
    expect("RETURN")
    val ret = scala.collection.mutable.ListBuffer[String](next())
    while (peek.contains(",")) { next(); ret += next() }
    var limit = 25
    if (peek.exists(_.equalsIgnoreCase("LIMIT"))) { next(); limit = next().toInt }
    if (toks.nonEmpty) throw new ParseException(s"trailing tokens: $toks")
    Query(ty, conds.toSeq, ret.toSeq, limit)
  }

  // ------------------------------------------------------------ executor

  /** One result row: entity id + projected predicate values. */
  final case class ResultRow(id: String, values: Map[String, Seq[String]])

  /** The physical execution engine: compiles a query into (1) a driving
    * index retrieval — the most selective literal constraint is pushed
    * down into the inverted index — and (2) residual verification against
    * the KV store, parallelized across candidates for large candidate
    * sets (intra-query parallelism, §4.2).
    */
  final class Engine(kv: KVStore, idx: InvertedIndex,
                     ops: Map[String, VirtualOp] = Map.empty) {

    def query(text: String): Seq[ResultRow] = execute(parse(text, ops))

    private def literalConds(conds: Seq[Cond]): Seq[(String, String)] = conds.collect {
      case Eq(p, v) => (p, v)
      case Contains(p, v) => (p, v)
    }

    /** Candidate generation with push-down: evaluate every literal
      * constraint (including the type constraint) against the inverted
      * index and drive from the smallest posting set.
      */
    private def candidates(q: Query): Set[String] = {
      val sets = literalConds(q.conds).map { case (p, v) => idx.lookup(v, Some(p)) } ++
        q.etype.map(t => idx.lookup(t, Some("type"))).toSeq
      sets match {
        case Nil => kv.ids.toSet // unconstrained scan (bounded by limit downstream)
        case ss  => ss.minBy(_.size) // drive from the most selective
      }
    }

    private def normEq(a: String, b: String): Boolean =
      StringSim.normalize(a) == StringSim.normalize(b)

    private def holds(rec: Record, c: Cond, depth: Int): Boolean = c match {
      case Eq(p, v)       => rec.getOrElse(p, Seq.empty).exists(normEq(_, v))
      case Contains(p, v) =>
        val toks = StringSim.tokens(v).toSet
        rec.getOrElse(p, Seq.empty).exists(x => toks.subsetOf(StringSim.tokens(x).toSet))
      case Hop(p, sub) =>
        depth < 4 && rec.getOrElse(p, Seq.empty).exists { target =>
          kv.get(target).exists(tr => sub.forall(holds(tr, _, depth + 1)))
        }
    }

    private def verify(q: Query)(id: String): Option[ResultRow] =
      kv.get(id).filter { rec =>
        q.etype.forall(t => rec.getOrElse("type", Seq.empty).contains(t)) &&
        q.conds.forall(holds(rec, _, 0))
      }.map { rec =>
        val vals = q.ret.map {
          case "*"  => "*" -> rec.keys.toSeq.sorted
          case "id" => "id" -> Seq(id)
          case p    => p -> rec.getOrElse(p, Seq.empty)
        }.toMap
        ResultRow(id, vals)
      }

    def execute(q: Query): Seq[ResultRow] = {
      val cands = candidates(q).toSeq.sorted
      val rows =
        if (cands.size > 256) {
          // intra-query parallelism for large candidate sets
          import scala.jdk.CollectionConverters._
          cands.asJava.parallelStream()
            .map[Option[ResultRow]](id => verify(q)(id))
            .collect(java.util.stream.Collectors.toList[Option[ResultRow]])
            .asScala.flatten.toSeq
        } else cands.flatMap(verify(q))
      rows.sortBy(_.id).take(q.limit)
    }
  }
}

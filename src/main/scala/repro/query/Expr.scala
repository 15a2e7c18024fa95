package repro.query

import repro.core._

/** Minimal SQL++-flavoured expression language for the evaluation queries
  * (Appendix A). Values are dynamically typed [[JValue]]s; comparisons over
  * incompatible types yield NULL (§5's `10 > "ten"` example), and predicates
  * treat non-true as false.
  */
sealed trait Expr
final case class Var(name: String) extends Expr
final case class Path(base: Expr, field: String) extends Expr
final case class Lit(v: JValue) extends Expr
final case class Cmp(op: String, l: Expr, r: Expr) extends Expr // >=, >, <, <=, ==, !=
final case class And(l: Expr, r: Expr) extends Expr
final case class Or(l: Expr, r: Expr) extends Expr
final case class Func(name: String, args: List[Expr]) extends Expr
/** SOME `v` IN `arr` SATISFIES `pred`. */
final case class ExistsIn(arr: Expr, varName: String, pred: Expr) extends Expr

/** Runtime environment: variable slots resolved at compile time. */
final class Env(val slots: Array[JValue], val names: Array[String]) {
  def indexOf(n: String): Int = {
    val i = names.indexOf(n)
    require(i >= 0, s"unbound variable $n (have ${names.mkString(",")})")
    i
  }
}

object Expr {
  /** Convenience: "t.entities.hashtags" → Path(Path(Var(t), entities), hashtags). */
  def path(spec: String): Expr = {
    val parts = spec.split('.')
    parts.drop(1).foldLeft[Expr](Var(parts.head))(Path(_, _))
  }

  // ------------------------------------------------------------ evaluation

  def truthy(v: JValue): Boolean = v == JBool(true)

  private def numeric(v: JValue): Option[Double] = v match {
    case JLong(l)   => Some(l.toDouble)
    case JDouble(d) => Some(d)
    case _          => None
  }

  def compare(op: String, l: JValue, r: JValue): JValue = {
    val res: Option[Int] = (l, r) match {
      case (JString(a), JString(b)) => Some(a.compareTo(b))
      case (JBool(a), JBool(b))     => Some(java.lang.Boolean.compare(a, b))
      case _ =>
        (numeric(l), numeric(r)) match {
          case (Some(a), Some(b)) => Some(java.lang.Double.compare(a, b))
          case _                  => None
        }
    }
    res match {
      case None => if (op == "==" && l == r) JBool(true) else if (op == "!=" && l != r) JBool(true) else JNull
      case Some(c) =>
        JBool(op match {
          case ">" => c > 0; case ">=" => c >= 0; case "<" => c < 0; case "<=" => c <= 0
          case "==" => c == 0; case "!=" => c != 0
        })
    }
  }

  def call(name: String, args: List[JValue]): JValue = (name, args) match {
    case ("lowercase", JString(s) :: Nil) => JString(s.toLowerCase)
    case ("length", JString(s) :: Nil)    => JLong(s.length.toLong)
    case ("is_array", (_: JArray) :: Nil) => JBool(true)
    case ("is_array", _ :: Nil)           => JBool(false)
    case ("array_count", JArray(xs) :: Nil) => JLong(xs.length.toLong)
    case ("array_distinct", JArray(xs) :: Nil) => JArray(xs.distinct)
    case ("array_contains", JArray(xs) :: v :: Nil) => JBool(xs.contains(v))
    case ("array_pairs", JArray(xs) :: Nil) =>
      // Unordered distinct pairs rendered "a|b" with a <= b (wos Q4).
      val strs = xs.collect { case JString(s) => s }.distinct.sorted
      JArray((for { i <- strs.indices; j <- i + 1 until strs.length }
        yield JString(strs(i) + "|" + strs(j))).toVector)
    case ("field_each", v :: JString(path) :: Nil) =>
      // SQL++ `x[*].a.b` over a union-typed value: arrays map per element,
      // a lone object acts as a singleton (wos address_name access, §6.4.4).
      def walk(x: JValue): JValue =
        path.split('.').foldLeft(x) {
          case (o: JObject, f) => o.get(f).getOrElse(JNull)
          case _               => JNull
        }
      v match {
        case JArray(xs) => JArray(xs.map(walk))
        case o: JObject => JArray(Vector(walk(o)))
        case _          => JNull
      }
    case ("to_string", v :: Nil) => v match {
      case JString(s) => JString(s)
      case JLong(l)   => JString(l.toString)
      case JDouble(d) => JString(d.toString)
      case other      => JString(other.render)
    }
    case _ => JNull
  }

  /** Tree-walking evaluation — the interpreted engine's per-row dispatch. */
  def eval(e: Expr, env: Env): JValue = e match {
    case Var(n)        => env.slots(env.indexOf(n))
    case Path(b, f)    => eval(b, env) match {
      case o: JObject => o.get(f).getOrElse(JNull)
      case _          => JNull
    }
    case Lit(v)        => v
    case Cmp(op, l, r) => compare(op, eval(l, env), eval(r, env))
    case And(l, r)     => JBool(truthy(eval(l, env)) && truthy(eval(r, env)))
    case Or(l, r)      => JBool(truthy(eval(l, env)) || truthy(eval(r, env)))
    case Func(n, as)   => call(n, as.map(eval(_, env)))
    case ExistsIn(arr, vn, pred) =>
      eval(arr, env) match {
        case JArray(xs) =>
          val slot = env.indexOf(vn)
          JBool(xs.exists { x => env.slots(slot) = x; truthy(eval(pred, env)) })
        case _ => JBool(false)
      }
  }

  // ----------------------------------------------------------- compilation

  /** Closure compilation (§5 substitution for Truffle): the expression tree
    * is resolved once — variable slots bound, dispatch flattened into nested
    * closures the JVM JIT compiles — so per-row work is straight calls with
    * no tree walking or name resolution.
    */
  def compile(e: Expr, names: Array[String]): Env => JValue = e match {
    case Var(n) =>
      val i = names.indexOf(n); require(i >= 0, s"unbound $n")
      env => env.slots(i)
    case Path(b, f) =>
      val cb = compile(b, names)
      env => cb(env) match {
        case o: JObject => o.get(f).getOrElse(JNull)
        case _          => JNull
      }
    case Lit(v) => _ => v
    case Cmp(op, l, r) =>
      val cl = compile(l, names); val cr = compile(r, names)
      env => compare(op, cl(env), cr(env))
    case And(l, r) =>
      val cl = compile(l, names); val cr = compile(r, names)
      env => JBool(truthy(cl(env)) && truthy(cr(env)))
    case Or(l, r) =>
      val cl = compile(l, names); val cr = compile(r, names)
      env => JBool(truthy(cl(env)) || truthy(cr(env)))
    case Func(n, as) =>
      val cas = as.map(compile(_, names))
      env => call(n, cas.map(_(env)))
    case ExistsIn(arr, vn, pred) =>
      val ca = compile(arr, names)
      val slot = names.indexOf(vn); require(slot >= 0, s"unbound $vn")
      val cp = compile(pred, names)
      env => ca(env) match {
        case JArray(xs) => JBool(xs.exists { x => env.slots(slot) = x; truthy(cp(env)) })
        case _          => JBool(false)
      }
  }

  /** All record-rooted paths referenced by `e` (for projection analysis). */
  def rootPaths(e: Expr, rootVar: String): Set[List[String]] = {
    def walkPath(p: Expr, acc: List[String]): Option[List[String]] = p match {
      case Var(`rootVar`) => Some(acc)
      case Path(b, f)     => walkPath(b, f :: acc)
      case _              => None
    }
    e match {
      case p @ (Path(_, _) | Var(_)) => walkPath(p, Nil).toSet
      case Lit(_)        => Set.empty
      case Cmp(_, l, r)  => rootPaths(l, rootVar) ++ rootPaths(r, rootVar)
      case And(l, r)     => rootPaths(l, rootVar) ++ rootPaths(r, rootVar)
      case Or(l, r)      => rootPaths(l, rootVar) ++ rootPaths(r, rootVar)
      case Func(_, as)   => as.flatMap(rootPaths(_, rootVar)).toSet
      case ExistsIn(a, _, p) => rootPaths(a, rootVar) ++ rootPaths(p, rootVar)
    }
  }
}

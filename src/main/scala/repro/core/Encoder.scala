package repro.core

/** `enc_LA` (paper §6.2.2): encodes an LA/hybrid expression bottom-up into
  * VREM facts over an [[Instance]], returning the equivalence class of the
  * expression's result. Sub-expression sharing is by construction: an
  * identical constructor over the same input classes reuses the existing
  * result class (the functionality EGDs would merge them anyway).
  */
object Encoder {

  /** Class of the base matrix / view named `n`, creating its `name` and
    * `size` facts on first use. `metaOf` supplies base-matrix metadata
    * (dims + nnz + optional MNC histograms).
    */
  def leafMat(inst: Instance, n: String, metaOf: String => Option[Meta]): Int =
    inst.classOfName(n).getOrElse {
      val id = inst.fresh()
      inst.addFact("name", Vector(id, inst.const(n)))
      metaOf(n).foreach { m =>
        inst.setMeta(id, inst.est.prepare(m))
        recordSize(inst, id)
      }
      id
    }

  def leafSca(inst: Instance, n: String): Int = {
    val c = inst.const(n)
    inst.facts("sname").collectFirst { case f if inst.find(f(1)) == inst.find(c) => inst.find(f(0)) }
      .getOrElse {
        val id = inst.fresh()
        inst.addFact("sname", Vector(id, c))
        inst.setMeta(id, Meta.scalar)
        id
      }
  }

  def leafLit(inst: Instance, v: Double): Int = {
    val c = inst.const(v.toString)
    inst.facts("slit").collectFirst { case f if inst.find(f(1)) == inst.find(c) => inst.find(f(0)) }
      .getOrElse {
        val id = inst.fresh()
        inst.addFact("slit", Vector(id, c))
        inst.setMeta(id, Meta.scalar)
        id
      }
  }

  /** Record a `size` fact (dims as interned constants) for a class whose
    * Meta is known — size-guarded constraints (vector special cases, square
    * decompositions) match against these.
    */
  def recordSize(inst: Instance, id: Int): Unit =
    inst.meta(id).foreach { m =>
      inst.addFact("size", Vector(id, inst.const(m.rows.toString), inst.const(m.cols.toString)))
    }

  /** Add (or reuse) one constructor fact and return its result class. */
  def addCtor(inst: Instance, rel: String, children: Vector[Int]): Int = {
    val c     = VREM.ctors(rel)
    val canon = children.map(inst.find)
    val existing = inst.facts(rel).collectFirst {
      case f if c.childPos.map(p => inst.find(f(p))) == canon => inst.find(f(c.resultPos))
    }
    existing.getOrElse {
      val res  = inst.fresh()
      val args = new Array[Int](VREM.arity(rel))
      c.childPos.zip(canon).foreach { case (p, id) => args(p) = id }
      args(c.resultPos) = res
      inst.addFact(rel, args.toVector)
      VREM.derive(rel, canon.map(id => inst.meta(id)), inst.est).foreach { m =>
        inst.setMeta(res, m)
        recordSize(inst, res)
      }
      res
    }
  }

  /** Encode an expression; returns the result's equivalence class. */
  def encode(inst: Instance, e: Expr, metaOf: String => Option[Meta]): Int = {
    def rec(x: Expr): Int = x match {
      case Mat(n)       => leafMat(inst, n, metaOf)
      case Sca(n)       => leafSca(inst, n)
      case Lit(v)       => leafLit(inst, v)
      case Mul(a, b)    => addCtor(inst, "multi_M", Vector(rec(a), rec(b)))
      case Add(a, b)    => addCtor(inst, "add_M", Vector(rec(a), rec(b)))
      case Sub(a, b)    => addCtor(inst, "minus_M", Vector(rec(a), rec(b)))
      case Had(a, b)    => addCtor(inst, "multi_E", Vector(rec(a), rec(b)))
      case Div(a, b)    => addCtor(inst, "div_M", Vector(rec(a), rec(b)))
      case ScaMul(s, m) => addCtor(inst, "multi_MS", Vector(rec(s), rec(m)))
      case T(m)         => addCtor(inst, "tr", Vector(rec(m)))
      case Inv(m)       => addCtor(inst, "inv_M", Vector(rec(m)))
      case Exp(m)       => addCtor(inst, "exp", Vector(rec(m)))
      case Diag(m)      => addCtor(inst, "diag", Vector(rec(m)))
      case RowSums(m)   => addCtor(inst, "rowSums", Vector(rec(m)))
      case ColSums(m)   => addCtor(inst, "colSums", Vector(rec(m)))
      case CBind(a, b)  => addCtor(inst, "cbind", Vector(rec(a), rec(b)))
      case Cho(m)       => addCtor(inst, "cho", Vector(rec(m)))
      case Det(m)       => addCtor(inst, "det", Vector(rec(m)))
      case Trace(m)     => addCtor(inst, "trace", Vector(rec(m)))
      case Sum(m)       => addCtor(inst, "sum", Vector(rec(m)))
      case SAdd(a, b)   => addCtor(inst, "add_S", Vector(rec(a), rec(b)))
      case SMul(a, b)   => addCtor(inst, "multi_S", Vector(rec(a), rec(b)))
      case SInv(a)      => addCtor(inst, "inv_S", Vector(rec(a)))
    }
    rec(e)
  }

  /** Encode a materialized view (paper §6.2.4): the body's atoms plus a
    * `name` fact binding the body's result class to the view's stored name
    * — the `V_IO`/`V_OI` constraint pair collapses to this under class-ID
    * semantics.
    */
  def encodeView(inst: Instance, viewName: String, body: Expr,
                 metaOf: String => Option[Meta]): Int = {
    val r = encode(inst, body, metaOf)
    inst.addFact("name", Vector(r, inst.const(viewName)))
    r
  }
}

"""NRAB — the paper's nested relational algebra for bags, on Spark DataFrames.

Each operator is an AST node with a unique ``op_id`` and a printable label
(``σ³``, ``F^I⁵``, …). ``run(op, db)`` executes the *original* semantics of
Table 1 with the DataFrame API (Catalyst plans, no RDDs). The tracing module
re-interprets the same AST with instrumented semantics.

Representation choices (documented in DESIGN.md):
- a nested relation = a DataFrame whose columns may be ``array<struct<…>>``
  (relation-typed) or ``struct<…>`` (tuple-typed attributes);
- relation flatten drops the flattened attribute and promotes the element
  fields to top-level columns (matching Figure 5 of the paper);
- ``GroupAgg`` is the practical SQL-style grouped aggregation used by the
  TPC-H scenarios (= relation nesting ∘ per-tuple aggregation ∘ projection);
  the formal per-tuple ``γ`` of Table 1 is ``AggPerTuple``.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, field, replace

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .exprs import Attr, Pred, Scalar

_ids = itertools.count(1)


def _next_id() -> int:
    return next(_ids)


@dataclass(frozen=True)
class Op:
    """Base operator node."""

    op_id: int = field(default_factory=_next_id, kw_only=True)

    @property
    def label(self) -> str:
        return f"{self.symbol}{self.op_id}"

    symbol = "op"

    def children(self) -> tuple["Op", ...]:
        raise NotImplementedError

    def param_attrs(self) -> set[str]:
        """Attribute paths referenced in this operator's parameters."""
        return set()

    def subst(self, mapping: dict[str, str]) -> "Op":
        """Copy of this node with parameter attributes substituted (same id)."""
        return self


def walk(op: Op):
    """Yield operators bottom-up (children before parents)."""
    for ch in op.children():
        yield from walk(ch)
    yield op


@dataclass(frozen=True)
class TableAccess(Op):
    table: str
    symbol = "R"

    def children(self):
        return ()

    def __repr__(self):
        return self.table


@dataclass(frozen=True)
class Select(Op):
    child: Op
    theta: Pred
    symbol = "σ"

    def children(self):
        return (self.child,)

    def param_attrs(self):
        return self.theta.attrs()

    def subst(self, mapping):
        return replace(self, theta=self.theta.subst(mapping))

    def __repr__(self):
        return f"σ[{self.theta}]({self.child!r})"


@dataclass(frozen=True)
class Project(Op):
    """π with optional renaming / computed columns: items = [(out_name, Scalar)]."""

    child: Op
    items: tuple[tuple[str, Scalar], ...]
    symbol = "π"

    def __init__(self, child, items, **kw):
        object.__setattr__(self, "child", child)
        norm = tuple(
            (out, Attr(e) if isinstance(e, str) else e)
            for out, e in (items.items() if isinstance(items, dict) else items)
        )
        object.__setattr__(self, "items", norm)
        if "op_id" in kw:
            object.__setattr__(self, "op_id", kw["op_id"])
        else:
            object.__setattr__(self, "op_id", _next_id())

    def children(self):
        return (self.child,)

    def param_attrs(self):
        return set().union(*(e.attrs() for _, e in self.items))

    def subst(self, mapping):
        """Substitute attrs; keys of the form ``"out::attr"`` target a single
        projection item (per-reference schema alternatives, e.g. D1's venue)."""
        global_map = {k: v for k, v in mapping.items() if "::" not in k}
        items = []
        for o, e in self.items:
            m = dict(global_map)
            for k, v in mapping.items():
                if "::" in k:
                    io, attr = k.split("::", 1)
                    if io == o:
                        m[attr] = v
            items.append((o, e.subst(m) if m else e))
        return Project(self.child, items, op_id=self.op_id)

    def __repr__(self):
        inner = ", ".join(f"{o}←{e}" if repr(e) != o else o for o, e in self.items)
        return f"π[{inner}]({self.child!r})"


@dataclass(frozen=True)
class Join(Op):
    """Equi-join variants. ``cond`` is a list of (left_attr, right_attr) pairs."""

    left: Op
    right: Op
    cond: tuple[tuple[str, str], ...]
    kind: str = "inner"  # inner | left | right | full
    symbol = "⋈"

    def __init__(self, left, right, cond, kind="inner", **kw):
        object.__setattr__(self, "left", left)
        object.__setattr__(self, "right", right)
        object.__setattr__(self, "cond", tuple(tuple(p) for p in cond))
        object.__setattr__(self, "kind", kind)
        object.__setattr__(self, "op_id", kw.get("op_id", _next_id()))

    def children(self):
        return (self.left, self.right)

    def param_attrs(self):
        return {a for p in self.cond for a in p}

    def subst(self, mapping):
        cond = tuple((mapping.get(l, l), mapping.get(r, r)) for l, r in self.cond)
        return Join(self.left, self.right, cond, self.kind, op_id=self.op_id)

    def __repr__(self):
        c = ",".join(f"{l}={r}" for l, r in self.cond)
        return f"⋈[{self.kind},{c}]({self.left!r}, {self.right!r})"


@dataclass(frozen=True)
class FlattenRel(Op):
    """Relation flatten F^I / F^O on an array<struct> attribute."""

    child: Op
    attr: str
    outer: bool = False

    @property
    def symbol(self):
        return "F^O" if self.outer else "F^I"

    def children(self):
        return (self.child,)

    def param_attrs(self):
        return {self.attr}

    def subst(self, mapping):
        return replace(self, attr=mapping.get(self.attr, self.attr))

    def __repr__(self):
        return f"{self.symbol}[{self.attr}]({self.child!r})"


@dataclass(frozen=True)
class FlattenTup(Op):
    """Tuple flatten F^T on a struct attribute (promotes its fields)."""

    child: Op
    attr: str
    symbol = "F^T"

    def children(self):
        return (self.child,)

    def param_attrs(self):
        return {self.attr}

    def subst(self, mapping):
        return replace(self, attr=mapping.get(self.attr, self.attr))

    def __repr__(self):
        return f"F^T[{self.attr}]({self.child!r})"


@dataclass(frozen=True)
class NestTup(Op):
    """Tuple nesting N^T: pack attrs A into a new struct attribute C."""

    child: Op
    attrs_in: tuple[str, ...]
    out: str
    symbol = "N^T"

    def __init__(self, child, attrs_in, out, **kw):
        object.__setattr__(self, "child", child)
        object.__setattr__(self, "attrs_in", tuple(attrs_in))
        object.__setattr__(self, "out", out)
        object.__setattr__(self, "op_id", kw.get("op_id", _next_id()))

    def children(self):
        return (self.child,)

    def param_attrs(self):
        return set(self.attrs_in)

    def subst(self, mapping):
        return NestTup(
            self.child, [mapping.get(x, x) for x in self.attrs_in], self.out, op_id=self.op_id
        )

    def __repr__(self):
        return f"N^T[{','.join(self.attrs_in)}→{self.out}]({self.child!r})"


@dataclass(frozen=True)
class NestRel(Op):
    """Relation nesting N^R: group by sch(R)−A, nest A-tuples into C."""

    child: Op
    attrs_in: tuple[str, ...]
    out: str
    symbol = "N^R"

    def __init__(self, child, attrs_in, out, **kw):
        object.__setattr__(self, "child", child)
        object.__setattr__(self, "attrs_in", tuple(attrs_in))
        object.__setattr__(self, "out", out)
        object.__setattr__(self, "op_id", kw.get("op_id", _next_id()))

    def children(self):
        return (self.child,)

    def param_attrs(self):
        return set(self.attrs_in)

    def subst(self, mapping):
        return NestRel(
            self.child, [mapping.get(x, x) for x in self.attrs_in], self.out, op_id=self.op_id
        )

    def __repr__(self):
        return f"N^R[{','.join(self.attrs_in)}→{self.out}]({self.child!r})"


@dataclass(frozen=True)
class GroupAgg(Op):
    """SQL-style grouped aggregation: group by ``keys``, aggs = [(fn, attr, out)].

    fn ∈ {count, sum, avg, min, max}; attr may be "*" for count(*), a column
    name, or a :class:`Scalar` expression (e.g. TPC-H's revenue
    ``sum(l_extendedprice × (1 − l_discount))`` — the paper's γ²⁵ carries the
    arithmetic inside the aggregation parameter). ``key_out`` optionally
    renames group keys in the output so that a schema alternative on a key
    does not change the output schema (Q4's priority column).
    """

    child: Op
    keys: tuple[str, ...]
    aggs: tuple[tuple[str, object, str], ...]
    key_out: tuple[str, ...]
    symbol = "γ"

    def __init__(self, child, keys, aggs, key_out=None, **kw):
        object.__setattr__(self, "child", child)
        object.__setattr__(self, "keys", tuple(keys))
        object.__setattr__(self, "aggs", tuple(tuple(x) for x in aggs))
        object.__setattr__(self, "key_out", tuple(key_out) if key_out else tuple(keys))
        object.__setattr__(self, "op_id", kw.get("op_id", _next_id()))

    def children(self):
        return (self.child,)

    def param_attrs(self):
        out = set(self.keys)
        for _, a, _ in self.aggs:
            if isinstance(a, Scalar):
                out |= a.attrs()
            elif a != "*":
                out.add(a)
        return out

    def subst(self, mapping):
        keys = [mapping.get(k, k) for k in self.keys]
        aggs = [
            (f, a.subst(mapping) if isinstance(a, Scalar) else mapping.get(a, a), o)
            for f, a, o in self.aggs
        ]
        return GroupAgg(self.child, keys, aggs, key_out=self.key_out, op_id=self.op_id)

    def __repr__(self):
        ag = ",".join(f"{f}({a})→{o}" for f, a, o in self.aggs)
        ks = ",".join(
            k if k == o else f"{o}←{k}" for k, o in zip(self.keys, self.key_out)
        )
        return f"γ[{ks};{ag}]({self.child!r})"


@dataclass(frozen=True)
class AggPerTuple(Op):
    """Formal γ of Table 1: apply fn to a nested-relation attribute per tuple.

    ``fn`` ∈ {count, sum, avg, min, max}; ``attr`` is ``array<struct<f>>`` or a
    plain array; ``inner`` names the struct field to aggregate over ("" = the
    element itself). Null elements are ignored (SQL semantics), and a null /
    empty array yields count 0 and null sum — the behaviour driving D2.
    """

    child: Op
    fn: str
    attr: str
    out: str
    inner: str = ""
    symbol = "γ"

    def children(self):
        return (self.child,)

    def param_attrs(self):
        return {self.attr}

    def subst(self, mapping):
        return replace(self, attr=mapping.get(self.attr, self.attr))

    def __repr__(self):
        fld = f".{self.inner}" if self.inner else ""
        return f"γ[{self.fn}({self.attr}{fld})→{self.out}]({self.child!r})"


@dataclass(frozen=True)
class Union(Op):
    left: Op
    right: Op
    symbol = "∪"

    def children(self):
        return (self.left, self.right)

    def __repr__(self):
        return f"({self.left!r} ∪ {self.right!r})"


@dataclass(frozen=True)
class Dedup(Op):
    child: Op
    symbol = "δ"

    def children(self):
        return (self.child,)

    def __repr__(self):
        return f"δ({self.child!r})"


@dataclass(frozen=True)
class Rename(Op):
    child: Op
    mapping: tuple[tuple[str, str], ...]  # (old, new)
    symbol = "ρ"

    def __init__(self, child, mapping, **kw):
        object.__setattr__(self, "child", child)
        m = mapping.items() if isinstance(mapping, dict) else mapping
        object.__setattr__(self, "mapping", tuple(tuple(p) for p in m))
        object.__setattr__(self, "op_id", kw.get("op_id", _next_id()))

    def children(self):
        return (self.child,)

    def param_attrs(self):
        return {old for old, _ in self.mapping}

    def subst(self, mapping):
        return self  # renaming reparameterizations are permutations; not modeled

    def __repr__(self):
        m = ",".join(f"{n}←{o}" for o, n in self.mapping)
        return f"ρ[{m}]({self.child!r})"


# ---------------------------------------------------------------------------
# Execution (original semantics)
# ---------------------------------------------------------------------------


def _agg_col(fn: str, attr: str):
    if attr == "*":
        assert fn == "count"
        return F.count(F.lit(1))
    col = F.col(attr)
    return {
        "count": F.count(col),
        "sum": F.sum(col),
        "avg": F.avg(col),
        "min": F.min(col),
        "max": F.max(col),
    }[fn]


def _per_tuple_agg_col(op: AggPerTuple):
    arr = F.col(op.attr)
    elems = F.expr(
        f"transform({op.attr}, x -> x{'.' + op.inner if op.inner else ''})"
    )
    nonnull = F.filter(elems, lambda x: x.isNotNull())
    if op.fn == "count":
        return F.coalesce(F.size(nonnull), F.lit(0))
    total = F.aggregate(nonnull, F.lit(0.0), lambda acc, x: acc + x.cast("double"))
    n = F.size(nonnull)
    if op.fn == "sum":
        return F.when(n > 0, total)
    if op.fn == "avg":
        return F.when(n > 0, total / n)
    if op.fn == "min":
        return F.array_min(nonnull)
    if op.fn == "max":
        return F.array_max(nonnull)
    raise ValueError(op.fn)


def run(op: Op, db: dict[str, DataFrame]) -> DataFrame:
    """Execute ``op`` with the original NRAB semantics of Table 1."""
    if isinstance(op, TableAccess):
        return db[op.table]
    if isinstance(op, Select):
        return run(op.child, db).filter(op.theta.to_col())
    if isinstance(op, Project):
        df = run(op.child, db)
        return df.select(*[e.to_col().alias(o) for o, e in op.items])
    if isinstance(op, Rename):
        df = run(op.child, db)
        for old, new in op.mapping:
            df = df.withColumnRenamed(old, new)
        return df
    if isinstance(op, Join):
        l, r = run(op.left, db), run(op.right, db)
        on = None
        for lc, rc in op.cond:
            this = l[lc] == r[rc]
            on = this if on is None else (on & this)
        how = {"inner": "inner", "left": "left_outer", "right": "right_outer", "full": "full_outer"}[
            op.kind
        ]
        return l.join(r, on=on, how=how)
    if isinstance(op, FlattenRel):
        df = run(op.child, db)
        ex = F.explode_outer(op.attr) if op.outer else F.explode(op.attr)
        df = df.select("*", ex.alias("__e")).drop(op.attr)
        return df.select(*[c for c in df.columns if c != "__e"], "__e.*")
    if isinstance(op, FlattenTup):
        df = run(op.child, db)
        inner = [f.name for f in struct_type_at(df.schema, op.attr).fields]
        if "." in op.attr:  # nested struct path: promote fields, keep the rest
            return df.select(
                "*", *[F.col(f"{op.attr}.{f}").alias(f) for f in inner]
            )
        cols = [c for c in df.columns if c != op.attr]
        return df.select(*cols, *[F.col(f"{op.attr}.{f}").alias(f) for f in inner])
    if isinstance(op, NestTup):
        df = run(op.child, db)
        rest = [c for c in df.columns if c not in op.attrs_in]
        return df.select(*rest, F.struct(*op.attrs_in).alias(op.out))
    if isinstance(op, NestRel):
        df = run(op.child, db)
        rest = [c for c in df.columns if c not in op.attrs_in]
        return df.groupBy(*rest).agg(
            F.collect_list(F.struct(*op.attrs_in)).alias(op.out)
        )
    if isinstance(op, GroupAgg):
        df = run(op.child, db)
        norm = []
        for f, a, o in op.aggs:
            if isinstance(a, Scalar):
                df = df.withColumn(f"_in_{o}", a.to_col())
                a = f"_in_{o}"
            norm.append((f, a, o))
        aggs = [_agg_col(f, a).alias(o) for f, a, o in norm]
        if op.keys:
            keyed = df.groupBy(*[F.col(k).alias(o) for k, o in zip(op.keys, op.key_out)])
            return keyed.agg(*aggs)
        return df.agg(*aggs)
    if isinstance(op, AggPerTuple):
        df = run(op.child, db)
        return df.withColumn(op.out, _per_tuple_agg_col(op))
    if isinstance(op, Union):
        return run(op.left, db).unionByName(run(op.right, db))
    if isinstance(op, Dedup):
        return run(op.child, db).distinct()
    raise TypeError(f"unknown operator {op!r}")


def schema_of(op: Op, db: dict[str, DataFrame]):
    """Lazily analyzed output schema (no job is launched)."""
    return run(op, db).schema


def struct_type_at(schema, path: str):
    """Resolve a possibly dotted attribute path to its (struct) type."""
    cur = schema
    for part in path.split("."):
        cur = dict((f.name, f.dataType) for f in cur.fields)[part]
    return cur


def replace_children(op: Op, new_children: tuple[Op, ...]) -> Op:
    """Copy of ``op`` with its children replaced (op_id preserved)."""
    import dataclasses

    if isinstance(op, TableAccess):
        return op
    if isinstance(op, (Join, Union)):
        l, r = new_children
        return dataclasses.replace(op, left=l, right=r)
    (c,) = new_children
    return dataclasses.replace(op, child=c)


def rewrite(root: Op, per_op_subst: dict[int, dict[str, str]]) -> Op:
    """Rebuild the tree applying per-operator attribute substitutions.

    Operator ids are preserved, so an operator keeps its identity across
    reparameterizations (as required by Definition 7 ff.).
    """
    new_children = tuple(rewrite(c, per_op_subst) for c in root.children())
    node = replace_children(root, new_children)
    mapping = per_op_subst.get(root.op_id)
    if mapping:
        node = node.subst(mapping)
    return node


def find_op(root: Op, op_id: int) -> Op:
    for node in walk(root):
        if node.op_id == op_id:
            return node
    raise KeyError(op_id)


def labels(root: Op) -> dict[int, str]:
    return {node.op_id: node.label for node in walk(root)}

"""Nested Instances with Placeholders (NIPs) — Definitions 3–5 of the paper.

A NIP describes a (set of) missing answer(s): ``?`` matches any value of the
right type, ``*`` matches 0+ additional tuples of a nested relation, constants
match themselves, and (our extension, needed by the TPC-H why-not tuples such
as ``⟨avgDisc : > 0.45⟩``) value predicates match any value satisfying them.

Two consumers:
- :func:`matches` — the full Definition 4 matcher on collected Python data,
  including the bag multiplicity assignment (condition 4), via backtracking.
- :func:`to_spark_pred` — compile a tuple-typed NIP into a Spark boolean
  ``Column`` used for the ``consistent`` annotation during data tracing.
  Bags compile to ``F.exists`` (one existential per explicit element — a
  sound approximation used only for annotation flags; final answers are
  re-checked with :func:`matches`).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import Column
from pyspark.sql import functions as F

from .exprs import Pred


class Nip:
    """Base class for NIP nodes."""

    def is_trivial(self) -> bool:
        """True if the NIP matches everything (pure ``?`` structure)."""
        raise NotImplementedError


@dataclass(frozen=True)
class Wild(Nip):
    """The instance placeholder ``?``."""

    def is_trivial(self) -> bool:
        return True

    def __repr__(self) -> str:
        return "?"


WILD = Wild()


@dataclass(frozen=True)
class Val(Nip):
    """A fully specified primitive value."""

    value: object

    def is_trivial(self) -> bool:
        return False

    def __repr__(self) -> str:
        return repr(self.value)


@dataclass(frozen=True)
class ValPred(Nip):
    """A value predicate placeholder, e.g. ``> 0.45`` (matches satisfying values).

    ``pred.holds(v)`` must evaluate the predicate on a single python value.
    """

    pred: Pred

    def is_trivial(self) -> bool:
        return False

    def __repr__(self) -> str:
        return f"⟨{self.pred}⟩"


@dataclass(frozen=True)
class Tup(Nip):
    """A tuple NIP: mapping attribute name → child NIP.

    Attributes omitted from ``fields`` are implicitly ``?``.
    """

    fields: tuple[tuple[str, Nip], ...]

    def __init__(self, fields: dict[str, Nip] | tuple = ()):  # noqa: D401
        if isinstance(fields, dict):
            fields = tuple(fields.items())
        object.__setattr__(self, "fields", tuple(fields))

    def as_dict(self) -> dict[str, Nip]:
        return dict(self.fields)

    def is_trivial(self) -> bool:
        return all(v.is_trivial() for _, v in self.fields)

    def __repr__(self) -> str:
        inner = ", ".join(f"{k}: {v!r}" for k, v in self.fields)
        return f"⟨{inner}⟩"


@dataclass(frozen=True)
class Bag(Nip):
    """A bag NIP ``{{e₁, …, eₙ}}`` with an optional trailing ``*``."""

    elems: tuple[Nip, ...]
    star: bool = False

    def __init__(self, elems=(), star: bool = False):
        object.__setattr__(self, "elems", tuple(elems))
        object.__setattr__(self, "star", star)

    def is_trivial(self) -> bool:
        # {{*}} matches any bag; {{?, *}} requires at least one element.
        return self.star and not self.elems

    def __repr__(self) -> str:
        inner = ", ".join(map(repr, self.elems)) + (", *" if self.star else "")
        return "{{" + inner + "}}"


# ---------------------------------------------------------------------------
# Definition 4 matcher (Python side, exact, incl. bag multiplicities)
# ---------------------------------------------------------------------------


def _as_plain(value):
    """Normalize Spark Row / dict / list values into plain python structures."""
    try:  # pyspark Row
        from pyspark.sql import Row

        if isinstance(value, Row):
            return {k: _as_plain(v) for k, v in value.asDict().items()}
    except ImportError:  # pragma: no cover
        pass
    if isinstance(value, dict):
        return {k: _as_plain(v) for k, v in value.items()}
    if isinstance(value, (list, tuple)):
        return [_as_plain(v) for v in value]
    return value


def matches(instance, nip: Nip) -> bool:
    """Does ``instance`` match ``nip`` (Definition 4)?

    Bags use a backtracking assignment honoring multiplicities: every
    instance element must be assigned to an equal explicit NIP element, to a
    ``?``/predicate element, or to ``*`` (if present); every explicit NIP
    element must be used exactly once.
    """
    instance = _as_plain(instance)
    if isinstance(nip, Wild):
        return True
    if isinstance(nip, Val):
        return instance == nip.value
    if isinstance(nip, ValPred):
        return nip.pred.holds(instance)
    if isinstance(nip, Tup):
        if instance is None or not isinstance(instance, dict):
            return False
        return all(matches(instance.get(k), v) for k, v in nip.fields)
    if isinstance(nip, Bag):
        if instance is None or not isinstance(instance, list):
            return False
        return _match_bag(instance, list(nip.elems), nip.star)
    raise TypeError(f"unknown NIP node {nip!r}")


def _match_bag(items: list, elems: list[Nip], star: bool) -> bool:
    """Backtracking assignment for bag matching (condition 4 of Def. 4)."""
    if not elems:
        return star or not items
    if len(items) < len(elems):
        return False  # each explicit element needs a distinct instance tuple

    def bt(i: int, remaining: list[int]) -> bool:
        if i == len(elems):
            return star or not remaining
        for j in list(remaining):
            if matches(items[j], elems[i]):
                nxt = [x for x in remaining if x != j]
                if bt(i + 1, nxt):
                    return True
        return False

    return bt(0, list(range(len(items))))


# ---------------------------------------------------------------------------
# Spark predicate compilation (for `consistent` annotations)
# ---------------------------------------------------------------------------


def _elem_matcher(elem: Nip):
    """One-parameter callable for ``F.exists`` (Spark inspects the arity)."""

    def f(x: Column) -> Column:
        return _pred_on_col(x, elem)

    return f


def _pred_on_col(col: Column, nip: Nip) -> Column:
    if isinstance(nip, Wild):
        return F.lit(True)
    if isinstance(nip, Val):
        return col == F.lit(nip.value)
    if isinstance(nip, ValPred):
        # Only comparisons against constants are compilable here.
        from .exprs import Cmp, Const

        p = nip.pred
        if isinstance(p, Cmp) and isinstance(p.right, Const):
            r = F.lit(p.right.value)
            return {
                "=": col == r,
                "!=": col != r,
                "<": col < r,
                "<=": col <= r,
                ">": col > r,
                ">=": col >= r,
            }[p.op]
        return F.lit(True)  # uncompilable predicate → optimistic flag
    if isinstance(nip, Tup):
        out = F.lit(True)
        for name, child in nip.fields:
            out = out & _pred_on_col(col.getField(name), child)
        return out
    if isinstance(nip, Bag):
        out = F.lit(True)
        for elem in nip.elems:
            if isinstance(elem, Wild):
                cond = F.size(col) >= 1
            else:
                cond = F.exists(col, _elem_matcher(elem))
            out = out & F.coalesce(cond, F.lit(False))
        if not nip.elems and not nip.star:
            out = out & (F.coalesce(F.size(col), F.lit(0)) == 0)
        return out
    raise TypeError(f"unknown NIP node {nip!r}")


def to_spark_pred(nip: Tup) -> Column:
    """Compile a tuple NIP over a DataFrame's top-level schema into a Column.

    Null top-level values fail non-trivial constraints (``coalesce`` to
    False), so outer-join/outer-flatten padding is handled naturally.
    """
    assert isinstance(nip, Tup), "top-level why-not NIPs are tuple-typed"
    out = F.lit(True)
    for name, child in nip.fields:
        if child.is_trivial():
            continue
        out = out & F.coalesce(_pred_on_col(F.col(name), child), F.lit(False))
    return out


def tup(**fields) -> Tup:
    """Shorthand tuple-NIP constructor: values may be Nips or plain constants."""
    return Tup({k: v if isinstance(v, Nip) else Val(v) for k, v in fields.items()})


def bag(*elems, star: bool = False) -> Bag:
    """Shorthand bag-NIP constructor."""
    return Bag([e if isinstance(e, Nip) else Val(e) for e in elems], star=star)

"""WN++ — the lineage-based Why-Not baseline ([9] extended to nested data).

Faithful to the lineage-based formulation the paper compares against:

- *compatibles* are input tuples matching the backtraced table NIPs under the
  **original schema only** (no schema alternatives, no re-validation — the
  documented source of false positives/negatives);
- compatibles are traced forward; for every operator on the path from the
  compatible's table to the root, WN++ counts the surviving successors;
- the *frontier picky* operator is the first operator that eliminates **all**
  remaining successors; if no operator eliminates all of them but the answer
  is still missing (typical for aggregation queries, where every input tuple
  is compatible), WN++ blames the most-downstream operator that filtered any
  successors;
- each frontier picky operator yields a singleton explanation — WN++ never
  returns operator combinations, never returns schema-changing operators
  (projections, nesting, aggregation), and never checks that relaxing the
  blamed operator actually produces the missing answer. These are exactly
  the failure modes Tables 7/8 attribute to WN++.

Tables with a trivial table NIP contribute no compatibles; if *no* table is
constrained, every input tuple is compatible (the paper's Q1/Q6 behaviour:
"it marks all input tuples as compatibles").
"""
from __future__ import annotations

import pandas as pd

from ..core import algebra as A
from ..core.alternatives import SchemaAlternative
from ..core.backtrace import backtrace
from ..core.msr import collect_stats
from ..core.tracing import Traced, trace


def _tables_under(op: A.Op) -> set[str]:
    return {n.table for n in A.walk(op) if isinstance(n, A.TableAccess)}


def _path_steps(query: A.Op, table: str, flagged: set[int]) -> list[tuple[int, list[int]]]:
    """Flagged operators on the path from ``table``'s access to the root.

    Each step carries the set of flagged operators in its *subtree*: by the
    time an operator executes, everything below it (including the other side
    of a join) has already filtered in the original execution.
    """
    out = []
    for node in A.walk(query):
        if node.op_id in flagged and table in _tables_under(node):
            subtree = sorted(o.op_id for o in A.walk(node) if o.op_id in flagged)
            out.append((node.op_id, subtree))
    return sorted(out)


def _successors(stats: pd.DataFrame, tr: Traced, compat_col: str | None, flag_ids) -> int:
    rows = stats
    if compat_col is not None:
        rows = rows[rows[compat_col] == 1]
    for op_id in flag_ids:
        rows = rows[rows[tr.flags[op_id]] == 1]
    return int(rows["_n"].sum()) if len(rows) else 0


def wnpp(query: A.Op, db, whynot, traced: Traced | None = None) -> list[frozenset[int]]:
    """Return WN++'s explanations (each a singleton operator set)."""
    bt = backtrace(query, whynot, db)
    if traced is None:
        sa1 = SchemaAlternative(1, query, frozenset(), bt, "original")
        traced = trace(sa1, db, bt)
    stats = collect_stats(traced, extra_cols=tuple(traced.compat_tables.values()))

    flagged = set(traced.flags)
    if traced.compat_tables:
        sources = [(t, traced.compat_tables[t]) for t in traced.compat_tables]
    else:  # no constrained table: every tuple of every table is compatible
        sources = [(t, None) for t in traced.table_order]

    explanations: list[frozenset[int]] = []
    seen = set()
    for table, compat_col in sources:
        steps = _path_steps(query, table, flagged)
        prev = _successors(stats, traced, compat_col, [])
        if prev == 0:
            continue  # no compatibles from this table at all
        frontier = None
        last_decreasing = None
        for op_id, subtree in steps:
            cur = _successors(stats, traced, compat_col, subtree)
            if cur == 0 and prev > 0:
                frontier = op_id
                break
            if cur < prev:
                last_decreasing = op_id
            prev = cur
        picked = frontier if frontier is not None else last_decreasing
        if picked is not None:
            picked = _maybe_blame_join_partner(query, db, picked, table, stats, traced)
        if picked is not None and picked not in seen:
            seen.add(picked)
            explanations.append(frozenset({picked}))
    return explanations


def _maybe_blame_join_partner(query, db, picked, table, stats, traced):
    """Why-Not's partner analysis: when the frontier is a join, check whether
    an operator on the *other* side emptied the potential join partners
    entirely (e.g. C2's σ⁴ removing every witness); blame that operator
    instead of the join. If the other side still produces rows (Q10), the
    join itself stays blamed."""
    node = A.find_op(query, picked)
    if not isinstance(node, A.Join):
        return picked
    other = node.right if table in _tables_under(node.left) else node.left
    other_flags = sorted(o for o in traced.flags if any(
        n.op_id == o for n in A.walk(other)
    ))
    prev = _successors(stats, traced, None, [])
    for i, op_id in enumerate(other_flags):
        cur = _successors(stats, traced, None, other_flags[: i + 1])
        if cur == 0 and prev > 0:
            return op_id
        prev = cur
    return picked

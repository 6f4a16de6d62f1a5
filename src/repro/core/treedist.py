"""Tree edit distance for nested relations — the distance ``d`` of Definition 9.

The paper proposes the tree edit distance for unsorted trees [7, 34] to
quantify side effects of a reparameterization, notes that it is NP-hard for
unordered trees [41], and in the implementation falls back to loose bounds
(§5.4). We provide, like the paper:

- :func:`relation_to_tree` — the canonical tree encoding of a nested
  relation (Figure 2): a root node, one child per tuple, attribute nodes
  below, nested relations recursing;
- :func:`tree_edit_distance` — an exact Zhang–Shasha ordered-tree edit
  distance over a canonical (sorted) ordering of children, which upper-
  bounds the unordered distance and is exact when sibling order is
  canonicalized — sufficient for ranking SRs on small results (Example 9);
- :func:`relation_distance` — distance between two collected results.

The MSR ranking itself uses the loose UB/LB bounds (as in the paper); this
module backs the Example 9/10 tests and is available for exact re-ranking
of small outputs.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass
class Node:
    label: str
    children: list["Node"] = field(default_factory=list)

    def canon(self) -> "Node":
        ch = sorted((c.canon() for c in self.children), key=lambda n: n.sig())
        return Node(self.label, ch)

    def sig(self) -> str:
        return self.label + "(" + ",".join(c.sig() for c in self.children) + ")"

    def size(self) -> int:
        return 1 + sum(c.size() for c in self.children)


def value_to_tree(label: str, value) -> Node:
    """Encode a (possibly nested) value as a labeled tree node."""
    if isinstance(value, dict):
        return Node(label, [value_to_tree(k, v) for k, v in value.items()])
    if isinstance(value, (list, tuple)):
        return Node(label, [value_to_tree("t", v) for v in value])
    return Node(f"{label}={value!r}")


def relation_to_tree(rows: list) -> Node:
    """Canonical tree encoding of a nested relation (Figure 2's T₁–T₃)."""
    root = Node("R", [value_to_tree("t", _plain(r)) for r in rows])
    return root.canon()


def _plain(row):
    try:
        from pyspark.sql import Row

        if isinstance(row, Row):
            return {k: _plain(v) for k, v in row.asDict().items()}
    except ImportError:  # pragma: no cover
        pass
    if isinstance(row, dict):
        return {k: _plain(v) for k, v in row.items()}
    if isinstance(row, (list, tuple)):
        return [_plain(v) for v in row]
    return row


# ---------------------------------------------------------------------------
# Zhang–Shasha ordered tree edit distance (unit costs)
# ---------------------------------------------------------------------------


def _postorder(root: Node):
    """Postorder node list + leftmost-leaf index per node (Zhang–Shasha)."""
    order: list[Node] = []
    leftmost: list[int] = []

    def visit(n: Node) -> int:
        ll = None
        for c in n.children:
            idx = visit(c)
            if ll is None:
                ll = leftmost[idx]
        order.append(n)
        leftmost.append(len(order) - 1 if ll is None else ll)
        return len(order) - 1

    visit(root)
    return order, leftmost


def _keyroots(leftmost: list[int]) -> list[int]:
    seen = {}
    for i, lm in enumerate(leftmost):
        seen[lm] = i  # the last (highest) node for each leftmost value
    return sorted(seen.values())


def tree_edit_distance(a: Node, b: Node) -> int:
    """Exact ordered TED with unit insert/delete/rename costs (Zhang–Shasha)."""
    t1, l1 = _postorder(a)
    t2, l2 = _postorder(b)
    n, m = len(t1), len(t2)
    td = [[0] * m for _ in range(n)]

    def treedist(i: int, j: int):
        li, lj = l1[i], l2[j]
        fd = [[0] * (j - lj + 2) for _ in range(i - li + 2)]
        for x in range(1, i - li + 2):
            fd[x][0] = fd[x - 1][0] + 1
        for y in range(1, j - lj + 2):
            fd[0][y] = fd[0][y - 1] + 1
        for x in range(1, i - li + 2):
            for y in range(1, j - lj + 2):
                gi, gj = li + x - 1, lj + y - 1
                if l1[gi] == li and l2[gj] == lj:
                    cost = 0 if t1[gi].label == t2[gj].label else 1
                    fd[x][y] = min(
                        fd[x - 1][y] + 1, fd[x][y - 1] + 1, fd[x - 1][y - 1] + cost
                    )
                    td[gi][gj] = fd[x][y]
                else:
                    fd[x][y] = min(
                        fd[x - 1][y] + 1,
                        fd[x][y - 1] + 1,
                        fd[l1[gi] - li][l2[gj] - lj] + td[gi][gj],
                    )
        return fd

    for i in _keyroots(l1):
        for j in _keyroots(l2):
            treedist(i, j)
    return td[n - 1][m - 1]


def relation_distance(rows_a: list, rows_b: list) -> int:
    """Distance d(R₁, R₂) between two collected (nested) relations."""
    return tree_edit_distance(relation_to_tree(rows_a), relation_to_tree(rows_b))

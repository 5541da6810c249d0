"""Reference evaluator: a direct transcription of ⟦·⟧_G (Section V-B).

This is the ground-truth oracle for both Spark evaluators. It operates on a
``LocalTPG`` — a plain-Python point-based TPG — and materialises each
relation as a ``set`` of tuples ``(o1, t1, o2, t2)``, exactly following the
denotational definitions:

* axes F/B/N/P over PTO(G) = (N ∪ E) × Ω (existence NOT required);
* tests as diagonal relations;
* concatenation = relation composition, union = set union;
* ``path[n,m]`` = union of n..m-fold compositions, ``path[n,_]`` via
  fixpoint (the relation lattice is finite).

Intended for small graphs (|PTO| up to a few thousand).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from ..tpg.model import ITPGData
from . import ast

Tuple4 = tuple[str, int, str, int]


@dataclass
class LocalTPG:
    """Point-based TPG (Definition III.1) in plain Python structures."""

    omega: tuple[int, int]
    kind: dict[str, str]  # id -> 'node' | 'edge'
    label: dict[str, str]  # λ
    src: dict[str, str]  # ρ (edges only)
    tgt: dict[str, str]
    exist: set[tuple[str, int]] = field(default_factory=set)  # ξ = true
    props: dict[tuple[str, str, int], str] = field(default_factory=dict)  # σ

    @staticmethod
    def from_data(data: ITPGData) -> "LocalTPG":
        g = LocalTPG(
            omega=data.omega,
            kind=dict(zip(data.objects["id"], data.objects["kind"])),
            label=dict(zip(data.objects["id"], data.objects["label"])),
            src={
                r["id"]: r["src"]
                for _, r in data.objects.iterrows()
                if r["kind"] == "edge"
            },
            tgt={
                r["id"]: r["tgt"]
                for _, r in data.objects.iterrows()
                if r["kind"] == "edge"
            },
        )
        for _, r in data.exist.iterrows():
            for t in range(int(r["s"]), int(r["e"]) + 1):
                g.exist.add((r["id"], t))
        for _, r in data.props.iterrows():
            for t in range(int(r["s"]), int(r["e"]) + 1):
                g.props[(r["id"], r["p"], t)] = r["v"]
        return g

    @property
    def objects(self) -> list[str]:
        return list(self.kind)

    def times(self) -> range:
        return range(self.omega[0], self.omega[1] + 1)

    def pto(self) -> list[tuple[str, int]]:
        return [(o, t) for o in self.kind for t in self.times()]


# ------------------------------------------------------------------ helpers


def _compose(a: set[Tuple4], b: set[Tuple4]) -> set[Tuple4]:
    index: dict[tuple[str, int], list[tuple[str, int]]] = {}
    for o1, t1, o2, t2 in b:
        index.setdefault((o1, t1), []).append((o2, t2))
    out: set[Tuple4] = set()
    for o1, t1, o2, t2 in a:
        for o3, t3 in index.get((o2, t2), ()):
            out.add((o1, t1, o3, t3))
    return out


def _identity(g: LocalTPG) -> set[Tuple4]:
    return {(o, t, o, t) for o, t in g.pto()}


# ----------------------------------------------------------------- evaluate


def holds(g: LocalTPG, test: ast.Test, o: str, t: int) -> bool:
    """(o, t) ⊨ test, per the recursive definition in Section V-B."""
    if isinstance(test, ast.NodeTest):
        return g.kind[o] == "node"
    if isinstance(test, ast.EdgeTest):
        return g.kind[o] == "edge"
    if isinstance(test, ast.LabelTest):
        return g.label[o] == test.label
    if isinstance(test, ast.PropTest):
        return g.props.get((o, test.prop, t)) == test.value
    if isinstance(test, ast.ExistsTest):
        return (o, t) in g.exist
    if isinstance(test, ast.LtTest):
        return t < test.k
    if isinstance(test, ast.PathTest):
        rel = eval_path(g, test.path)
        return any(o1 == o and t1 == t for o1, t1, _, _ in rel)
    if isinstance(test, ast.AndTest):
        return holds(g, test.left, o, t) and holds(g, test.right, o, t)
    if isinstance(test, ast.OrTest):
        return holds(g, test.left, o, t) or holds(g, test.right, o, t)
    if isinstance(test, ast.NotTest):
        return not holds(g, test.inner, o, t)
    raise TypeError(f"unknown test {test!r}")


def eval_path(g: LocalTPG, path: ast.Path) -> set[Tuple4]:
    """⟦path⟧_G as a set of (o1, t1, o2, t2) tuples."""
    if isinstance(path, ast.TestExpr):
        return {(o, t, o, t) for o, t in g.pto() if holds(g, path.test, o, t)}
    if isinstance(path, ast.Axis):
        ts = g.times()
        if path.op == "F":
            return {(g.src[e], t, e, t) for e in g.src for t in ts} | {
                (e, t, g.tgt[e], t) for e in g.tgt for t in ts
            }
        if path.op == "B":
            return {(g.tgt[e], t, e, t) for e in g.tgt for t in ts} | {
                (e, t, g.src[e], t) for e in g.src for t in ts
            }
        if path.op == "N":
            return {(o, t, o, t + 1) for o in g.kind for t in ts if t + 1 in ts}
        if path.op == "P":
            return {(o, t, o, t - 1) for o in g.kind for t in ts if t - 1 in ts}
    if isinstance(path, ast.Seq):
        rel = eval_path(g, path.parts[0])
        for p in path.parts[1:]:
            rel = _compose(rel, eval_path(g, p))
        return rel
    if isinstance(path, ast.Union):
        out: set[Tuple4] = set()
        for p in path.parts:
            out |= eval_path(g, p)
        return out
    if isinstance(path, ast.Repeat):
        base = eval_path(g, path.inner)
        # exact n-fold composition
        cur = _identity(g)
        for _ in range(path.lo):
            cur = _compose(cur, base)
        if path.hi is not None:
            out = set(cur)
            for _ in range(path.hi - path.lo):
                cur = _compose(cur, base)
                out |= cur
            return out
        # unbounded: reflexive-transitive closure from the n-fold prefix
        out = set(cur)
        frontier = cur
        while True:
            frontier = _compose(frontier, base) - out
            if not frontier:
                return out
            out |= frontier
    raise TypeError(f"unknown path {path!r}")

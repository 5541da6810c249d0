"""Point-based NavL[PC,NOI] evaluation on Spark DataFrames (Theorem C.1).

The paper's polynomial-time algorithm evaluates the parse tree bottom-up,
materialising for every subexpression a relation of temporal-object pairs
``(o1, t1, o2, t2)`` and combining them with sort-merge joins; numerical
occurrence indicators use exponentiation by squaring (Algorithms 1 and 2).
Here each relation is a DataFrame with schema ``(o1, t1, o2, t2)`` and the
joins are Catalyst joins; ``path[n,m]`` uses the same squaring recursion
(exact ``n``-fold power, then the paper's ``ComputeIntervalRepetition``
doubling for the ``[0, m-n]`` tail), and ``path[n,_]`` iterates doubling to
a fixpoint. Each materialised level is ``localCheckpoint``-ed to keep
lineage flat across the iteration, as iterative dataflow on Spark requires.

This evaluator supports the *full* language (path conditions, negation,
nested occurrence indicators) and is the general-purpose engine; the
interval evaluator (``interval_eval``) is the paper's optimised Section VI
fragment.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..tpg.model import SparkTPG
from . import ast

REL_COLS = ["o1", "t1", "o2", "t2"]


def _ckpt(df: DataFrame) -> DataFrame:
    """Materialise with flat lineage. Capping partitions keeps the many
    small intermediate relations from exploding into hundreds of tasks
    (crossJoin/union multiply partition counts)."""
    if df.rdd.getNumPartitions() > 16:
        df = df.coalesce(16)
    return df.localCheckpoint(eager=True)


class PointEvaluator:
    """Evaluates NavL[PC,NOI] expressions over a point-stamped TPG."""

    def __init__(self, tpg: SparkTPG):
        self.g = tpg
        self._memo: dict[ast.Path, DataFrame] = {}
        self._test_memo: dict[ast.Test, DataFrame] = {}
        self._identity: DataFrame | None = None

    # ------------------------------------------------------------ plumbing
    def identity(self) -> DataFrame:
        """The diagonal of PTO(G): path^0."""
        if self._identity is None:
            pto = self.g.pto()
            self._identity = _ckpt(
                pto.select(
                    F.col("id").alias("o1"),
                    F.col("t").alias("t1"),
                    F.col("id").alias("o2"),
                    F.col("t").alias("t2"),
                )
            )
        return self._identity

    @staticmethod
    def compose(a: DataFrame, b: DataFrame) -> DataFrame:
        """Relation composition (the paper's sort-merge join step)."""
        bb = b.select(
            F.col("o1").alias("_jo"),
            F.col("t1").alias("_jt"),
            "o2",
            "t2",
        )
        return (
            a.select("o1", "t1", F.col("o2").alias("_jo"), F.col("t2").alias("_jt"))
            .join(bb, on=["_jo", "_jt"])
            .select(*REL_COLS)
            .distinct()
        )

    # ---------------------------------------------------------------- tests
    def test_pairs(self, test: ast.Test) -> DataFrame:
        """Temporal objects ``(id, t)`` in PTO(G) satisfying ``test``."""
        if test in self._test_memo:
            return self._test_memo[test]
        g = self.g
        dom = g.domain_df()
        if isinstance(test, ast.NodeTest):
            out = g.objects.filter(F.col("kind") == "node").select("id").crossJoin(dom)
        elif isinstance(test, ast.EdgeTest):
            out = g.objects.filter(F.col("kind") == "edge").select("id").crossJoin(dom)
        elif isinstance(test, ast.LabelTest):
            out = g.objects.filter(F.col("label") == test.label).select("id").crossJoin(dom)
        elif isinstance(test, ast.PropTest):
            out = g.props.filter(
                (F.col("p") == test.prop) & (F.col("v") == test.value)
            ).select("id", "t")
        elif isinstance(test, ast.ExistsTest):
            out = g.exist.select("id", "t")
        elif isinstance(test, ast.LtTest):
            out = g.objects.select("id").crossJoin(dom.filter(F.col("t") < test.k))
        elif isinstance(test, ast.PathTest):
            out = self.rel(test.path).select(
                F.col("o1").alias("id"), F.col("t1").alias("t")
            ).distinct()
        elif isinstance(test, ast.AndTest):
            out = self.test_pairs(test.left).join(
                self.test_pairs(test.right), on=["id", "t"]
            )
        elif isinstance(test, ast.OrTest):
            out = (
                self.test_pairs(test.left)
                .unionByName(self.test_pairs(test.right))
                .distinct()
            )
        elif isinstance(test, ast.NotTest):
            out = g.pto().join(self.test_pairs(test.inner), on=["id", "t"], how="left_anti")
        else:
            raise TypeError(f"unknown test {test!r}")
        out = _ckpt(out.select("id", "t").distinct())
        self._test_memo[test] = out
        return out

    # ---------------------------------------------------------------- paths
    def rel(self, path: ast.Path) -> DataFrame:
        """⟦path⟧_G as a DataFrame ``(o1, t1, o2, t2)``."""
        if path in self._memo:
            return self._memo[path]
        out = _ckpt(self._rel(path))
        self._memo[path] = out
        return out

    def _rel(self, path: ast.Path) -> DataFrame:
        g = self.g
        lo, hi = g.omega
        if isinstance(path, ast.TestExpr):
            s = self.test_pairs(path.test)
            return s.select(
                F.col("id").alias("o1"),
                F.col("t").alias("t1"),
                F.col("id").alias("o2"),
                F.col("t").alias("t2"),
            )
        if isinstance(path, ast.Axis):
            dom = g.domain_df()
            edges = g.objects.filter(F.col("kind") == "edge")
            if path.op in ("F", "B"):
                fwd = path.op == "F"
                a = edges.select(
                    F.col("src" if fwd else "tgt").alias("o1"), F.col("id").alias("o2")
                ).crossJoin(dom)
                b = edges.select(
                    F.col("id").alias("o1"), F.col("tgt" if fwd else "src").alias("o2")
                ).crossJoin(dom)
                return (
                    a.unionByName(b)
                    .select("o1", F.col("t").alias("t1"), "o2", F.col("t").alias("t2"))
                )
            step = 1 if path.op == "N" else -1
            base = g.objects.select("id").crossJoin(dom)
            return base.select(
                F.col("id").alias("o1"),
                F.col("t").alias("t1"),
                F.col("id").alias("o2"),
                (F.col("t") + step).alias("t2"),
            ).filter((F.col("t2") >= lo) & (F.col("t2") <= hi))
        if isinstance(path, ast.Seq):
            rel = self.rel(path.parts[0])
            for p in path.parts[1:]:
                rel = _ckpt(self.compose(rel, self.rel(p)))
            return rel
        if isinstance(path, ast.Union):
            rel = self.rel(path.parts[0])
            for p in path.parts[1:]:
                rel = rel.unionByName(self.rel(p))
            return rel.distinct()
        if isinstance(path, ast.Repeat):
            base = self.rel(path.inner)
            exact = self._power(base, path.lo)
            if path.hi == path.lo:
                return exact
            if path.hi is not None:
                return self.compose(exact, self._upto(base, path.hi - path.lo))
            return self.compose(exact, self._star(base))
        raise TypeError(f"unknown path {path!r}")

    # -------------------------------------------- repetition (Algorithms 1/2)
    def _power(self, base: DataFrame, n: int) -> DataFrame:
        """``base^n`` by exponentiation by squaring (Algorithm 1)."""
        if n == 0:
            return self.identity()
        if n == 1:
            return base
        half = _ckpt(self._power(base, n // 2))
        sq = _ckpt(self.compose(half, half))
        return sq if n % 2 == 0 else self.compose(sq, base)

    def _upto(self, base: DataFrame, n: int) -> DataFrame:
        """``⋃_{i=0..n} base^i`` by doubling (Algorithm 2), exact — no
        overshoot past ``n``."""
        if n == 0:
            return self.identity()
        if n == 1:
            return self.identity().unionByName(base).distinct()
        half = _ckpt(self._upto(base, n // 2))  # covers 0 .. n//2
        even = _ckpt(self.compose(half, half).unionByName(half).distinct())  # 0 .. 2*(n//2)
        if n % 2 == 0:
            return even
        return self.compose(even, base).unionByName(even).distinct()  # 0 .. n

    def _star(self, base: DataFrame) -> DataFrame:
        """Reflexive-transitive closure by doubling to a fixpoint
        (``path[0,_] = path[0,M^2]``, reached in O(log M) rounds)."""
        cur = _ckpt(self.identity().unionByName(base).distinct())
        n = cur.count()
        while True:
            nxt = _ckpt(self.compose(cur, cur).unionByName(cur).distinct())
            m = nxt.count()
            if m == n:
                return nxt
            cur, n = nxt, m

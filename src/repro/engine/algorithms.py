"""The paper's algorithm abstraction ``A = (F, G, X0, M0)`` (Eq. 1).

All four evaluated workloads fit a semiring view after *edge preparation*:

* SSSP:     F(m,w) = m + w,            G = min   (weights as given)
* BFS:      F(m,w) = m + w,            G = min   (weights forced to 1)
* PageRank: F(m,w) = m · w,            G = sum   (w := d / N_u)
* PHP:      F(m,w) = m · w,            G = sum   (w := d·w_uv/Σ_out w_u, the
            source's in-edges dropped → absorbing/penalized source)

``prepare()`` bakes the algorithm-specific weight transform into the edge
list once, so every engine (local kernel, Spark batch loop, Layph's
shortcut deduction — the paper's "automated shortcut deduction" invokes the
user's F and G exactly like this) only ever sees ``(⊗, G)`` on prepared
weights. Incremental runs diff *prepared* edge lists, which transparently
captures PageRank's out-degree side effects.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as Fn

from repro.graphs.schema import canonical_edges, degrees, degrees_spark


@dataclass(frozen=True)
class Algorithm:
    """One vertex-centric workload in accumulative form.

    ``aggregate`` is 'min' (selective, idempotent — traversal workloads) or
    'sum' (accumulative, invertible — iteration workloads); ``combine`` (the
    ⊗ inside F) is '+' for min-workloads and '*' for sum-workloads.
    ``roots`` maps vertex id → initial message; for un-rooted algorithms
    (PageRank) every vertex gets ``uniform_root``.
    """

    name: str
    aggregate: str  # 'min' | 'sum'
    zero_state: float  # identity of G: +inf for min, 0.0 for sum
    identity: float  # identity of ⊗: 0.0 for '+', 1.0 for '*'
    tol: float = 1e-6
    roots: dict[int, float] = field(default_factory=dict)
    uniform_root: float | None = None
    damping: float | None = None
    source: int | None = None

    # ---- classification ------------------------------------------------
    @property
    def is_min(self) -> bool:
        return self.aggregate == "min"

    @property
    def is_sum(self) -> bool:
        return self.aggregate == "sum"

    # ---- F and G on numpy arrays ----------------------------------------
    def combine(self, m: np.ndarray, w: np.ndarray) -> np.ndarray:
        """The ⊗ of F(m, w): + for min-workloads, · for sum-workloads."""
        return m + w if self.is_min else m * w

    # ---- edge preparation ------------------------------------------------
    def prepare(self, edges: pd.DataFrame) -> pd.DataFrame:
        """Pandas edge preparation (see module docstring)."""
        if self.name == "sssp":
            return edges.reset_index(drop=True)
        if self.name == "bfs":
            out = edges.copy()
            out["w"] = 1.0
            return out.reset_index(drop=True)
        deg = degrees(edges).set_index("id")
        out = edges.copy()
        if self.name == "pagerank":
            out["w"] = self.damping / deg.out_deg.reindex(out.src).to_numpy()
        elif self.name == "php":
            out["w"] = (
                self.damping * out.w.to_numpy()
                / deg.out_wsum.reindex(out.src).to_numpy()
            )
            out = out[out.dst != self.source]
        else:  # pragma: no cover - presets only
            raise ValueError(self.name)
        return canonical_edges(out)

    def prepare_spark(self, edges: DataFrame) -> DataFrame:
        """Spark dual of :meth:`prepare` (same output rows)."""
        if self.name == "sssp":
            return edges
        if self.name == "bfs":
            return edges.withColumn("w", Fn.lit(1.0))
        deg = degrees_spark(edges)
        j = edges.join(deg, edges.src == deg.id, "left")
        if self.name == "pagerank":
            out = j.select("src", "dst", (Fn.lit(self.damping) / Fn.col("out_deg")).alias("w"))
        elif self.name == "php":
            out = j.select(
                "src", "dst", (Fn.lit(self.damping) * Fn.col("w") / Fn.col("out_wsum")).alias("w")
            ).where(Fn.col("dst") != Fn.lit(self.source))
        else:  # pragma: no cover
            raise ValueError(self.name)
        return out

    # ---- initial conditions -----------------------------------------------
    def root_messages(self, vertex_ids: np.ndarray) -> pd.Series:
        """M⁰ as a sparse id-indexed series (only non-trivial roots)."""
        if self.uniform_root is not None:
            return pd.Series(self.uniform_root, index=pd.Index(vertex_ids, dtype=np.int64))
        return pd.Series(self.roots, dtype=float)

    def initial_states(self, vertex_ids: np.ndarray) -> pd.Series:
        """X⁰ — the G-identity everywhere."""
        return pd.Series(self.zero_state, index=pd.Index(vertex_ids, dtype=np.int64))


def sssp(source: int, tol: float = 1e-6) -> Algorithm:
    """Single-source shortest paths (Example 1a)."""
    return Algorithm(
        name="sssp", aggregate="min", zero_state=float("inf"), identity=0.0,
        tol=tol, roots={int(source): 0.0}, source=int(source),
    )


def bfs(source: int, tol: float = 1e-6) -> Algorithm:
    """Directed hop count from a source (unit-weight SSSP)."""
    return Algorithm(
        name="bfs", aggregate="min", zero_state=float("inf"), identity=0.0,
        tol=tol, roots={int(source): 0.0}, source=int(source),
    )


def pagerank(d: float = 0.85, tol: float = 1e-6) -> Algorithm:
    """Asynchronous accumulative PageRank (Example 1b)."""
    return Algorithm(
        name="pagerank", aggregate="sum", zero_state=0.0, identity=1.0,
        tol=tol, uniform_root=1.0 - d, damping=d,
    )


def php(source: int, d: float = 0.85, tol: float = 1e-6) -> Algorithm:
    """Penalized hitting probability from ``source`` [Guan et al., SIGMOD'11]."""
    return Algorithm(
        name="php", aggregate="sum", zero_state=0.0, identity=1.0,
        tol=tol, roots={int(source): 1.0}, damping=d, source=int(source),
    )


#: Factory registry used by experiment harnesses: name -> callable(source, **kw).
ALGORITHMS = {
    "sssp": lambda source=0, **kw: sssp(source, **kw),
    "bfs": lambda source=0, **kw: bfs(source, **kw),
    "pagerank": lambda source=0, d=0.85, **kw: pagerank(d, **kw),
    "php": lambda source=0, d=0.85, **kw: php(source, d, **kw),
}

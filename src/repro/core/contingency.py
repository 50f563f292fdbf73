"""ContingencyEngine: Spark-backed contingency tables with the paper's
Sec. 6 optimizations (materialization, entropy caching).

Every statistic in HypDB — entropies, (conditional) mutual information,
the permutation test, the CD algorithm — consumes *contingency tables*:
``count(*) GROUP BY attrs`` results. This module is the single gateway
from a Spark DataFrame to those tables.

Two execution modes, matching the paper:

* **Materialized** (default): one Spark ``groupBy`` over the full
  attribute set produces the joint contingency table (this is exactly an
  OLAP data cube's finest cuboid with a Count measure); it is collected
  to pandas, and every marginal is derived locally by summation. The
  paper observes these tables are "dramatically smaller than the data";
  when they are not (more than ``max_cells`` groups) we fall back to:
* **Per-request**: each ``counts(attrs)`` call runs its own Spark
  ``groupBy``.

The engine also implements the "Caching entropy" optimization: entropies
are memoized by attribute frozenset, since e.g. H(T) and H(TZ) are
shared between I(T;Y|Z) and I(T;W|Z). Both optimizations can be
disabled for the Fig. 6(c) ablation, and the engine keeps counters
(Spark jobs, cache hits, local marginalizations) so the ablation is
measurable.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Mapping, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.entropy import entropy_from_counts

__all__ = ["ContingencyEngine", "EngineStats"]


@dataclass
class EngineStats:
    """Operation counters for the optimization experiments (Fig. 6)."""

    spark_jobs: int = 0
    local_marginalizations: int = 0
    entropy_cache_hits: int = 0
    entropy_cache_misses: int = 0
    independence_tests: int = 0

    def snapshot(self) -> dict:
        return dict(self.__dict__)


@dataclass
class _Shared:
    """State shared between an engine and its pandas-restricted views."""

    stats: EngineStats = field(default_factory=EngineStats)


class ContingencyEngine:
    """Contingency-table and entropy service over one (filtered) dataset.

    Parameters
    ----------
    df:
        Source Spark DataFrame (already filtered to the query's WHERE
        clause / context).
    attrs:
        Attributes the analysis may touch. Defaults to all columns.
    materialize:
        Materialize the joint contingency table over ``attrs`` up front
        (Sec. 6 optimization). Disable for the ablation.
    cache_entropy:
        Memoize entropies by attribute set. Disable for the ablation.
    max_cells:
        Materialization is abandoned if the joint table exceeds this
        many groups, falling back to per-request Spark jobs.
    """

    def __init__(
        self,
        df: DataFrame,
        attrs: Sequence[str] | None = None,
        *,
        materialize: bool = True,
        cache_entropy: bool = True,
        max_cells: int = 2_000_000,
        miller_madow: bool = True,
    ) -> None:
        self.df = df
        self.attrs: tuple[str, ...] = tuple(attrs if attrs is not None else df.columns)
        missing = set(self.attrs) - set(df.columns)
        if missing:
            raise ValueError(f"attrs not in DataFrame: {sorted(missing)}")
        self.miller_madow = miller_madow
        self._cache_entropy = cache_entropy
        self._max_cells = max_cells
        self._shared = _Shared()
        self._entropy_cache: dict[frozenset, float] = {}
        self._counts_cache: dict[tuple[str, ...], pd.DataFrame] = {}
        self._base: pd.DataFrame | None = None
        self._n: int | None = None
        if materialize:
            self._materialize()

    # -- construction helpers ------------------------------------------------

    @classmethod
    def _from_base(cls, parent: "ContingencyEngine", base: pd.DataFrame) -> "ContingencyEngine":
        eng = cls.__new__(cls)
        eng.df = parent.df  # kept for provenance; not used when base is set
        eng.attrs = parent.attrs
        eng.miller_madow = parent.miller_madow
        eng._cache_entropy = parent._cache_entropy
        eng._max_cells = parent._max_cells
        eng._shared = parent._shared
        eng._entropy_cache = {}
        eng._counts_cache = {}
        eng._base = base.reset_index(drop=True)
        eng._n = int(base["n"].sum()) if len(base) else 0
        return eng

    def _materialize(self) -> None:
        """One Spark job: the joint contingency table over ``self.attrs``."""
        agg = self.df.groupBy(*self.attrs).agg(F.count(F.lit(1)).alias("n"))
        # Peek one row beyond the cap so oversized joints are detected
        # without collecting them.
        head = agg.limit(self._max_cells + 1).toPandas()
        self._shared.stats.spark_jobs += 1
        if len(head) > self._max_cells:
            self._base = None  # fall back to per-request groupBys
            return
        self._base = head
        self._n = int(head["n"].sum()) if len(head) else 0

    # -- public surface ------------------------------------------------------

    @property
    def stats(self) -> EngineStats:
        return self._shared.stats

    @property
    def materialized(self) -> bool:
        return self._base is not None

    @property
    def n(self) -> int:
        """Total number of rows in the (filtered) dataset."""
        if self._n is None:
            self._n = self.df.count()
            self._shared.stats.spark_jobs += 1
        return self._n

    def counts(self, attrs: Sequence[str]) -> pd.DataFrame:
        """Contingency table over ``attrs``: columns ``list(attrs) + ['n']``.

        Served from the materialized joint by local summation when
        available, otherwise by a Spark ``groupBy``.
        """
        key = tuple(attrs)
        unknown = set(key) - set(self.attrs)
        if unknown:
            raise ValueError(f"attrs not registered with engine: {sorted(unknown)}")
        if self._cache_entropy and key in self._counts_cache:
            return self._counts_cache[key]
        if not key:
            out = pd.DataFrame({"n": [self.n]})
        elif self._base is not None:
            self._shared.stats.local_marginalizations += 1
            out = (
                self._base.groupby(list(key), observed=True, sort=False)["n"]
                .sum()
                .reset_index()
            )
        else:
            out = (
                self.df.groupBy(*key).agg(F.count(F.lit(1)).alias("n")).toPandas()
            )
            self._shared.stats.spark_jobs += 1
        self._counts_cache[key] = out
        return out

    def restrict(self, conditions: Mapping[str, object]) -> "ContingencyEngine":
        """Engine over the sub-population where each attr equals (or is in)
        the given value(s) — the query's context Gamma. Served from the
        materialized joint without touching Spark when possible."""
        if self._base is not None:
            mask = pd.Series(True, index=self._base.index)
            for col, val in conditions.items():
                vals = val if isinstance(val, (list, tuple, set, frozenset)) else [val]
                mask &= self._base[col].isin(list(vals))
            return ContingencyEngine._from_base(self, self._base[mask])
        cond = F.lit(True)
        for col, val in conditions.items():
            vals = list(val) if isinstance(val, (list, tuple, set, frozenset)) else [val]
            cond = cond & F.col(col).isin(vals)
        return ContingencyEngine(
            self.df.filter(cond),
            self.attrs,
            materialize=False,
            cache_entropy=self._cache_entropy,
            max_cells=self._max_cells,
            miller_madow=self.miller_madow,
        )

    # -- information-theoretic quantities ------------------------------------

    def entropy(self, attrs: Iterable[str], *, plugin: bool = False) -> float:
        """Miller-Madow (or plug-in) entropy H(attrs) in nats, memoized
        per Sec. 6 ("Caching entropy")."""
        key = (frozenset(attrs), plugin)
        if self._cache_entropy and key in self._entropy_cache:
            self._shared.stats.entropy_cache_hits += 1
            return self._entropy_cache[key]
        self._shared.stats.entropy_cache_misses += 1
        c = self.counts(tuple(sorted(key[0])))
        h = entropy_from_counts(
            c["n"].to_numpy(),
            miller_madow=self.miller_madow and not plugin,
        )
        if self._cache_entropy:
            self._entropy_cache[key] = h
        return h

    def plugin_cmi(self, x: str, ys: Sequence[str] | str, z: Iterable[str] = ()) -> float:
        """Plug-in I(X; Ys | Z) from four (cached) plug-in entropies —
        the G-test statistic, computed without materializing per-group
        contingency tables."""
        ys_t = (ys,) if isinstance(ys, str) else tuple(ys)
        zs = frozenset(z)
        ys_set = frozenset(ys_t) - zs
        if not ys_set or x in zs or x in ys_set:
            return 0.0
        return (
            self.entropy(zs | {x}, plugin=True)
            + self.entropy(zs | ys_set, plugin=True)
            - self.entropy(zs | ys_set | {x}, plugin=True)
            - self.entropy(zs, plugin=True)
        )

    def cond_entropy(self, x: str, given: Iterable[str]) -> float:
        """H(X | given) = H(X, given) − H(given)."""
        g = frozenset(given)
        return self.entropy(g | {x}) - self.entropy(g)

    def cmi(self, x: str, y: str, z: Iterable[str] = ()) -> float:
        """Conditional mutual information I(X;Y|Z) in nats:
        H(XZ) + H(YZ) − H(XYZ) − H(Z)."""
        zs = frozenset(z)
        if x in zs or y in zs or x == y:
            raise ValueError(f"x={x!r}, y={y!r}, z={sorted(zs)} must be disjoint")
        return (
            self.entropy(zs | {x})
            + self.entropy(zs | {y})
            - self.entropy(zs | {x, y})
            - self.entropy(zs)
        )

    def set_cmi(self, x: str, ys: Sequence[str], z: Iterable[str] = ()) -> float:
        """I(X ; Ys | Z) for a *set* of right-hand attributes (used by the
        bias test I(T; V | Gamma) and responsibility, Eq. 4)."""
        zs = frozenset(z)
        ys_set = frozenset(ys) - zs
        if not ys_set:
            return 0.0
        if x in zs or x in ys_set:
            raise ValueError("x must be disjoint from ys and z")
        return (
            self.entropy(zs | {x})
            + self.entropy(zs | ys_set)
            - self.entropy(zs | ys_set | {x})
            - self.entropy(zs)
        )

    # -- grouped 2-way tables (for the permutation test) ---------------------

    def grouped_tables(
        self, x: str, y: str | Sequence[str], z: Sequence[str] = ()
    ) -> list[tuple[tuple, np.ndarray]]:
        """For each value z of Z, the 2-way contingency table of (x, y) in
        the subgroup Z=z, as ``(z_value_tuple, r x c ndarray)``. ``y`` may
        be a *set* of attributes, treated jointly (needed for the bias
        test I(T; V | Gamma) where V is a set). With Z = () the single
        entry has key ``()``."""
        z = tuple(z)
        ys = (y,) if isinstance(y, str) else tuple(y)
        pdf = self.counts((x,) + ys + z)
        if pdf.empty:
            return []
        # Vectorized: factorize x, the (joint) y and the (joint) z keys
        # once, scatter-add counts into a (groups, |x|, |y|) array. This
        # is what keeps the permutation test usable with thousands of
        # conditioning groups (the Table-7 sweep regime).
        x_codes, _ = pd.factorize(pdf[x], sort=True)
        if len(ys) == 1:
            y_codes, _ = pd.factorize(pdf[ys[0]], sort=True)
        else:
            y_codes, _ = pd.factorize(
                pd.MultiIndex.from_frame(pdf[list(ys)]), sort=True
            )
        if z:
            if len(z) == 1:
                z_codes, z_keys = pd.factorize(pdf[z[0]], sort=True)
                keys = [(k,) for k in z_keys]
            else:
                z_codes, z_keys = pd.factorize(
                    pd.MultiIndex.from_frame(pdf[list(z)]), sort=True
                )
                keys = [tuple(k) for k in z_keys]
        else:
            z_codes = np.zeros(len(pdf), dtype=np.int64)
            keys = [()]
        cube = np.zeros(
            (len(keys), int(x_codes.max()) + 1, int(y_codes.max()) + 1),
            dtype=np.int64,
        )
        np.add.at(cube, (z_codes, x_codes, y_codes), pdf["n"].to_numpy())
        return [(keys[i], cube[i]) for i in range(len(keys))]

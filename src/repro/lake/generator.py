"""Synthetic data-lake generator (§6.1 / §6.1.1 substitute).

The paper evaluates on three enterprise customer orgs (0.6–42 TB, not
available) and two synthetic lakes grown from Table Union Benchmark and
Kaggle root tables. This module reproduces the *generation process* the
paper describes — a set of root tables plus derived tables produced by
the transformations of §6.1.1 — at laptop scale:

- **Size reduction via sampling**: ``SELECT ... WHERE`` filters whose
  predicate values are drawn from a skewed Zipfian distribution (the
  paper fits Zipf parameters to enterprise queries; we use the same
  family).
- **Adding rows**: new rows sampled from each column's observed
  distribution (kept inside the parent's min/max envelope so the pair
  reaches the content stage, as in real lakes).
- **Adding columns**: linear combinations of existing numeric columns.
- **Noise**: perturbing a fraction of rows of numeric columns —
  in-range (defeats min-max pruning, exercises CLP) or out-of-range
  (caught by min-max pruning).
- **Combinations** of the above, chained to arbitrary depth (derived
  tables can be derived from derived tables, which is what makes the
  paper's correct-edge counts exceed the table count via transitivity).

Every generated table records its provenance ``(transform, parent)`` —
standing in for the §5.1 human expert who knows the generating
transformation of each containment edge.

Presets mirror the paper's five evaluation lakes (three customer orgs
with different schema-overlap profiles, a Table-Union-like lake of many
small tables, and a Kaggle-like lake of fewer, larger tables rooted at
the TPC-H-lite generators of ``repro.synth_data``).
"""
from __future__ import annotations

import hashlib
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from .catalog import Catalog

_COL_POOL = [
    "id", "user_id", "event_id", "session_id", "account_id", "order_id",
    "timestamp", "created_at", "updated_at", "event_date",
    "value", "amount", "price", "quantity", "discount", "tax", "score",
    "revenue", "cost", "balance", "rating", "duration", "clicks", "views",
    "status", "category", "region", "channel", "device", "segment",
    "country", "product_type",
]

_CATEGORY_VOCAB = {
    "status": ["OPEN", "CLOSED", "PENDING", "FAILED"],
    "category": ["A", "B", "C", "D", "E", "F"],
    "region": ["NA", "EU", "APAC", "LATAM"],
    "channel": ["web", "mobile", "email", "store"],
    "device": ["ios", "android", "desktop"],
    "segment": ["SMB", "ENT", "CONSUMER"],
    "country": ["US", "IN", "DE", "FR", "JP", "BR"],
    "product_type": ["STANDARD", "PROMO", "ECONOMY", "LARGE"],
}


def column_kind(name: str) -> str:
    """Deterministic column type by name, shared across every table.

    ``*_id``/``id`` -> int keys, timestamp-ish names -> datetimes,
    names with a category vocabulary -> strings, everything else ->
    floats. Shared typing is what makes common columns joinable across
    tables, as in a real lake with org-wide schema conventions.
    """
    if name in _CATEGORY_VOCAB:
        return "category"
    if name in ("timestamp", "created_at", "updated_at", "event_date"):
        return "datetime"
    if name == "id" or name.endswith("_id"):
        return "int"
    return "float"


@dataclass(frozen=True)
class TransformRecord:
    """Provenance of one derived table.

    ``contained`` says which exact-containment relation the transform
    guarantees by construction: ``"child_in_parent"`` (filters,
    projections, copies), ``"parent_in_child"`` (row/column additions),
    or ``"none"`` (noise). Ground truth is still *computed* brute-force;
    provenance only feeds tests and the §5.1 transformation knowledge.
    """

    child: str
    parent: str
    transform: str
    contained: str


@dataclass
class LakeSpec:
    """Knobs for one generated lake ("customer org")."""

    name: str
    seed: int = 0
    n_roots: int = 6
    n_derived: int = 24
    root_rows: tuple[int, int] = (200, 600)
    root_cols: tuple[int, int] = (5, 10)
    #: probability a root reuses the global value range for a column
    #: (higher -> more cross-root edges survive min-max pruning).
    range_overlap: float = 0.5
    #: roots created as schema-supersets of an earlier root with fresh
    #: data — pure schema-containment noise for SGB to over-detect.
    superset_roots: int = 2
    #: transform -> weight, sampled per derived table.
    mix: dict[str, float] = field(
        default_factory=lambda: {
            "filter": 0.22,
            "project": 0.10,
            "filter_project": 0.10,
            "copy": 0.05,
            "add_cols": 0.10,
            "add_rows": 0.10,
            "perturb": 0.23,
            "shift": 0.10,
            "filter_perturb": 0.10,
        }
    )
    #: perturbation rate eps range (log-uniform): small eps survives CLP
    #: sampling, large eps is caught — this drives the Table 6 sweep.
    perturb_eps: tuple[float, float] = (0.02, 0.6)
    zipf_alpha: float = 1.3
    #: use TPC-H-lite tables from repro.synth_data as additional roots.
    tpch_roots_sf: float | None = None


@dataclass
class GeneratedLake:
    spec: LakeSpec
    catalog: Catalog
    records: list[TransformRecord]
    #: generator-side pandas copies, used only by tests/oracle checks.
    frames: dict[str, pd.DataFrame]


def _col_seed(name: str, spec_seed: int) -> int:
    digest = hashlib.md5(f"{name}:{spec_seed}".encode()).hexdigest()
    return int(digest[:8], 16)


class _LakeBuilder:
    def __init__(self, spark: SparkSession, spec: LakeSpec, root_dir: str):
        self.spark = spark
        self.spec = spec
        self.rng = np.random.default_rng(spec.seed)
        self.catalog = Catalog(spark=spark)
        self.root_dir = root_dir
        self.frames: dict[str, pd.DataFrame] = {}
        self.records: list[TransformRecord] = []

    # ---------- roots ----------

    def _column_values(self, name: str, n: int, shifted: bool) -> np.ndarray:
        kind = column_kind(name)
        g = np.random.default_rng(
            _col_seed(name, self.spec.seed) + self.rng.integers(1, 1 << 20)
        )
        base = _col_seed(name, 0) % 1000
        off = 10_000 if shifted else 0
        if kind == "int":
            return g.integers(base + off, base + off + 5000, n)
        if kind == "datetime":
            start = pd.Timestamp("2020-01-01") + pd.Timedelta(days=off // 100)
            return start + pd.to_timedelta(g.integers(0, 700, n), unit="D")
        if kind == "category":
            return g.choice(_CATEGORY_VOCAB[name], n)
        return np.round(g.uniform(base + off, base + off + 500.0, n), 3)

    def _make_root(self, name: str, cols: list[str], n_rows: int) -> None:
        shifted_cols = {
            c for c in cols if self.rng.random() > self.spec.range_overlap
        }
        pdf = pd.DataFrame(
            {c: self._column_values(c, n_rows, c in shifted_cols) for c in cols}
        )
        pdf = pdf.drop_duplicates().reset_index(drop=True)
        self._register(name, pdf, provenance=None)

    def _register(
        self, name: str, pdf: pd.DataFrame, provenance: tuple[str, str] | None
    ) -> None:
        self.frames[name] = pdf
        sdf = self.spark.createDataFrame(pdf)
        self.catalog.add_parquet(name, sdf, self.root_dir, provenance=provenance)

    def build_roots(self) -> None:
        lo, hi = self.spec.root_cols
        pool = list(_COL_POOL)
        for i in range(self.spec.n_roots):
            k = int(self.rng.integers(lo, hi + 1))
            cols = sorted(self.rng.choice(pool, size=k, replace=False))
            n = int(self.rng.integers(*self.spec.root_rows))
            self._make_root(f"{self.spec.name}_root{i:02d}", cols, n)
        # Schema-superset roots: same token set as an earlier root plus
        # extra columns, but freshly drawn data -> schema edge, no
        # content containment.
        roots = [n for n in self.catalog.names() if "_root" in n]
        for j in range(self.spec.superset_roots):
            if not roots:
                break
            base = roots[int(self.rng.integers(0, len(roots)))]
            base_cols = sorted(self.frames[base].columns)
            extra = [c for c in pool if c not in base_cols]
            add = sorted(
                self.rng.choice(
                    extra, size=min(2, len(extra)), replace=False
                )
            )
            n = int(self.rng.integers(*self.spec.root_rows))
            self._make_root(
                f"{self.spec.name}_sroot{j:02d}", base_cols + add, n
            )
        if self.spec.tpch_roots_sf:
            self._tpch_roots(self.spec.tpch_roots_sf)

    def _tpch_roots(self, sf: float) -> None:
        from .. import synth_data

        for fn in (synth_data.lineitem, synth_data.orders,
                   synth_data.customer, synth_data.part):
            pdf = fn(self.spark, sf=sf, seed=self.spec.seed).toPandas()
            pdf = pdf.drop_duplicates().reset_index(drop=True)
            self._register(f"{self.spec.name}_tpch_{fn.__name__}", pdf, None)

    # ---------- transforms (§6.1.1) ----------

    def _zipf_quantile(self) -> float:
        """Skewed predicate selectivity: Zipf-ranked quantile in (0, 1)."""
        ranks = np.arange(1, 11)
        w = 1.0 / ranks**self.spec.zipf_alpha
        w /= w.sum()
        r = self.rng.choice(ranks, p=w)
        return min(0.95, 0.15 + 0.08 * r)

    def _numeric_cols(self, pdf: pd.DataFrame) -> list[str]:
        return [
            c
            for c in pdf.columns
            if pd.api.types.is_numeric_dtype(pdf[c])
        ]

    def _float_cols(self, pdf: pd.DataFrame) -> list[str]:
        """Float-dtype columns — selected by dtype (not by name
        convention) so TPC-H-lite roots with int key columns are never
        perturbed into a dtype mismatch."""
        return [
            c for c in pdf.columns if pd.api.types.is_float_dtype(pdf[c])
        ]

    def _t_filter(self, pdf: pd.DataFrame) -> tuple[pd.DataFrame, str] | None:
        cols = self._numeric_cols(pdf)
        if not cols:
            return None
        c = cols[int(self.rng.integers(0, len(cols)))]
        q = self._zipf_quantile()
        thresh = pdf[c].quantile(q)
        child = pdf[pdf[c] <= thresh].reset_index(drop=True)
        if child.empty or len(child) == len(pdf):
            child = pdf.iloc[: max(1, len(pdf) // 2)].reset_index(drop=True)
        return child, "child_in_parent"

    def _t_project(self, pdf: pd.DataFrame) -> tuple[pd.DataFrame, str] | None:
        if len(pdf.columns) < 3:
            return None
        drop_n = int(self.rng.integers(1, max(2, len(pdf.columns) // 3) + 1))
        drop = self.rng.choice(pdf.columns, size=drop_n, replace=False)
        child = (
            pdf.drop(columns=list(drop)).drop_duplicates().reset_index(drop=True)
        )
        return child, "child_in_parent"

    def _t_copy(self, pdf: pd.DataFrame) -> tuple[pd.DataFrame, str]:
        return pdf.copy(), "child_in_parent"

    def _t_add_cols(self, pdf: pd.DataFrame) -> tuple[pd.DataFrame, str] | None:
        cols = self._float_cols(pdf)
        if len(cols) < 2:
            return None
        a, b = self.rng.choice(cols, size=2, replace=False)
        child = pdf.copy()
        w1, w2 = self.rng.uniform(0.5, 2.0, 2).round(2)
        # Fresh column name even when chaining add_cols transforms.
        k = 0
        new_col = "derived_metric"
        while new_col in child.columns:
            k += 1
            new_col = f"derived_metric_{k}"
        child[new_col] = (w1 * child[a] + w2 * child[b]).round(3)
        return child, "parent_in_child"

    def _t_add_rows(self, pdf: pd.DataFrame) -> tuple[pd.DataFrame, str] | None:
        if pdf.empty:
            return None
        n_new = max(1, int(len(pdf) * self.rng.uniform(0.05, 0.3)))
        new = {}
        for c in pdf.columns:
            # Resample inside the observed distribution (and hence the
            # min/max envelope) so the pair is not trivially killed by
            # metadata checks.
            new[c] = self.rng.choice(pdf[c].to_numpy(), size=n_new)
        child = (
            pd.concat([pdf, pd.DataFrame(new)], ignore_index=True)
            .drop_duplicates()
            .reset_index(drop=True)
        )
        if len(child) == len(pdf):
            return None
        return child, "parent_in_child"

    def _perturb_inplace(self, child: pd.DataFrame, eps: float) -> bool:
        cols = self._float_cols(child)
        if not cols or len(child) < 4:
            return False
        c = cols[int(self.rng.integers(0, len(cols)))]
        n_mod = max(1, int(len(child) * eps))
        idx = self.rng.choice(len(child), size=n_mod, replace=False)
        lo, hi = child[c].min(), child[c].max()
        span = max(hi - lo, 1e-6)
        # Strictly interior values: immune to min-max pruning.
        child.loc[idx, c] = np.round(
            self.rng.uniform(lo + 0.05 * span, hi - 0.05 * span, n_mod), 4
        )
        return True

    def _t_perturb(self, pdf: pd.DataFrame) -> tuple[pd.DataFrame, str] | None:
        lo, hi = self.spec.perturb_eps
        eps = float(np.exp(self.rng.uniform(np.log(lo), np.log(hi))))
        child = pdf.copy()
        if not self._perturb_inplace(child, eps):
            return None
        return child.drop_duplicates().reset_index(drop=True), "none"

    def _t_filter_perturb(self, pdf: pd.DataFrame):
        filtered = self._t_filter(pdf)
        if filtered is None:
            return None
        child = filtered[0].copy()
        lo, hi = self.spec.perturb_eps
        eps = float(np.exp(self.rng.uniform(np.log(lo), np.log(hi))))
        if not self._perturb_inplace(child, eps):
            return None
        return child.drop_duplicates().reset_index(drop=True), "none"

    def _t_shift(self, pdf: pd.DataFrame) -> tuple[pd.DataFrame, str] | None:
        cols = self._float_cols(pdf)
        if not cols:
            return None
        c = cols[int(self.rng.integers(0, len(cols)))]
        child = pdf.copy()
        span = max(child[c].max() - child[c].min(), 1.0)
        # Push part of the column outside the parent's envelope so the
        # min-max stage can disprove containment from metadata alone.
        n_mod = max(1, len(child) // 5)
        idx = self.rng.choice(len(child), size=n_mod, replace=False)
        child.loc[idx, c] = child.loc[idx, c] + 2.0 * span
        return child.drop_duplicates().reset_index(drop=True), "none"

    def _t_filter_project(self, pdf: pd.DataFrame):
        filtered = self._t_filter(pdf)
        if filtered is None:
            return None
        projected = self._t_project(filtered[0])
        if projected is None:
            return filtered
        return projected[0], "child_in_parent"

    def build_derived(self) -> None:
        transforms = {
            "filter": self._t_filter,
            "project": self._t_project,
            "filter_project": self._t_filter_project,
            "copy": self._t_copy,
            "add_cols": self._t_add_cols,
            "add_rows": self._t_add_rows,
            "perturb": self._t_perturb,
            "filter_perturb": self._t_filter_perturb,
            "shift": self._t_shift,
        }
        names = list(self.spec.mix)
        weights = np.array([self.spec.mix[n] for n in names], dtype=float)
        weights /= weights.sum()
        made = 0
        attempts = 0
        while made < self.spec.n_derived and attempts < self.spec.n_derived * 10:
            attempts += 1
            sources = self.catalog.names()
            parent = sources[int(self.rng.integers(0, len(sources)))]
            kind = str(self.rng.choice(names, p=weights))
            result = transforms[kind](self.frames[parent])
            if result is None:
                continue
            child_pdf, contained = result
            child = f"{self.spec.name}_d{made:03d}_{kind}"
            self._register(child, child_pdf, provenance=(kind, parent))
            self.records.append(
                TransformRecord(
                    child=child, parent=parent, transform=kind, contained=contained
                )
            )
            made += 1


def generate_lake(
    spark: SparkSession, spec: LakeSpec, root_dir: str
) -> GeneratedLake:
    """Generate a lake per ``spec``, Parquet-backed under ``root_dir``."""
    builder = _LakeBuilder(spark, spec, root_dir)
    builder.build_roots()
    builder.build_derived()
    return GeneratedLake(
        spec=spec,
        catalog=builder.catalog,
        records=builder.records,
        frames=builder.frames,
    )


# ---------------------------------------------------------------------------
# Presets mirroring the paper's five evaluation lakes (§6.1), scaled to
# laptop size. ``scale`` multiplies table counts and row counts together
# (tests use scale=1, benchmarks scale>=3).
# ---------------------------------------------------------------------------

def preset(name: str, *, scale: float = 1.0, seed: int | None = None) -> LakeSpec:
    """Build the LakeSpec for one of the paper's lakes.

    - ``customer1``: dense schema overlap, many derivation chains — the
      org with the largest schema graph relative to its size (Fig 2 left).
    - ``customer2``: sparse schema overlap, fewer but larger tables; a
      higher share of low-eps perturbations, so relatively more incorrect
      edges survive CLP (matches Table 1's 315/1192 vs 110/6657).
    - ``customer3``: intermediate, range-disjoint sources (MMP does most
      of the pruning, as in Table 1's 1769 -> 421).
    - ``table_union``: many small tables, deep chains (Table 2 row 1).
    - ``kaggle``: fewer, larger tables rooted at TPC-H-lite (Table 2 row 2).
    """
    def sc(x: int) -> int:
        return max(2, int(round(x * scale)))

    base = dict(seed=seed if seed is not None else 0)
    if name == "customer1":
        return LakeSpec(
            name="customer1", n_roots=sc(6), n_derived=sc(40),
            root_rows=(sc(300), sc(800)), root_cols=(4, 8),
            range_overlap=0.75, superset_roots=sc(3),
            mix={
                "filter": 0.24, "project": 0.10, "filter_project": 0.10,
                "copy": 0.06, "add_cols": 0.10, "add_rows": 0.08,
                "perturb": 0.16, "filter_perturb": 0.10, "shift": 0.06,
            },
            perturb_eps=(0.05, 0.6),
            seed=base["seed"] + 11,
        )
    if name == "customer2":
        return LakeSpec(
            name="customer2", n_roots=sc(8), n_derived=sc(24),
            root_rows=(sc(800), sc(2000)), root_cols=(6, 12),
            range_overlap=0.55, superset_roots=sc(2),
            mix={
                "filter": 0.16, "project": 0.08, "filter_project": 0.08,
                "copy": 0.04, "add_cols": 0.08, "add_rows": 0.08,
                "perturb": 0.28, "filter_perturb": 0.14, "shift": 0.06,
            },
            perturb_eps=(0.01, 0.2),
            seed=base["seed"] + 22,
        )
    if name == "customer3":
        return LakeSpec(
            name="customer3", n_roots=sc(7), n_derived=sc(20),
            root_rows=(sc(600), sc(1500)), root_cols=(5, 10),
            range_overlap=0.35, superset_roots=sc(2),
            mix={
                "filter": 0.18, "project": 0.08, "filter_project": 0.08,
                "copy": 0.04, "add_cols": 0.08, "add_rows": 0.08,
                "perturb": 0.20, "filter_perturb": 0.12, "shift": 0.14,
            },
            perturb_eps=(0.02, 0.4),
            seed=base["seed"] + 33,
        )
    if name == "table_union":
        return LakeSpec(
            name="table_union", n_roots=sc(10), n_derived=sc(60),
            root_rows=(sc(80), sc(250)), root_cols=(4, 9),
            range_overlap=0.7, superset_roots=sc(3),
            mix={
                "filter": 0.26, "project": 0.12, "filter_project": 0.12,
                "copy": 0.06, "add_cols": 0.10, "add_rows": 0.08,
                "perturb": 0.12, "filter_perturb": 0.08, "shift": 0.06,
            },
            perturb_eps=(0.05, 0.6),
            seed=base["seed"] + 44,
        )
    if name == "kaggle":
        return LakeSpec(
            name="kaggle", n_roots=sc(4), n_derived=sc(30),
            root_rows=(sc(500), sc(1200)), root_cols=(5, 10),
            range_overlap=0.6, superset_roots=sc(2),
            mix={
                "filter": 0.24, "project": 0.10, "filter_project": 0.12,
                "copy": 0.05, "add_cols": 0.10, "add_rows": 0.08,
                "perturb": 0.15, "filter_perturb": 0.10, "shift": 0.06,
            },
            perturb_eps=(0.03, 0.5),
            tpch_roots_sf=0.001 * max(1.0, scale),
            seed=base["seed"] + 55,
        )
    raise ValueError(f"unknown preset {name!r}")

"""Reproduction harnesses for the paper's evaluation tables (II–VI).

``Harness`` caches per-dataset feature bundles and per-(dataset, method)
baseline similarity matrices so the table sweeps share work: Table III/IV
reuse the bundles Table V ablates, and Table VI re-ranks the Table III
similarity matrices instead of retraining anything.

Every ``table*`` method returns rows carrying both the measured value and
the paper's reported value (``paper_numbers``), so callers — the jobs in
``jobs/``, the tests, EXPERIMENTS.md — can diff shapes directly.
"""
from __future__ import annotations

from dataclasses import replace

import numpy as np
from pyspark.sql import SparkSession

from repro.baselines.proxies import BASELINES, run_baseline
from repro.core.config import CEAFFConfig
from repro.core.pipeline import FeatureBundle, compute_features, fuse_and_match
from repro.evalx import paper_numbers as paper
from repro.evalx.metrics import ranking_metrics
from repro.kgdata.benchmarks import CROSS_LINGUAL, MONO_LINGUAL, PAPER_N_PAIRS, dataset
from repro.kgdata.model import KGPair
from repro.matching.greedy import independent_top1
from repro.sim.matrices import SimMatrix

#: Table V rows → pipeline configurations (the paper's ablation grid).
ABLATIONS: dict[str, CEAFFConfig] = {
    "ceaff": CEAFFConfig(),
    "wo_ms": CEAFFConfig(use_struct=False),
    "wo_mn": CEAFFConfig(use_semantic=False),
    "wo_ml": CEAFFConfig(use_string=False),
    "wo_aff": CEAFFConfig(weighting="equal"),
    "wo_c": CEAFFConfig(collective=False),
    "wo_c_ms": CEAFFConfig(collective=False, use_struct=False),
    "wo_c_mn": CEAFFConfig(collective=False, use_semantic=False),
    "wo_c_ml": CEAFFConfig(collective=False, use_string=False),
    "wo_c_aff": CEAFFConfig(collective=False, weighting="equal"),
    "wo_theta": CEAFFConfig(theta_override=False),
    "lr": CEAFFConfig(weighting="lr"),
}

TABLE5_DATASETS = ("srprs_en_fr", "srprs_en_de", "srprs_dbp_wd", "srprs_dbp_yg", "dbp15k_zh_en")
TABLE6_DATASETS = ("dbp15k_zh_en", "dbp15k_ja_en", "dbp15k_fr_en")


class Harness:
    """Shared-state driver for the table reproductions.

    ``n_pairs`` is the benchmark scale (aligned pairs per dataset);
    ``use_spark=False`` switches the feature dataflows to their NumPy
    references (handy in unit tests; the jobs keep Spark on).
    """

    def __init__(self, spark: SparkSession | None, *, n_pairs: int = 300, use_spark: bool = True):
        self.spark = spark
        self.n_pairs = n_pairs
        self.cfg = CEAFFConfig(use_spark=use_spark)
        self._pairs: dict[str, KGPair] = {}
        self._bundles: dict[str, FeatureBundle] = {}
        self._baseline_sims: dict[tuple[str, str], SimMatrix] = {}

    def pair(self, name: str) -> KGPair:
        if name not in self._pairs:
            self._pairs[name] = dataset(name, n_pairs=self.n_pairs)
        return self._pairs[name]

    def bundle(self, name: str) -> FeatureBundle:
        if name not in self._bundles:
            self._bundles[name] = compute_features(self.spark, self.pair(name), self.cfg)
        return self._bundles[name]

    def baseline_sim(self, method: str, ds: str) -> SimMatrix:
        key = (method, ds)
        if key not in self._baseline_sims:
            self._baseline_sims[key] = run_baseline(
                method, self.spark, self.pair(ds), self.bundle(ds)
            )
        return self._baseline_sims[key]

    def baseline_accuracy(self, method: str, ds: str) -> float:
        m = self.baseline_sim(method, ds).m
        return float(np.mean(independent_top1(m) == np.arange(m.shape[0])))

    def ceaff_accuracy(self, ds: str, cfg: CEAFFConfig | None = None) -> float:
        cfg = replace(cfg or CEAFFConfig(), use_spark=self.cfg.use_spark)
        return fuse_and_match(self.bundle(ds), cfg).accuracy

    # ----- tables ---------------------------------------------------------

    def table2(self) -> list[dict]:
        """Benchmark statistics, measured at our scale vs the paper's."""
        rows = []
        for name in paper.TABLE2:
            s = self.pair(name).stats()
            p1t, p2t, p1e, p2e = paper.TABLE2[name]
            rows.append(
                {
                    "dataset": name,
                    "kg1_triples": s["kg1_triples"],
                    "kg2_triples": s["kg2_triples"],
                    "kg1_entities": s["kg1_entities"],
                    "kg2_entities": s["kg2_entities"],
                    "n_links": s["n_links"],
                    "n_seed": s["n_seed"],
                    "paper_kg1_triples": p1t,
                    "paper_kg2_triples": p2t,
                    "paper_kg1_entities": p1e,
                    "paper_kg2_entities": p2e,
                    "paper_n_links": PAPER_N_PAIRS[name],
                }
            )
        return rows

    def _accuracy_table(self, datasets: tuple[str, ...], paper_table, methods) -> list[dict]:
        rows = []
        for method in methods:
            for ds in datasets:
                p = paper_table.get(method, {}).get(ds)
                if method == "ceaff":
                    measured = self.ceaff_accuracy(ds)
                elif method == "ceaff_wo_ml":
                    measured = self.ceaff_accuracy(ds, ABLATIONS["wo_ml"])
                elif p is None:
                    # cells the paper leaves blank ("-"): keep them blank.
                    measured = None
                else:
                    measured = self.baseline_accuracy(method, ds)
                rows.append(
                    {"method": method, "dataset": ds, "measured": measured, "paper": p}
                )
        return rows

    def table3(self) -> list[dict]:
        """Cross-lingual accuracy: 10 baselines + CEAFF on 5 KG pairs."""
        methods = [m for m in paper.TABLE3 if m in BASELINES] + ["ceaff"]
        return self._accuracy_table(CROSS_LINGUAL, paper.TABLE3, methods)

    def table4(self) -> list[dict]:
        """Mono-lingual accuracy incl. the CEAFF w/o M^l row."""
        methods = [m for m in paper.TABLE4 if m in BASELINES] + ["ceaff_wo_ml", "ceaff"]
        return self._accuracy_table(MONO_LINGUAL, paper.TABLE4, methods)

    def table5(self) -> list[dict]:
        """Ablation grid: 12 configurations × 5 datasets."""
        rows = []
        for key, cfg in ABLATIONS.items():
            for ds in TABLE5_DATASETS:
                rows.append(
                    {
                        "method": key,
                        "dataset": ds,
                        "measured": self.ceaff_accuracy(ds, cfg),
                        "paper": paper.TABLE5[key][ds],
                    }
                )
        return rows

    def table6(self) -> list[dict]:
        """Ranking evaluation on DBP15K: Hits@1/10 + MRR for independent
        matchers; accuracy (Hits@1 only) for collective CEAFF."""
        rows = []
        methods = [m for m in paper.TABLE6 if m in BASELINES]
        for method in methods:
            for ds in TABLE6_DATASETS:
                mets = ranking_metrics(self.baseline_sim(method, ds).m)
                ph1, ph10, pmrr = paper.TABLE6[method][ds]
                rows.append(
                    {
                        "method": method,
                        "dataset": ds,
                        **mets,
                        "paper_hits1": ph1,
                        "paper_hits10": ph10,
                        "paper_mrr": pmrr,
                    }
                )
        for ds in TABLE6_DATASETS:
            fused = fuse_and_match(
                self.bundle(ds), replace(CEAFFConfig(collective=False), use_spark=self.cfg.use_spark)
            ).fused.m
            mets = ranking_metrics(fused)
            ph1, ph10, pmrr = paper.TABLE6["ceaff_wo_c"][ds]
            rows.append(
                {
                    "method": "ceaff_wo_c",
                    "dataset": ds,
                    **mets,
                    "paper_hits1": ph1,
                    "paper_hits10": ph10,
                    "paper_mrr": pmrr,
                }
            )
        for ds in TABLE6_DATASETS:
            rows.append(
                {
                    "method": "ceaff",
                    "dataset": ds,
                    "hits1": self.ceaff_accuracy(ds),
                    "hits10": None,
                    "mrr": None,
                    "paper_hits1": paper.TABLE6["ceaff"][ds][0],
                    "paper_hits10": None,
                    "paper_mrr": None,
                }
            )
        return rows


def format_rows(rows: list[dict], *, pivot: str | None = "dataset") -> str:
    """Render table rows as an aligned text table.

    With ``pivot``, rows sharing ``method`` are folded into one line with a
    ``measured/paper`` cell per pivot value (how the paper lays its tables
    out); without, one line per row with every scalar column.
    """

    def fmt(v) -> str:
        if v is None:
            return "-"
        if isinstance(v, float):
            return f"{v:.3f}"
        return str(v)

    if pivot and rows and "measured" in rows[0]:
        methods = list(dict.fromkeys(r["method"] for r in rows))
        pivots = list(dict.fromkeys(r[pivot] for r in rows))
        width = max(len(p) for p in pivots) + 2
        head = "method".ljust(14) + "".join(p.rjust(width + 12) for p in pivots)
        lines = [head, "-" * len(head)]
        for m in methods:
            cells = []
            for p in pivots:
                r = next((x for x in rows if x["method"] == m and x[pivot] == p), None)
                cell = f"{fmt(r['measured'])}/{fmt(r['paper'])}" if r else "-"
                cells.append(cell.rjust(width + 12))
            lines.append(m.ljust(14) + "".join(cells))
        lines.append("(cells are measured/paper)")
        return "\n".join(lines)

    cols = list(rows[0].keys())
    widths = {c: max(len(c), *(len(fmt(r[c])) for r in rows)) + 2 for c in cols}
    head = "".join(c.rjust(widths[c]) for c in cols)
    lines = [head, "-" * len(head)]
    for r in rows:
        lines.append("".join(fmt(r[c]).rjust(widths[c]) for c in cols))
    return "\n".join(lines)

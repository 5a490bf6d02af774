"""Finetuning + evaluation harness for Tables 2, 3 and 4.

Pipeline per (benchmark, model):

1. materialize the benchmark's tables as a cell-long lake in Spark,
2. compute column/table sketches with the distributed §3 jobs,
3. assemble pair features (driver-side numpy over the collected
   sketches — the GPU-side of the paper's pipeline),
4. train the task head per seed with patience-5 early stopping,
5. report weighted F1 (classification), R2 (regression) or multi-label
   weighted F1 on the test split.

Sketches are computed once per benchmark and shared across models and
seeds, mirroring how the paper finetunes many models over one corpus.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core import baselines as bl
from ..core import metrics
from ..core import sketches as sks
from ..core.features import PairFeaturizer, SketchStore
from ..core.mlp import MLP, TASK_BINARY, TASK_MULTICLASS, TASK_MULTILABEL, TASK_REGRESSION
from ..core.pretrain import PretrainedTabSketchFM, pretrain
from ..lake import format as lf
from ..lakebench import corpus, registry
from ..lakebench.base import Benchmark

MODELS = ["vanilla_bert", "tapas", "tabbie", "tuta", "tabert", "tabsketchfm"]

# Ablation configurations for Tables 3 (only-one) and 4 (remove-one).
ABLATIONS_ONLY = {
    "only_minhash": dict(use_minhash=True, use_numerical=False, use_content=False),
    "only_numerical": dict(use_minhash=False, use_numerical=True, use_content=False),
    "only_content": dict(use_minhash=False, use_numerical=False, use_content=True),
    "full": dict(use_minhash=True, use_numerical=True, use_content=True),
}
ABLATIONS_REMOVE = {
    "no_minhash": dict(use_minhash=False, use_numerical=True, use_content=True),
    "no_numerical": dict(use_minhash=True, use_numerical=False, use_content=True),
    "no_content": dict(use_minhash=True, use_numerical=True, use_content=False),
    "full": dict(use_minhash=True, use_numerical=True, use_content=True),
}

# Table 3/4 skip TUS-SANTOS (solvable from headers alone, §6.2).
ABLATION_TASKS = [n for n in registry.PAPER_ORDER if n != "tus_santos"]


def sketch_benchmark(spark: SparkSession, bench: Benchmark, num_perm: int = 64) -> SketchStore:
    """Spark job: lake → column + table sketches → driver-side store."""
    cells, _ = lf.build_lake(spark, bench.tables, bench.descriptions)
    col_sk, tab_sk = sks.sketches_to_pandas(
        sks.column_sketches(cells, num_perm=num_perm),
        sks.table_sketches(cells, num_perm=num_perm),
    )
    return SketchStore(col_sk, tab_sk, bench.descriptions)


def default_pretrained(spark: SparkSession, n_tables: int = 45, seed: int = 999) -> PretrainedTabSketchFM:
    """Pretrain (§4 substitute) on the disjoint synthetic corpus."""
    tables, desc = corpus.pretrain_corpus(spark, n_tables=n_tables, seed=seed)
    cells, _ = lf.build_lake(spark, tables, desc)
    col_sk, tab_sk = sks.sketches_to_pandas(
        sks.column_sketches(cells), sks.table_sketches(cells)
    )
    return pretrain(col_sk, tab_sk, desc, epochs=25)


def labels_for(bench: Benchmark, split: pd.DataFrame) -> np.ndarray:
    if bench.task == "multilabel":
        return np.vstack([np.asarray(l, dtype=float) for l in split["label"]])
    if bench.task == "regression":
        return split["label"].to_numpy(dtype=float)
    return split["label"].to_numpy(dtype=int)


def _head_task(bench: Benchmark) -> tuple[str, int]:
    if bench.task == "binary":
        return TASK_BINARY, 2
    if bench.task == "regression":
        return TASK_REGRESSION, 1
    return TASK_MULTILABEL, len(bench.label_names)


def make_featurizer(
    bench: Benchmark,
    store: SketchStore | None,
    model_name: str,
    pre: PretrainedTabSketchFM | None,
    config: dict | None = None,
):
    """Featurizer for one model; ``config`` are TabSketchFM sketch toggles."""
    extra = bench.label_names[:-1] if bench.task == "multilabel" else []
    if model_name == "tabsketchfm":
        cfg = dict(config or {})
        enc = pre.encoder(**cfg) if pre is not None else None
        return PairFeaturizer(store, encoder=enc, extra_names=extra, **cfg)
    cls = bl.BASELINES[model_name]
    return cls(bench.tables, bench.descriptions, extra_names=extra)


def train_eval(
    bench: Benchmark,
    feats: dict[str, np.ndarray],
    seed: int,
    epochs: int = 120,
) -> float:
    """Train the head on train/valid features; score the test split."""
    task, out_dim = _head_task(bench)
    y = {s: labels_for(bench, bench.split(s)) for s in ("train", "valid", "test")}
    head = MLP(feats["train"].shape[1], out_dim, task, seed=seed, lr=3e-3)
    head.fit(feats["train"], y["train"], feats["valid"], y["valid"], epochs=epochs, seed=seed)
    pred = head.predict(feats["test"])
    if task == TASK_REGRESSION:
        return metrics.r2_score(y["test"], pred)
    if task == TASK_MULTILABEL:
        return metrics.multilabel_weighted_f1(y["test"], pred)
    return metrics.weighted_f1(y["test"], pred)


def featurize_splits(bench: Benchmark, featurizer) -> dict[str, np.ndarray]:
    return {s: featurizer.matrix(bench.split(s)) for s in ("train", "valid", "test")}


@dataclass
class TaskResult:
    benchmark: str
    model: str
    metric: str
    mean: float
    std: float


def run_model(
    bench: Benchmark,
    store: SketchStore | None,
    model_name: str,
    pre: PretrainedTabSketchFM | None,
    seeds: tuple[int, ...] = (0, 1, 2, 3, 4),
    config: dict | None = None,
) -> TaskResult:
    featurizer = make_featurizer(bench, store, model_name, pre, config)
    feats = featurize_splits(bench, featurizer)
    scores = [train_eval(bench, feats, seed=s) for s in seeds]
    metric = "R2" if bench.task == "regression" else "F1"
    return TaskResult(bench.name, model_name, metric, float(np.mean(scores)), float(np.std(scores)))


def table2(
    spark: SparkSession,
    scale: float = 1.0,
    seeds: tuple[int, ...] = (0, 1, 2, 3, 4),
    models: list[str] | None = None,
    benchmarks: list[str] | None = None,
    pre: PretrainedTabSketchFM | None = None,
) -> pd.DataFrame:
    """Reproduce Table 2: every model on every LakeBench task."""
    models = models or MODELS
    benchmarks = benchmarks or registry.PAPER_ORDER
    pre = pre or default_pretrained(spark)
    rows = []
    for bname in benchmarks:
        bench = registry.build(bname, scale=scale, seed=0)
        store = sketch_benchmark(spark, bench)
        for m in models:
            r = run_model(bench, store, m, pre, seeds=seeds)
            rows.append(
                {"benchmark": bname, "metric": r.metric, "model": m,
                 "mean": round(r.mean, 3), "std": round(r.std, 3)}
            )
    return pd.DataFrame(rows)


def _ablation(
    spark: SparkSession,
    configs: dict[str, dict],
    scale: float,
    seed: int,
    benchmarks: list[str] | None,
    pre: PretrainedTabSketchFM | None,
) -> pd.DataFrame:
    benchmarks = benchmarks or ABLATION_TASKS
    pre = pre or default_pretrained(spark)
    rows = []
    for bname in benchmarks:
        bench = registry.build(bname, scale=scale, seed=0)
        store = sketch_benchmark(spark, bench)
        row = {"benchmark": bname, "metric": "R2" if bench.task == "regression" else "F1"}
        for cname, cfg in configs.items():
            r = run_model(bench, store, "tabsketchfm", pre, seeds=(seed,), config=cfg)
            row[cname] = round(r.mean, 3)
        rows.append(row)
    return pd.DataFrame(rows)


def table3(spark, scale: float = 1.0, seed: int = 0, benchmarks=None, pre=None) -> pd.DataFrame:
    """Table 3: TabSketchFM with only one sketch type (seed 0, as in paper)."""
    return _ablation(spark, ABLATIONS_ONLY, scale, seed, benchmarks, pre)


def table4(spark, scale: float = 1.0, seed: int = 0, benchmarks=None, pre=None) -> pd.DataFrame:
    """Table 4: TabSketchFM with one sketch type removed."""
    return _ablation(spark, ABLATIONS_REMOVE, scale, seed, benchmarks, pre)

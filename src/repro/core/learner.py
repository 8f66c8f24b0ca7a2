"""Training orchestration: the distributed stream feeds all algorithms.

``train_many`` runs EXACTMLE / BASELINE / UNIFORM / NONUNIFORM over the
*same* simulated distributed stream (as the paper's simulator does): the
per-micro-batch Spark aggregation to ``(counter_id, site, n)`` is
computed once and fed to every algorithm's counter engine; the engines
differ only in their per-counter error parameters. The coordinator-side
protocol (estimates, rounds, message tally) runs on the driver —
mirroring the monitoring model's single-coordinator topology.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import SparkSession

from repro.bayesnet.cpd import GroundTruth
from repro.core.budget import counter_eps, naive_bayes_eps
from repro.core.model import CountModel
from repro.distmon.batch import BatchCounterEngine, ExactCounterEngine
from repro.stream.aggregate import aggregate_generated, aggregate_local
from repro.stream.events import batch_ranges


@dataclass
class TrainResult:
    """Outcome of training one algorithm over ``m`` streamed events."""

    algo: str
    model: CountModel
    total_messages: int
    #: (events processed, cumulative messages) after each micro-batch —
    #: the Figure 9 curve.
    history: list[tuple[int, int]] = field(default_factory=list)
    #: (events processed, counter-value snapshot) per micro-batch when
    #: ``collect_snapshots`` — the Figures 3-8 curves.
    snapshots: list[tuple[int, np.ndarray]] = field(default_factory=list)


def _shared_parent_remap(gt: GroundTruth) -> np.ndarray:
    """Naive-Bayes shared-counter id remap (Algorithm 4).

    All leaves' parent counters track the same event ``X_0 = x_0``; the
    optimized algorithm keeps one physical copy. We remap every leaf's
    parent-counter ids onto leaf 1's block, so the engine maintains (and
    charges messages for) a single shared counter per root value.
    """
    net = gt.net
    remap = np.arange(net.n_counters, dtype=np.int64)
    for i in range(2, net.n):
        lo, hi = net.par_offset[i], net.par_offset[i + 1]
        remap[lo:hi] = np.arange(net.par_offset[1], net.par_offset[2])
    return remap


def _expand_shared(net, values: np.ndarray) -> np.ndarray:
    out = values.copy()
    for i in range(2, net.n):
        out[net.par_offset[i] : net.par_offset[i + 1]] = values[
            net.par_offset[1] : net.par_offset[2]
        ]
    return out


def train_many(
    spark: SparkSession | None,
    gt: GroundTruth,
    algos: list[str],
    *,
    m: int,
    k: int,
    eps: float,
    seed: int,
    first_batch: int = 1024,
    rows_per_task: int = 16384,
    collect_snapshots: bool = False,
    lam: float = 0.5,
    proto_c: float = 1.0,
) -> dict[str, TrainResult]:
    """Train every algorithm in ``algos`` over the same ``m``-event stream.

    ``algos`` entries: ``"exact"``, ``"baseline"``, ``"uniform"``,
    ``"nonuniform"``, or ``"nb-shared"`` (Naive-Bayes Algorithm 4; the
    network must be a root-0 Naive Bayes). Pass ``spark=None`` to use
    the driver-side reference aggregation (unit tests / tiny runs).
    """
    net = gt.net
    engines: dict[str, object] = {}
    remaps: dict[str, np.ndarray | None] = {}
    for j, algo in enumerate(algos):
        if algo == "exact":
            engines[algo] = ExactCounterEngine(net.n_counters)
            remaps[algo] = None
        elif algo == "nb-shared":
            engines[algo] = BatchCounterEngine(
                naive_bayes_eps(net, eps), k, seed=seed * 1000 + j, proto_c=proto_c
            )
            remaps[algo] = _shared_parent_remap(gt)
        else:
            engines[algo] = BatchCounterEngine(
                counter_eps(net, algo, eps), k, seed=seed * 1000 + j, proto_c=proto_c
            )
            remaps[algo] = None

    results = {
        algo: TrainResult(algo, None, 0, [(0, 0)]) for algo in algos  # type: ignore[arg-type]
    }
    for lo, hi in batch_ranges(m, first=first_batch):
        if spark is not None:
            cid, sid, n = aggregate_generated(
                spark, gt, lo, hi, k=k, seed=seed, rows_per_task=rows_per_task
            )
        else:
            cid, sid, n = aggregate_local(gt, lo, hi, k=k, seed=seed)
        for algo in algos:
            eng = engines[algo]
            rm = remaps[algo]
            eng.update(rm[cid] if rm is not None else cid, sid, n)
            results[algo].history.append((hi, eng.total_messages))
            if collect_snapshots:
                vals = eng.estimates()
                if rm is not None:
                    vals = _expand_shared(net, vals)
                results[algo].snapshots.append((hi, vals))

    for algo in algos:
        eng = engines[algo]
        vals = eng.estimates()
        if remaps[algo] is not None:
            vals = _expand_shared(net, vals)
        results[algo].model = CountModel(net, vals, lam=lam)
        results[algo].total_messages = eng.total_messages
    return results

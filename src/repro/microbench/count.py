"""The paper's counting microbenchmark (§5.2–§5.3).

A stream of random integer identifiers is drawn uniformly from a domain of
``nominal_keys``; the query maintains the cumulative occurrence count per
identifier. Two flavours exist:

* ``hash`` — HashMap-backed bins ("hash count");
* ``key``  — dense-array bins ("key count").

Both flavours store counts in dense numpy arrays here; the flavour selects
the calibrated per-record/byte cost constants (HashMap probing vs array
indexing, 64 B vs 8 B per key). The *nominal* domain drives costs and state
sizes; the *actual* in-memory domain is scaled down (``scaled_keys``) so that
runs stay laptop-sized while counts remain real and oracle-checkable
(substitution documented in DESIGN.md).

Each run pre-loads the nominal state footprint (the paper pre-loads one
instance of each key), runs an open-loop input at ``rate`` records/s, and
optionally performs timed migrations via :class:`MigrationDriver`.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Optional

import numpy as np

from repro.core.binning import range_bin_bounds, range_bin_of_keys
from repro.core.control import ConfigAuthority
from repro.core.operators import MigratableOperator, NativeOperator, StateLogic
from repro.core.strategies import (
    MigrationDriver,
    MigrationRecord,
    initial_assignment,
    migration_moves,
    rebalance_moves,
)
from repro.core.binning import hash_keys
from repro.latency.histogram import LatencyHistogram
from repro.timely.cost import CostModel
from repro.timely.engine import Batch, InputHandle, Simulation


class CountLogic(StateLogic):
    """Dense per-key counts for one worker, range-partitioned into bins."""

    def __init__(
        self,
        worker: int,
        *,
        scaled_keys: int,
        n_bins: int,
        bin_nbytes: float,
        assignment: np.ndarray,
    ):
        self.worker = worker
        self.scaled_keys = scaled_keys
        self.n_bins = n_bins
        self.bin_nbytes = bin_nbytes
        self.counts = np.zeros(scaled_keys, dtype=np.int64)
        self.owned = {int(b) for b in np.nonzero(assignment == worker)[0]}

    def apply(self, time: int, data) -> None:
        np.add.at(self.counts, data["k"], 1)

    def extract_bin(self, b: int):
        lo, hi = range_bin_bounds(b, self.n_bins, self.scaled_keys)
        payload = self.counts[lo:hi].copy()
        self.counts[lo:hi] = 0
        self.owned.discard(b)
        return payload, self.bin_nbytes

    def install_bin(self, b: int, payload, nbytes: float) -> None:
        lo, hi = range_bin_bounds(b, self.n_bins, self.scaled_keys)
        self.counts[lo:hi] += payload
        self.owned.add(b)

    def owned_bins(self) -> int:
        return len(self.owned)


class NativeCountLogic(StateLogic):
    """Baseline: per-worker dense counts, no bins (not migrateable)."""

    def __init__(self, worker: int, scaled_keys: int):
        self.counts = np.zeros(scaled_keys, dtype=np.int64)

    def apply(self, time: int, data) -> None:
        np.add.at(self.counts, data["k"], 1)

    def owned_bins(self) -> int:
        return 0


@dataclass
class CountRun:
    """Result of one counting run."""

    impl: str
    flavour: str
    nominal_keys: float
    n_bins: int
    rate: float
    latency: LatencyHistogram
    steady: LatencyHistogram
    migrations: list[MigrationRecord]
    memory_samples: list
    total_records: int
    final_counts: Optional[np.ndarray] = None
    input_keys: Optional[np.ndarray] = None
    sim: Optional[Simulation] = None


def run_count(
    *,
    impl: str = "megaphone",
    flavour: str = "key",
    nominal_keys: float = 256e6,
    scaled_keys: Optional[int] = None,
    rate: float = 4e6,
    n_bins: int = 4096,
    duration_s: float = 5.0,
    warmup_s: float = 1.0,
    migrations: Optional[list[dict]] = None,
    cost: Optional[CostModel] = None,
    seed: int = 7,
    sample_memory: bool = False,
    keep_inputs: bool = False,
    drain: bool = True,
    initial_imbalanced: bool = False,
    completion_timeout_s: float = 600.0,
    strict_completion: bool = True,
) -> CountRun:
    """Run the counting benchmark.

    ``migrations`` is a list of dicts: ``{"at_s": float, "moves":
    "imbalance"|"rebalance"|list, "strategy": str, "batch_size": int|None,
    "gap_ticks": int}``. The steady-state histogram covers
    ``[warmup_s, first migration)`` (or the whole post-warmup run when no
    migration is scheduled).
    """
    cost = cost or CostModel()
    sim = Simulation(cost)
    sim.sample_memory = sample_memory
    W = cost.workers
    if scaled_keys is None:
        scaled_keys = int(min(nominal_keys, 1 << 20))
    scaled_keys = max(scaled_keys, n_bins)
    bin_nbytes = nominal_keys / n_bins * cost.bytes_per_key(flavour)
    c_record = cost.record_cost(flavour, impl, nominal_keys)

    data_in = InputHandle(sim, "data")
    assign = initial_assignment(n_bins, W)
    if initial_imbalanced:
        # start from the post-first-migration (imbalanced) configuration, so
        # a "rebalance" migration reproduces the paper's reported *second*
        # migration without paying for simulating the first
        for b, w in migration_moves(n_bins, W):
            assign[b] = w
    logics: list[StateLogic] = []
    driver = None
    authority = None
    if impl == "megaphone":
        control_in = InputHandle(sim, "control")
        authority = ConfigAuthority(n_bins, assign)
        mo = MigratableOperator(
            sim,
            "count",
            n_bins=n_bins,
            initial_assignment=assign,
            logic_factory=lambda w: _make_logic(
                logics, w, scaled_keys, n_bins, bin_nbytes, assign
            ),
            c_record=c_record,
            data_input=data_in,
            control_input=control_in,
            bin_fn=lambda keys: range_bin_of_keys(keys, n_bins, scaled_keys),
            authority=authority,
        )
        probe = mo.probe
        # pre-loaded nominal state footprint, per process
        for b in range(n_bins):
            sim.state_bytes[cost.process_of(int(assign[b]))] += bin_nbytes
        gap_ticks = max((m.get("gap_ticks", 0) for m in migrations or []), default=0)
        driver = MigrationDriver(
            sim, control_in, probe, authority=authority, gap_ticks=gap_ticks
        )
        for m in migrations or []:
            moves = m["moves"]
            if moves == "imbalance":
                moves = migration_moves(n_bins, W)
            elif moves == "rebalance":
                moves = rebalance_moves(n_bins, W)
            driver.schedule_migration(
                m["at_s"],
                moves,
                m["strategy"],
                batch_size=m.get("batch_size"),
                assignment=assign,
            )
    else:
        assert not migrations, "native operator cannot migrate"
        no = NativeOperator(
            sim,
            "count",
            logic_factory=lambda w: _make_logic_native(logics, w, scaled_keys),
            c_record=c_record,
            data_input=data_in,
        )
        probe = no.probe
        sim.state_bytes[:] = (
            nominal_keys * cost.bytes_per_key(flavour) / cost.processes
        )

    rng = np.random.default_rng(seed)
    steady = LatencyHistogram()
    first_mig = min((m["at_s"] for m in migrations or []), default=duration_s)
    all_keys: list[np.ndarray] = []
    frac = [0.0]
    tick_ns = int(round(cost.tick * 1e9))

    def feed(sim_: Simulation, t0: float) -> None:
        if data_in.epoch is None:  # closed during drain
            return
        t_ns = int(round(t0 * 1e9))
        frac[0] += rate * cost.tick
        n = int(frac[0])
        frac[0] -= n
        if n > 0:
            keys = rng.integers(0, scaled_keys, n)
            if keep_inputs:
                all_keys.append(keys)
            # records dispatched at tick start arrived during the preceding
            # tick interval (open-loop batching granularity = one tick)
            arrivals = t0 - cost.tick + np.linspace(0.0, cost.tick, n, endpoint=False)
            # ingest at one worker per process, rotating each tick (the
            # paper's harness feeds at every process; rotation keeps the
            # ingest-side routing cost balanced across workers over time)
            wpp = cost.workers_per_process
            group = sim_.tick_index % wpp
            targets = [w for w in range(W) if w % wpp == group]
            splits = np.array_split(np.arange(n), len(targets))
            for w, idx in zip(targets, splits):
                if len(idx):
                    data_in.send(
                        w,
                        Batch(
                            time=t_ns,
                            data={"k": keys[idx[0] : idx[-1] + 1]},
                            arrivals=arrivals[idx[0] : idx[-1] + 1],
                            nbytes=8.0 * len(idx),
                        ),
                    )
        data_in.advance_to(t_ns + tick_ns)

    sim.on_tick.insert(0, feed)
    in_steady = [False]

    def steady_window(sim_: Simulation, t0: float) -> None:
        want = warmup_s <= t0 < first_mig
        if want and not in_steady[0]:
            sim_.latency_windows.append(steady)
            in_steady[0] = True
        elif not want and in_steady[0]:
            sim_.latency_windows.remove(steady)
            in_steady[0] = False

    sim.on_tick.append(steady_window)

    sim.run(duration_s)
    # run on until scheduled migrations complete
    if driver is not None and not driver.idle:
        sim.run_until(lambda s: driver.idle, max_seconds=completion_timeout_s)
        if strict_completion:
            assert driver.idle, "migration did not complete (liveness violation)"
    total = sim.latency.total
    if drain:
        sim.drain(max_seconds=600.0)

    final = None
    if logics:
        final = logics[0].counts.copy()
        for lg in logics[1:]:
            final += lg.counts
    return CountRun(
        impl=impl,
        flavour=flavour,
        nominal_keys=nominal_keys,
        n_bins=n_bins,
        rate=rate,
        latency=sim.latency,
        steady=steady,
        migrations=list(driver.records) if driver else [],
        memory_samples=sim.memory_samples,
        total_records=total,
        final_counts=final,
        input_keys=np.concatenate(all_keys) if all_keys else None,
        sim=sim,
    )


def _make_logic(logics, w, scaled_keys, n_bins, bin_nbytes, assign):
    lg = CountLogic(
        w,
        scaled_keys=scaled_keys,
        n_bins=n_bins,
        bin_nbytes=bin_nbytes,
        assignment=assign,
    )
    logics.append(lg)
    return lg


def _make_logic_native(logics, w, scaled_keys):
    lg = NativeCountLogic(w, scaled_keys)
    logics.append(lg)
    return lg

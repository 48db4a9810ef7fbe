"""Multithreaded tables: calibrated simulator + Spark wall-clock (paper
Figs. 8a, 8d, 9a, 10c/d, 11b/11d, 12a/12b/12c, 13b/13c).

Single-threaded service times are *measured* from the real structures
(``repro.bench.calibrate``) and fed to the discrete-event simulator
(DESIGN.md §3.1); the Spark harness provides genuine multicore wall-clock
for the PIM-style range-partitioned join, used both as its own table and
as a cross-check of the simulator's scaling shape.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd

from repro.bench import calibrate
from repro.concurrency.simulator import (
    ServiceTimes,
    SimConfig,
    SimResult,
    drift_partition_probs,
    simulate,
    simulate_round_robin,
)
from repro.core.pim_tree import PIMTree
from repro.join import ibwj
from repro.join.streams import diff_for_match_rate, gen_stream

N_SIM_TUPLES = 40_000
HW_THREADS = 16  # the paper's octa-core with hyper-threading


def _sim_len(st) -> int:
    """Simulated tuple count: long enough to cover >= 3 merge cycles —
    otherwise large-m configurations would never pay a merge and
    multithreaded throughput would be overstated."""
    if not st.merge_interval:
        return N_SIM_TUPLES
    return min(400_000, max(N_SIM_TUPLES, int(3.2 * st.merge_interval)))


def _pim_subindex_count(w: int, d_i: int) -> int:
    """Number of PIM sub-indexes at steady state for (w, D_I) — measured
    from a populated tree, not assumed."""
    t = PIMTree(w, 1.0, d_i)
    rng = np.random.default_rng(0)
    for p in range(1, w + 1):
        t.insert(int(rng.integers(0, 1 << 24)), p)
    t.merge(1)
    return t.n_subindexes


_CAL_CACHE: dict[tuple, tuple] = {}


def _pim_calibration(
    w: int, d_i: int, merge_ratio: float, match_rate: float, n_process: int
):
    """Cached (calibration, service_times, n_partitions) for one config.

    When the calibration window is too short to see a merge, the merge
    interval comes from the threshold analytically (one merge per m*w
    own-stream inserts per index = every ~m*w global tuples overall) and
    the merge duration from a directly timed rebuild.
    """
    key = (w, d_i, merge_ratio, match_rate, n_process)
    if key not in _CAL_CACHE:
        cal = calibrate.measure(
            "pim",
            w,
            n_process=n_process,
            match_rate=match_rate,
            merge_ratio=merge_ratio,
            insertion_depth=d_i,
        )
        st = calibrate.service_times_pim(cal)
        if st.merge_interval == 0:
            st.merge_interval = max(1, int(merge_ratio * w))
            st.merge_duration = calibrate.measure_merge_cost(
                w, merge_ratio, d_i
            )
        _CAL_CACHE[key] = (cal, st, _pim_subindex_count(w, d_i))
    return _CAL_CACHE[key]


def _sim_pim(
    w: int,
    n_threads: int,
    *,
    d_i: int = 2,
    merge_ratio: float = 1.0,
    task_size: int = 8,
    partition_probs=None,
    nonblocking: bool = True,
    match_rate: float = 2.0,
    n_process: int | None = None,
):
    cal, st, n_parts = _pim_calibration(
        w, d_i, merge_ratio, match_rate, n_process or 20000
    )

    def run(p: int):
        return simulate(
            SimConfig(
                n_threads=p,
                n_tuples=_sim_len(st),
                task_size=task_size,
                mode="pim",
                n_partitions=n_parts,
                partition_probs=partition_probs,
                nonblocking_merge=nonblocking,
            ),
            st,
        )

    sim = run(min(n_threads, 8))
    if n_threads > 8:
        # Hyper-threaded logical cores add ~24 % over the 8 physical
        # cores in the paper (Fig. 12a prose); the simulator models
        # threads as full cores, so the HT tier is applied as a factor.
        full = run(n_threads)
        capped = min(full.throughput, sim.throughput * 1.24)
        sim = SimResult(
            makespan=full.makespan,
            throughput=capped,
            mean_latency=full.mean_latency,
            p99_latency=full.p99_latency,
            lock_wait_total=full.lock_wait_total,
            n_merges=full.n_merges,
        )
    return sim, cal


def table_existing_approaches(scale: str = "full") -> pd.DataFrame:
    """Fig. 8a: NLWJ (single/multi) and IBWJ via B+ (single), round-robin
    (multi) and Bw-Tree (multi) over window sizes."""
    ws = (
        [1 << 12, 1 << 14, 1 << 16, 1 << 17]
        if scale == "full"
        else [1 << 12]
    )
    n = 16000 if scale == "full" else 4000
    rows = []
    for w in ws:
        nl = calibrate.measure("nlwj", w, n_process=min(n, 6000))
        bp = calibrate.measure("bplus", w, n_process=n)
        # Local round-robin index ops run on windows of w/P per core.
        bp_local = calibrate.measure("bplus", max(256, w // HW_THREADS), n_process=n)
        bw = calibrate.measure("bw", w, n_process=min(n, 8000))
        nl_p = nl.per_tuple
        bp_p = bp.per_tuple
        lp = bp_local.per_tuple
        # NLWJ-RR: the O(w) scan parallelises perfectly across cores.
        nlwj_mt = simulate_round_robin(
            HW_THREADS, 0.0, nl_p["search"] + nl_p["scan"],
            nl_p["insert"], nl_p["delete"],
        )
        # IBWJ-RR: every core searches its local index for every tuple.
        ibwj_rr_mt = simulate_round_robin(
            HW_THREADS, lp["search"], bp_p["scan"], lp["insert"], lp["delete"],
        )
        # IBWJ-Bw: shared latch-free index, CAS conflicts per page.
        from repro.baselines.bw_tree import BwTreeLike

        pages = BwTreeLike()
        probe_pages = max(4, w // pages.page_capacity)
        bw_st = calibrate.service_times_bw(bw)
        bw_sim = simulate(
            SimConfig(
                n_threads=HW_THREADS, n_tuples=N_SIM_TUPLES, task_size=8,
                mode="bw", n_partitions=probe_pages,
            ),
            bw_st,
        )
        rows.append(
            {
                "w": w,
                "nlwj_st": nl.throughput_st,
                "nlwj_rr_mt": nlwj_mt,
                "ibwj_bplus_st": bp.throughput_st,
                "ibwj_rr_mt": ibwj_rr_mt,
                "ibwj_bw_mt": bw_sim.throughput,
            }
        )
    return pd.DataFrame(rows)


def table_insertion_depth_parallel(scale: str = "full") -> pd.DataFrame:
    """Fig. 8d: parallel PIM throughput vs D_I — few sub-indexes at
    D_I = 1 congest the partition locks."""
    ws = [1 << 14, 1 << 16] if scale == "full" else [1 << 13]
    depths = [1, 2, 3, 4] if scale == "full" else [1, 2]
    rows = []
    for w in ws:
        row = {"w": w}
        for d in depths:
            sim, _ = _sim_pim(w, HW_THREADS, d_i=d, n_process=12000)
            row[f"d{d}"] = sim.throughput
            row[f"d{d}_nsub"] = _pim_subindex_count(w, d)
        rows.append(row)
    return pd.DataFrame(rows)


def table_merge_ratio_parallel(scale: str = "full") -> pd.DataFrame:
    """Fig. 9a: parallel PIM throughput vs merge ratio — in the
    multithreaded setting merges are costlier (they stall the pipeline),
    so m = 1 wins (the paper's conclusion)."""
    ws = [1 << 14, 1 << 16] if scale == "full" else [1 << 13]
    ms = [2**-6, 2**-4, 2**-2, 2**-1, 1.0] if scale == "full" else [2**-4, 1.0]
    rows = []
    for w in ws:
        row = {"w": w}
        # One base calibration per window; only the merge interval and
        # duration vary with m. Calibrating per m would re-measure the
        # (m-independent) service times with +-10 % run noise and bury
        # the merge-frequency effect this sweep isolates.
        _, base_st, n_parts = _pim_calibration(w, 2, 2**-3, 2.0, 12000)
        for m in ms:
            st = ServiceTimes(
                lock_free=base_st.lock_free,
                locked=base_st.locked,
                delete=base_st.delete,
                task_acquire=base_st.task_acquire,
                merge_duration=calibrate.measure_merge_cost(w, m),
                merge_interval=max(1, int(m * w)),
                scan_surcharge=base_st.scan_surcharge,
            )
            sim = simulate(
                SimConfig(
                    n_threads=8, n_tuples=_sim_len(st), task_size=8,
                    mode="pim", n_partitions=n_parts,
                ),
                st,
            )
            label = f"m=2^{int(np.log2(m))}" if m < 1 else "m=1"
            row[label] = sim.throughput * 1.24  # HT tier (see _sim_pim)
        rows.append(row)
    return pd.DataFrame(rows)


def table_task_size(scale: str = "full") -> pd.DataFrame:
    """Figs. 10c/10d: throughput and latency vs task size 1..10."""
    w = 1 << (16 if scale == "full" else 13)
    sizes = list(range(1, 11)) if scale == "full" else [1, 8]
    _, st, n_parts = _pim_calibration(w, 2, 1.0, 2.0, 12000)
    rows = []
    for ts in sizes:
        sim = simulate(
            SimConfig(
                n_threads=HW_THREADS, n_tuples=_sim_len(st), task_size=ts,
                mode="pim", n_partitions=n_parts,
            ),
            st,
        )
        rows.append(
            {
                "task_size": ts,
                "throughput": sim.throughput,
                "mean_latency_us": sim.mean_latency * 1e6,
                "p99_latency_us": sim.p99_latency * 1e6,
            }
        )
    return pd.DataFrame(rows)


def table_scalability(scale: str = "full") -> pd.DataFrame:
    """Fig. 12a: two-way and self-join throughput vs thread count,
    against the single-threaded no-CC implementation; reports the CC
    overhead the paper measures (~40 % / ~26 %)."""
    w = 1 << (16 if scale == "full" else 13)
    threads = [1, 2, 4, 8, 16] if scale == "full" else [1, 4]
    rows = []
    for self_join in (False, True):
        tag = "self" if self_join else "two_way"
        from repro.bench.tables_single import throughput as st_tput

        n_cc = int(6.6 * w) + 8000  # several merge cycles per run
        no_cc = st_tput(
            lambda win: ibwj.PIMAdapter(win, 1.0, 2, use_locks=False),
            w, merge_ratio=1.0, self_join=self_join, n_process=n_cc,
        )
        with_cc = st_tput(
            lambda win: ibwj.PIMAdapter(win, 1.0, 2),
            w, merge_ratio=1.0, self_join=self_join, n_process=n_cc,
        )
        for p in threads:
            # the >8-thread hyper-threading cap is applied inside _sim_pim
            sim, _ = _sim_pim(w, p, merge_ratio=1.0, n_process=12000)
            eff = sim.throughput
            rows.append(
                {
                    "join": tag,
                    "threads": p,
                    "throughput": eff,
                    "st_no_cc": no_cc,
                    "st_with_cc": with_cc,
                    "speedup_vs_cc": eff / with_cc,
                    "cc_overhead": 1 - with_cc / no_cc,
                }
            )
    return pd.DataFrame(rows)


def table_multithreading_efficiency(scale: str = "full") -> pd.DataFrame:
    """Fig. 13c: st-B+, st-PIM, mt-Bw, mt-PIM, mt-PIM(blocking merge)
    over window sizes (two-way join)."""
    ws = (
        [1 << 12, 1 << 14, 1 << 16, 1 << 17]
        if scale == "full"
        else [1 << 12]
    )
    rows = []
    for w in ws:
        bp = calibrate.measure("bplus", w, n_process=16000)
        sim_nb, cal = _sim_pim(w, HW_THREADS, merge_ratio=1.0)
        sim_bl, _ = _sim_pim(w, HW_THREADS, merge_ratio=1.0, nonblocking=False)
        bw = calibrate.measure("bw", w, n_process=8000)
        bw_sim = simulate(
            SimConfig(
                n_threads=HW_THREADS, n_tuples=N_SIM_TUPLES, task_size=8,
                mode="bw", n_partitions=max(4, w // 64),
            ),
            calibrate.service_times_bw(bw),
        )
        rows.append(
            {
                "w": w,
                "bplus_st": bp.throughput_st,
                "pim_st": cal.throughput_st,
                "bw_mt": bw_sim.throughput,
                "pim_mt": sim_nb.throughput,
                "pim_mt_blocking": sim_bl.throughput,
            }
        )
    return pd.DataFrame(rows)


def table_selfjoin(scale: str = "full") -> pd.DataFrame:
    """Fig. 12c: single-threaded vs multithreaded index-based self-join."""
    ws = [1 << 13, 1 << 15, 1 << 17] if scale == "full" else [1 << 12]
    from repro.bench.tables_single import throughput as st_tput

    rows = []
    for w in ws:
        bp = st_tput(
            lambda win: ibwj.BPlusAdapter(win), w, self_join=True
        )
        pim = st_tput(
            lambda win: ibwj.PIMAdapter(win, 1.0, 2), w,
            merge_ratio=1.0, self_join=True,
        )
        sim, _ = _sim_pim(w, HW_THREADS, merge_ratio=1.0, n_process=12000)
        rows.append(
            {
                "w": w,
                "bplus_st": bp,
                "pim_st": pim,
                "pim_mt": sim.throughput,
                "mt_vs_bplus": sim.throughput / bp,
                "mt_vs_pim_st": sim.throughput / pim,
            }
        )
    return pd.DataFrame(rows)


def table_match_rate_parallel(scale: str = "full") -> pd.DataFrame:
    """Fig. 10b's multithreaded line: parallel PIM vs match rate — at
    high match rates the scan dominates and multithreading's edge over
    single-threaded shrinks (memory-bound regime)."""
    w = 1 << (16 if scale == "full" else 12)
    rates = [2**-2, 2**2, 2**6, 2**10] if scale == "full" else [1.0]
    rows = []
    for r in rates:
        sim, cal = _sim_pim(
            w, HW_THREADS, merge_ratio=1.0, match_rate=r, n_process=10000
        )
        rows.append(
            {
                "match_rate": r,
                "pim_mt": sim.throughput,
                "pim_st": cal.throughput_st,
                "mt_advantage": sim.throughput / cal.throughput_st,
            }
        )
    return pd.DataFrame(rows)


def table_drift_throughput(scale: str = "full") -> pd.DataFrame:
    """Fig. 13b: parallel self-join throughput during a distribution
    drift of speed r — the drifted insert skew (measured, Fig. 13a
    analogue) congests partition locks; stationary phases recover."""
    w = 1 << (14 if scale == "full" else 12)
    rs = [0.0, 0.1, 0.2, 0.4, 0.6, 0.8, 1.0] if scale == "full" else [0.0, 1.0]
    from repro.bench.tables_single import table_drift_insert_distribution

    dist = table_drift_insert_distribution(scale)
    _, st, _ = _pim_calibration(w, 3, 1.0, 2.0, 12000)
    n_parts = _pim_subindex_count(w, 3)
    rows = []
    for r in rs:
        share = float(dist.loc[dist["r"] == r, "max_share"].iloc[0])
        skew = min(1.0, max(0.0, (share * n_parts - 1) / max(n_parts - 1, 1)))
        probs = drift_partition_probs(n_parts, skew)
        sim = simulate(
            SimConfig(
                n_threads=HW_THREADS, n_tuples=_sim_len(st), task_size=8,
                mode="pim", n_partitions=n_parts, partition_probs=probs,
            ),
            st,
        )
        if r == 0.0:
            base = sim.throughput
        rows.append(
            {
                "r": r,
                "measured_max_insert_share": share,
                "throughput": sim.throughput,
                "relative_to_stationary": sim.throughput / base,
            }
        )
    return pd.DataFrame(rows)


# ---------------------------------------------------------------- Spark
def spark_throughput(
    spark,
    w: int,
    n_partitions: int,
    *,
    n_tuples: int = 200_000,
    rate_r: int = 1,
    rate_s: int = 1,
    dist: str = "uniform",
    w_s: int | None = None,
    seed: int = 1,
) -> float:
    """Wall-clock tuples/s of the Spark range-partitioned PIM join."""
    from repro.join.spark_join import parallel_band_join
    from repro.join.streams import diff_for_match_rate_empirical

    w_s = w_s or w
    seq = gen_stream(n_tuples, seed=seed, rate_r=rate_r, rate_s=rate_s, dist=dist)
    if dist == "uniform":
        diff = diff_for_match_rate(2.0, max(w, w_s))
    else:
        diff = diff_for_match_rate_empirical(
            seq["x"].to_numpy(), max(w, w_s), 2.0
        )
    out = parallel_band_join(
        spark, seq, w, w_s, diff, n_partitions=n_partitions
    )
    out = out.persist()
    try:
        out.count()  # warm: JIT, python-worker spin-up, input shuffle
        out.unpersist()
        # best-of-2 timed runs of the full pipeline (re-executed after
        # unpersist) — cold-start variance would otherwise dominate the
        # partition-count comparison.
        best = None
        for _ in range(2):
            t0 = time.perf_counter()
            out.count()
            dt = time.perf_counter() - t0
            best = dt if best is None else min(best, dt)
        return n_tuples / best
    finally:
        out.unpersist()


def table_spark_scalability(spark, scale: str = "full") -> pd.DataFrame:
    """Real-multicore cross-check of the simulator scaling (Fig. 12a
    shape): Spark tasks = partitions = 'threads'."""
    w = 1 << (15 if scale == "full" else 12)
    parts = [1, 2, 4, 8, 16] if scale == "full" else [1, 4]
    n = 400_000 if scale == "full" else 20_000
    rows = []
    for p in parts:
        tput = spark_throughput(spark, w, p, n_tuples=n)
        rows.append({"partitions": p, "throughput": tput})
    base = rows[0]["throughput"]
    for r in rows:
        r["speedup"] = r["throughput"] / base
    return pd.DataFrame(rows)


def table_asymmetric_rates(spark, scale: str = "full") -> pd.DataFrame:
    """Fig. 11b: parallel PIM join under asymmetric input rates R:S."""
    w = 1 << (15 if scale == "full" else 12)
    ratios = [(1, 1), (2, 1), (4, 1), (8, 1)] if scale == "full" else [(1, 1), (4, 1)]
    n = 150_000 if scale == "full" else 20_000
    rows = []
    for rr, rs in ratios:
        tput = spark_throughput(spark, w, 8, n_tuples=n, rate_r=rr, rate_s=rs)
        rows.append({"rate_r:rate_s": f"{rr}:{rs}", "throughput": tput})
    return pd.DataFrame(rows)


def table_asymmetric_windows(spark, scale: str = "full") -> pd.DataFrame:
    """Fig. 11c: parallel PIM join across (w_r, w_s) combinations."""
    ws = [1 << 13, 1 << 15, 1 << 16] if scale == "full" else [1 << 12, 1 << 13]
    n = 150_000 if scale == "full" else 20_000
    rows = []
    for w_r in ws:
        row = {"w_r": w_r}
        for w_s in ws:
            row[f"w_s={w_s}"] = spark_throughput(
                spark, w_r, 8, n_tuples=n, w_s=w_s
            )
        rows.append(row)
    return pd.DataFrame(rows)


def table_distributions(spark, scale: str = "full") -> pd.DataFrame:
    """Fig. 12b: parallel PIM throughput across key distributions, with
    the band width re-calibrated per distribution to hold sigma_s ~= 2."""
    w = 1 << (15 if scale == "full" else 12)
    dists = (
        ["uniform", "gaussian", "gamma_k3", "gamma_k1"]
        if scale == "full"
        else ["uniform", "gaussian"]
    )
    n = 150_000 if scale == "full" else 20_000
    rows = []
    for d in dists:
        tput = spark_throughput(spark, w, 8, n_tuples=n, dist=d)
        rows.append({"distribution": d, "throughput": tput})
    base = next(r["throughput"] for r in rows if r["distribution"] == "uniform")
    for r in rows:
        r["vs_uniform"] = r["throughput"] / base
    return pd.DataFrame(rows)


def table_memory_bandwidth(scale: str = "full") -> pd.DataFrame:
    """Fig. 11d: effective 'memory bandwidth' proxy from the byte
    counters (8 B/element loads/stores, DESIGN.md §3.4) scaled by the
    simulated multithreaded throughput; the store share shrinks as the
    thread count grows (longer edge-to-head linear scans add loads)."""
    w = 1 << (16 if scale == "full" else 12)
    threads = [1, 2, 4, 8, 16] if scale == "full" else [1, 4]
    # Measure bytes per tuple from a single-threaded run.
    warm, n = 2 * w, 12000
    seq = gen_stream(warm + n, seed=1)
    diff = diff_for_match_rate(2.0, w)
    adapters = {}

    def factory(win):
        a = ibwj.PIMAdapter(win, 1.0, 2)
        adapters[len(adapters)] = a
        return a

    ibwj.run_ibwj(
        seq, w, w, diff, factory,
        collect_pairs=False, warmup=warm, probe_during_warmup=False,
    )
    loads = stores = 0
    for a in adapters.values():
        loads += a.idx.t_s.bytes_loaded
        loads += sum(b.bytes_loaded for b in a.idx.subindexes)
        stores += sum(b.bytes_stored for b in a.idx.subindexes)
        stores += len(a.idx.t_s) * 8 * a.idx.n_merges  # merge writes
    per_tuple_load = loads / (warm + n)
    per_tuple_store = max(stores / (warm + n), 1.0)
    _, st, n_parts = _pim_calibration(w, 2, 1.0, 2.0, 10000)
    rows = []
    for p in threads:
        sim = simulate(
            SimConfig(
                n_threads=p, n_tuples=_sim_len(st), task_size=8,
                mode="pim", n_partitions=n_parts,
            ),
            st,
        )
        # Non-indexed window region grows with in-flight tasks: extra
        # linear-scan loads per lookup ~ (p * task_size / 2) elements.
        extra_load = p * 8 / 2 * 8.0
        load_bw = (per_tuple_load + extra_load) * sim.throughput
        store_bw = per_tuple_store * sim.throughput
        rows.append(
            {
                "threads": p,
                "load_gbps": load_bw / 2**30,
                "store_gbps": store_bw / 2**30,
                "store_share": store_bw / (load_bw + store_bw),
            }
        )
    return pd.DataFrame(rows)
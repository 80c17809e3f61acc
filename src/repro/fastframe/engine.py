"""The FastFrame scan engine (paper Sections 4.2-4.3).

Query execution is a sequence of *rounds*. Each round picks the next
batch of blocks according to the sampling strategy, folds their
per-group statistics into the running state, recomputes per-group
confidence intervals with the OptStop-decayed budget, and evaluates the
query's stopping condition over the running intersection of intervals.

Strategies (paper §5.2):

* ``scan``        — sequential scan of the scramble (predicate-driven
                    block skipping allowed, no group-driven skipping);
* ``active_sync`` — active scanning with per-block synchronous bitmap
                    probes (one index gather per block — the cache-miss
                    analog);
* ``active_peek`` — active scanning with 1024-block lookahead batches:
                    one vectorized probe per batch (the paper's async
                    lookahead, which amortizes probe cost).

The per-query Spark work (per-block group statistics via
``groupBy("block_id", *group_cols).agg(...)``, bitmap matrices, group
domains) is prepared once per query signature and cached on the
Scramble; it is timed separately (``prep_seconds``) since it is
bounder/strategy-independent. The round loop itself is pure NumPy whose
work is proportional to blocks fetched — the same cost structure as the
paper's in-memory engine, and the loop wall-clock is what the
experiment harnesses report.

Confidence budget chain (all documented in DESIGN.md): per-query
``delta`` is divided by the group-domain size ``G`` (number of
aggregate views), decayed per round by ``(6/pi^2)/k^2`` (OptStop), and
split ``(1-alpha)`` for the Theorem-3 ``N+`` event with the remaining
``alpha`` fed to the bounder (``/2`` per side inside the CI).
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass, field
from typing import List, Optional, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import functions as F

from repro.core import vectorized
from repro.core.count_sum import ALPHA, n_plus
from repro.core.optstop import RunningIntersection, round_delta
from repro.core.stopping import Threshold, TopK
from repro.fastframe.bitmap import get_column_bitmap, group_bitmap_matrix
from repro.fastframe.queries import Eq, QuerySpec
from repro.fastframe.scramble import Scramble

LOOKAHEAD_BLOCKS = 1024  # paper §4.3: lookahead batch of 1024 blocks


@dataclass
class EngineConfig:
    """Knobs of one engine run (paper defaults)."""

    bounder: str = "bernstein"  # hoeffding | bernstein | exact
    range_trim: bool = True
    strategy: str = "active_peek"  # scan | active_sync | active_peek
    delta: float = 1e-15
    round_rows: int = 40_000  # paper §4.2: bounds recomputed every 40000 rows
    start_block: int = 0
    lookahead: int = LOOKAHEAD_BLOCKS

    def label(self) -> str:
        if self.bounder == "exact":
            return "Exact"
        base = {"hoeffding": "Hoeffding", "bernstein": "Bernstein"}[self.bounder]
        return base + ("+RT" if self.range_trim else "")


@dataclass
class Prep:
    """Bounder/strategy-independent per-query artifacts."""

    groups: List[Tuple]
    gmatrix: np.ndarray  # bool [G, B] — group presence per block
    static_mask: np.ndarray  # bool [B] — predicate-eligible blocks
    blk: np.ndarray  # per stat-row block id
    gid: np.ndarray  # per stat-row group index
    cnt: np.ndarray
    tot: np.ndarray
    sq: np.ndarray
    mn: np.ndarray
    mx: np.ndarray
    a: float
    b: float
    prep_seconds: float


@dataclass
class QueryResult:
    """Outcome + cost accounting of one engine run."""

    query: str
    label: str
    strategy: str
    groups: List[Tuple]
    est: np.ndarray
    lo: np.ndarray
    hi: np.ndarray
    m: np.ndarray
    decision: object
    blocks_fetched: int
    rows_scanned: int
    rounds: int
    wall_seconds: float
    prep_seconds: float
    index_probes: int
    exhausted_all: bool

    def per_group(self) -> pd.DataFrame:
        return pd.DataFrame(
            {
                "group": [g if len(g) != 1 else g[0] for g in self.groups],
                "m": self.m,
                "est": self.est,
                "lo": self.lo,
                "hi": self.hi,
            }
        )


def prepare(scramble: Scramble, spec: QuerySpec) -> Prep:
    """Spark-side prep: block stats + bitmaps, cached per query signature."""
    key = ("prep", spec.signature())
    if key in scramble.prep_cache:
        return scramble.prep_cache[key]
    t0 = time.perf_counter()

    a, b = scramble.catalog.bounds(spec.agg_col)

    if spec.group_cols:
        groups, gmatrix = group_bitmap_matrix(scramble, spec.group_cols)
    else:
        groups = [()]
        gmatrix = np.ones((1, scramble.n_blocks), dtype=bool)

    static = np.ones(scramble.n_blocks, dtype=bool)
    for p in spec.predicate:
        if isinstance(p, Eq):
            static &= get_column_bitmap(scramble, p.col).row(p.value)

    df = scramble.df
    pred = spec.predicate_spark()
    if pred is not None:
        df = df.filter(pred)
    v = F.col(spec.agg_col)
    agg = df.groupBy("block_id", *spec.group_cols).agg(
        F.count(v).alias("cnt"),
        F.sum(v).alias("tot"),
        F.sum(v * v).alias("sq"),
        F.min(v).alias("mn"),
        F.max(v).alias("mx"),
    )
    pdf = agg.toPandas().sort_values("block_id", kind="stable")

    if spec.group_cols:
        gindex = {g: i for i, g in enumerate(groups)}
        keys = list(
            zip(*(pdf[c].tolist() for c in spec.group_cols))
        )
        gid = np.array([gindex[k] for k in keys], dtype=np.int64)
    else:
        gid = np.zeros(len(pdf), dtype=np.int64)

    prep = Prep(
        groups=groups,
        gmatrix=gmatrix,
        static_mask=static,
        blk=pdf["block_id"].to_numpy(dtype=np.int64),
        gid=gid,
        cnt=pdf["cnt"].to_numpy(dtype=np.float64),
        tot=pdf["tot"].to_numpy(dtype=np.float64),
        sq=pdf["sq"].to_numpy(dtype=np.float64),
        mn=pdf["mn"].to_numpy(dtype=np.float64),
        mx=pdf["mx"].to_numpy(dtype=np.float64),
        a=float(a),
        b=float(b),
        prep_seconds=time.perf_counter() - t0,
    )
    scramble.prep_cache[key] = prep
    return prep


class _BlockPicker:
    """Chooses the next blocks to fetch, per sampling strategy.

    Visit order starts at ``start_block`` and wraps (the paper starts
    each approximate query at a random scramble position). The walk
    resumes from a persistent frontier; cycling naturally revisits
    blocks skipped earlier if their groups become active again, which
    guarantees every eligible block is eventually fetched (termination
    with exact results in the worst case).
    """

    def __init__(self, n_blocks: int, start_block: int, lookahead: int):
        self.n = n_blocks
        self.order = (np.arange(n_blocks, dtype=np.int64) + start_block) % n_blocks
        self.frontier = 0
        self.lookahead = lookahead
        self.probes = 0

    def _cyclic_batch(self, i: int, size: int) -> np.ndarray:
        idx = (self.frontier + i + np.arange(size)) % self.n
        return self.order[idx]

    def _advance(self, i_batch_start, size, taken_pos, n_taken, n_eligible):
        """Frontier bookkeeping for batched walks.

        If the quota filled mid-batch (some eligible blocks in this batch
        were left untaken), the frontier must stop just past the last
        block actually taken so nothing is silently skipped; otherwise it
        moves past the whole batch. Returns (advance, stop_walk).
        """
        if n_taken and n_taken < n_eligible:
            return i_batch_start + int(taken_pos[n_taken - 1]) + 1, True
        return i_batch_start + size, False

    def pick_scan(self, fetched, static, k_blocks) -> np.ndarray:
        picked: list = []
        i = 0
        while i < self.n:
            size = min(self.lookahead, self.n - i)
            blocks = self._cyclic_batch(i, size)
            elig = np.flatnonzero(~fetched[blocks] & static[blocks])
            need = k_blocks - len(picked)
            take = elig[:need]
            picked.extend(blocks[take].tolist())
            i, stop = self._advance(i, size, take, take.size, elig.size)
            if stop or len(picked) >= k_blocks:
                break
        self.frontier = (self.frontier + i) % self.n
        return np.array(picked, dtype=np.int64)

    def pick_active_peek(self, fetched, static, gmatrix, active_idx, k_blocks):
        picked: list = []
        i = 0
        while i < self.n:
            size = min(self.lookahead, self.n - i)
            blocks = self._cyclic_batch(i, size)
            cand = np.flatnonzero(~fetched[blocks] & static[blocks])
            if cand.size:
                # One vectorized probe per batch: the async-lookahead analog.
                hit_mask = gmatrix[np.ix_(active_idx, blocks[cand])].any(axis=0)
                self.probes += int(active_idx.size * cand.size)
                hits = cand[hit_mask]
            else:
                hits = cand
            need = k_blocks - len(picked)
            take = hits[:need]
            picked.extend(blocks[take].tolist())
            i, stop = self._advance(i, size, take, take.size, hits.size)
            if stop or len(picked) >= k_blocks:
                break
        self.frontier = (self.frontier + i) % self.n
        return np.array(picked, dtype=np.int64)

    def pick_active_sync(self, fetched, static, gmatrix, active_idx, k_blocks):
        picked: list = []
        i = 0
        while len(picked) < k_blocks and i < self.n:
            b = int(self.order[(self.frontier + i) % self.n])
            i += 1
            if fetched[b] or not static[b]:
                continue
            # One gather per block: each probe is its own (cache-missing)
            # index query, the behavior ActivePeek amortizes away.
            col = gmatrix[active_idx, b]
            self.probes += int(active_idx.size)
            if col.any():
                picked.append(b)
        self.frontier = (self.frontier + i) % self.n
        return np.array(picked, dtype=np.int64)


def run_query(
    scramble: Scramble, spec: QuerySpec, config: Optional[EngineConfig] = None
) -> QueryResult:
    """Execute one approximate (or exact) query through the scan engine."""
    config = config or EngineConfig()
    prep = prepare(scramble, spec)
    G = len(prep.groups)
    B = scramble.n_blocks
    R = scramble.n_rows
    rows_per_block = scramble.rows_per_block
    exact_mode = config.bounder == "exact"
    delta_group = config.delta / max(1, G)
    round_blocks = max(1, math.ceil(config.round_rows / scramble.block_size))

    # Running per-group state
    m = np.zeros(G, dtype=np.float64)
    tot = np.zeros(G, dtype=np.float64)
    sq = np.zeros(G, dtype=np.float64)
    mn = np.full(G, np.inf)
    mx = np.full(G, -np.inf)
    inter = RunningIntersection(G, prep.a, prep.b)
    fetched = np.zeros(B, dtype=bool)
    active = np.ones(G, dtype=bool)
    picker = _BlockPicker(B, config.start_block % B, config.lookahead)
    # Incremental exhaustion tracking: remaining eligible blocks per group.
    remaining = (prep.gmatrix & prep.static_mask).sum(axis=1).astype(np.int64)
    # Stat rows are sorted by block id; per-block row ranges let each round
    # gather exactly the fetched blocks' rows (O(rows fetched), not O(S)).
    row_starts = np.searchsorted(prep.blk, np.arange(B))
    row_ends = np.searchsorted(prep.blk, np.arange(B), side="right")

    blocks_fetched = 0
    rows_scanned = 0
    k_round = 0
    exhausted_all = False
    est = np.full(G, 0.5 * (prep.a + prep.b))
    lo = np.full(G, prep.a)
    hi = np.full(G, prep.b)
    exhausted = np.zeros(G, dtype=bool)

    t0 = time.perf_counter()
    while True:
        k_round += 1
        if exact_mode or config.strategy == "scan":
            picked = picker.pick_scan(fetched, prep.static_mask, round_blocks)
        else:
            active_idx = np.flatnonzero(active)
            if active_idx.size == 0:
                exhausted_all = True
                break
            if config.strategy == "active_peek":
                picked = picker.pick_active_peek(
                    fetched, prep.static_mask, prep.gmatrix, active_idx, round_blocks
                )
            elif config.strategy == "active_sync":
                picked = picker.pick_active_sync(
                    fetched, prep.static_mask, prep.gmatrix, active_idx, round_blocks
                )
            else:
                raise ValueError(f"unknown strategy {config.strategy!r}")

        if picked.size == 0:
            exhausted_all = True
        else:
            fetched[picked] = True
            blocks_fetched += int(picked.size)
            rows_scanned += int(rows_per_block[picked].sum())
            remaining -= prep.gmatrix[:, picked].sum(axis=1)
            starts, ends = row_starts[picked], row_ends[picked]
            sel = np.concatenate(
                [np.arange(s, e) for s, e in zip(starts, ends) if e > s]
            ) if np.any(ends > starts) else np.empty(0, dtype=np.int64)
            if sel.size:
                g = prep.gid[sel]
                m += np.bincount(g, weights=prep.cnt[sel], minlength=G)
                tot += np.bincount(g, weights=prep.tot[sel], minlength=G)
                sq += np.bincount(g, weights=prep.sq[sel], minlength=G)
                np.minimum.at(mn, g, prep.mn[sel])
                np.maximum.at(mx, g, prep.mx[sel])

        if exact_mode:
            if exhausted_all:
                break
            continue

        # Per-group view-size upper bound N+ (Theorem 3) and CIs with the
        # OptStop round budget (Algorithm 5 / Theorem 4).
        delta_k = round_delta(delta_group, k_round)
        r_eff = max(1, rows_scanned)
        Nplus = n_plus(m, r_eff, R, delta_k)
        Nplus = np.maximum(Nplus, m)  # guard: a legal size is >= the sample
        lo_k, hi_k = vectorized.ci(
            config.bounder,
            m,
            tot,
            sq,
            mn,
            mx,
            prep.a,
            prep.b,
            Nplus,
            ALPHA * delta_k,
            config.range_trim,
        )
        inter.update(lo_k, hi_k)

        exhausted = remaining <= 0

        est = np.where(m > 0, tot / np.maximum(m, 1.0), 0.5 * (prep.a + prep.b))
        lo, hi = inter.lo.copy(), inter.hi.copy()
        # A fully-read view is known exactly — collapse its interval.
        done_exact = exhausted & (m > 0)
        lo[done_exact] = est[done_exact]
        hi[done_exact] = est[done_exact]

        # Views that turn out to be empty once their blocks are all read
        # contribute no output row; they are dropped from the stopping
        # evaluation entirely (their wide [a, b] intervals would
        # otherwise block separation-style conditions forever).
        dead = exhausted & (m == 0)
        live = np.flatnonzero(~dead)
        verdict = spec.stopping.evaluate(
            est[live], lo[live], hi[live], m[live], exhausted[live]
        )
        active = np.zeros(G, dtype=bool)
        active[live] = verdict.active
        if verdict.done or exhausted_all:
            exhausted_all = exhausted_all or bool(exhausted.all())
            break

    if exact_mode:
        est = np.where(m > 0, tot / np.maximum(m, 1.0), np.nan)
        lo = est.copy()
        hi = est.copy()
        exhausted = np.ones(G, dtype=bool)

    wall = time.perf_counter() - t0

    alive = m > 0
    decision = _decide(spec, prep.groups, est, lo, hi, alive)
    return QueryResult(
        query=spec.name,
        label=config.label(),
        strategy="scan" if exact_mode else config.strategy,
        groups=[g for g, al in zip(prep.groups, alive) if al],
        est=est[alive],
        lo=lo[alive],
        hi=hi[alive],
        m=m[alive],
        decision=decision,
        blocks_fetched=blocks_fetched,
        rows_scanned=rows_scanned,
        rounds=k_round,
        wall_seconds=wall,
        prep_seconds=prep.prep_seconds,
        index_probes=picker.probes,
        exhausted_all=exhausted_all,
    )


def _decide(spec: QuerySpec, groups, est, lo, hi, alive):
    """Read the query's decision off the per-group intervals."""
    est_a, lo_a, hi_a = est[alive], lo[alive], hi[alive]
    groups_a = [g for g, al in zip(groups, alive) if al]
    names = [g if len(g) != 1 else g[0] for g in groups_a]

    kind = spec.result_kind
    if kind == "avg_ci":
        if not names:
            return None
        return {"avg": float(est_a[0]), "lo": float(lo_a[0]), "hi": float(hi_a[0])}
    if kind in ("having_above", "having_below"):
        cond: Threshold = spec.stopping
        above = cond.decide_above(est_a, lo_a, hi_a)
        keep = above if kind == "having_above" else ~above
        return sorted(n for n, k in zip(names, keep) if k)
    if kind == "case_gt":
        cond = spec.stopping
        if not names:
            return 0
        above = cond.decide_above(est_a, lo_a, hi_a)
        return int(bool(above[0]))
    if kind == "topk":
        cond: TopK = spec.stopping
        sel = cond.select(est_a)
        return [names[i] for i in sel]
    if kind == "ordered":
        order = np.argsort(est_a, kind="stable")
        return [
            (names[i], float(est_a[i]), float(lo_a[i]), float(hi_a[i]))
            for i in order
        ]
    raise ValueError(f"unknown result kind {kind!r}")

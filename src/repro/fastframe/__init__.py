"""FastFrame: the paper's sampling-optimized column store, rebuilt.

Spark (DataFrame API) does the heavy relational work — building the
scramble (random permutation + block layout), the catalog range bounds,
the per-block group statistics, and the block bitmap indexes — while
the inherently sequential adaptive scan (rounds, OptStop, stopping
conditions, active scanning) replays over those per-block statistics on
the driver, charging work per block fetched exactly as the paper's
engine does.
"""

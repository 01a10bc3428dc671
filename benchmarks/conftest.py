"""Benchmark configuration knobs (env-overridable).

``REPRO_BENCH_SCALE`` — generator scale for benchmark graphs (default
``bench``, ~12-56k edges per dataset). ``REPRO_PARB_BUDGET_S`` —
wall-clock budget per dataset-side for the Spark ParB baseline before it
is declared unfinished (the paper's baselines run out of time/memory on
the heavy sides too).
"""
import os

BENCH_SCALE = os.environ.get("REPRO_BENCH_SCALE", "bench")
#: ablation & psweep multiply runs by 3-5x, so they default one scale down
#: (wedge ratios — their subject — are scale-stable; see EXPERIMENTS.md)
SWEEP_SCALE = os.environ.get("REPRO_SWEEP_SCALE", "unit")
PARB_BUDGET_S = float(os.environ.get("REPRO_PARB_BUDGET_S", "45"))
#: ItV is the one side small enough for Spark ParB to finish (the paper's
#: ParB likewise only completes on the light sides) — give it room
PARB_BUDGET_ITV_S = float(os.environ.get("REPRO_PARB_BUDGET_ITV_S", "150"))
N_PARTITIONS = int(os.environ.get("REPRO_BENCH_P", "8"))

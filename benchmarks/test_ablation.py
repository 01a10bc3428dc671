"""Benchmark: HUC/DGM ablation (paper figs. 6-7 as a table).

Covers the contrast the paper draws: high-r U sides (HUC collapses
wedge traversal) vs low-r V sides (HUC is a no-op, DGM still helps).
Columns append to ``results/ablation.jsonl``; markdown rebuilt at
teardown into ``results/ablation.md``.
"""
import pytest

from repro.experiments import ablation, datasets, report

from .conftest import N_PARTITIONS, SWEEP_SCALE as BENCH_SCALE

#: high-r U sides + low-r V sides (paper's r = Λ^peel / Λ^cnt contrast)
SIDES = [("it", "u"), ("tr", "u"), ("en", "u"), ("it", "v"), ("lj", "v")]
_ORDER = [datasets.label(n, s) for n, s in SIDES]


def _render():
    cols = report.load_jsonl("ablation")
    cols.sort(key=lambda c: _ORDER.index(c["label"]))
    report.save(
        "ablation", {"scale": BENCH_SCALE, "columns": cols}, ablation.render(cols)
    )


@pytest.fixture(scope="module", autouse=True)
def _write_results():
    yield
    _render()


@pytest.mark.parametrize("name,side", SIDES, ids=_ORDER)
def test_ablation(benchmark, spark, name, side):
    col = benchmark.pedantic(
        ablation.run_side,
        args=(spark, name, side),
        kwargs=dict(scale=BENCH_SCALE, n_partitions=N_PARTITIONS),
        rounds=1,
        iterations=1,
    )
    assert col["wnorm_RECEIPT"] <= 1.0
    report.append_jsonl("ablation", col)

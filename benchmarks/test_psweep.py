"""Benchmark: RECEIPT execution time vs P (paper fig. 5 as a table).

One benchmark per (dataset-side, P); per-P records append to
``results/psweep.jsonl`` and are merged per side at render time.
"""
import pytest

from repro.core.receipt import receipt
from repro.experiments import datasets, psweep, report
from repro.graph import bipartite as bg

from .conftest import SWEEP_SCALE as BENCH_SCALE

SIDES = [("tr", "u"), ("lj", "u")]
PS = (2, 8, 16)
_ORDER = [datasets.label(n, s) for n, s in SIDES]


def _render():
    recs = report.load_jsonl("psweep", key="key")
    cols: dict[str, dict] = {}
    for r in recs:
        cols.setdefault(r["label"], {"label": r["label"]}).update(
            {k: v for k, v in r.items() if k.startswith(("t_P", "rho_P"))}
        )
    ordered = [cols[lab] for lab in _ORDER if lab in cols]
    report.save(
        "psweep",
        {"scale": BENCH_SCALE, "columns": ordered, "ps": list(PS)},
        psweep.render(ordered, PS),
    )


@pytest.fixture(scope="module", autouse=True)
def _write_results():
    yield
    _render()


@pytest.mark.parametrize("p", PS)
@pytest.mark.parametrize("name,side", SIDES, ids=_ORDER)
def test_psweep(benchmark, spark, name, side, p):
    edges = datasets.load(spark, name, BENCH_SCALE)
    oriented = bg.orient(edges, side).localCheckpoint()
    r = benchmark.pedantic(
        receipt, args=(oriented,), kwargs=dict(n_partitions=p), rounds=1, iterations=1
    )
    label = datasets.label(name, side)
    report.append_jsonl(
        "psweep",
        {
            "key": f"{label}-P{p}",
            "label": label,
            f"t_P{p}": round(r.metrics.total_seconds, 2),
            f"rho_P{p}": r.metrics.rho,
        },
    )

"""Benchmark: Table 2 (dataset statistics) — one benchmark per dataset.

Each row is appended to ``results/table2.jsonl`` as soon as it is
measured (chunked/killed runs lose nothing); the rendered markdown in
``results/table2.md`` is rebuilt from all appended rows at teardown.
EXPERIMENTS.md quotes that markdown next to the paper's numbers.
"""
import pytest

from repro.experiments import datasets, report, table2

from .conftest import BENCH_SCALE


def _render():
    rows = report.load_jsonl("table2", key="name")
    rows.sort(key=lambda r: datasets.NAMES.index(r["name"]))
    report.save("table2", {"scale": BENCH_SCALE, "rows": rows}, table2.render(rows))


@pytest.fixture(scope="module", autouse=True)
def _write_results():
    yield
    _render()


@pytest.mark.parametrize("name", datasets.NAMES)
def test_table2(benchmark, spark, name):
    row = benchmark.pedantic(
        table2.dataset_stats, args=(spark, name, BENCH_SCALE), rounds=1, iterations=1
    )
    assert row["butterflies"] > 0
    report.append_jsonl("table2", row)

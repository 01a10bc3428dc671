"""Result formatting/persistence shared by the table harnesses.

Each harness returns plain dicts; this module renders them as GitHub
markdown (the rows EXPERIMENTS.md quotes) and dumps raw JSON under
``results/`` so reruns can be diffed.
"""
from __future__ import annotations

import json
import pathlib
from typing import Any

RESULTS_DIR = pathlib.Path(__file__).resolve().parents[3] / "results"


def fmt(x: Any) -> str:
    """Human-friendly cell: thousands separators, 1-dp floats, ∞ markers."""
    if x is None:
        return "-"
    if isinstance(x, float):
        if x == float("inf"):
            return "∞"
        return f"{x:,.3f}" if abs(x) < 10 else f"{x:,.1f}"
    if isinstance(x, int):
        return f"{x:,}"
    return str(x)


def markdown_table(headers: list[str], rows: list[list[Any]]) -> str:
    """Render rows as a GitHub markdown table."""
    out = ["| " + " | ".join(headers) + " |"]
    out.append("|" + "|".join("---" for _ in headers) + "|")
    for r in rows:
        out.append("| " + " | ".join(fmt(c) for c in r) + " |")
    return "\n".join(out)


def append_jsonl(name: str, record: dict) -> None:
    """Append one result record to ``results/<name>.jsonl``.

    Benchmarks append each column as soon as it is measured so a killed
    or chunked run loses nothing; rendering unions all appended records.
    """
    RESULTS_DIR.mkdir(exist_ok=True)
    with open(RESULTS_DIR / f"{name}.jsonl", "a") as f:
        f.write(json.dumps(record, default=str) + "\n")


def load_jsonl(name: str, key: str = "label") -> list[dict]:
    """All appended records, deduped by ``key`` keeping the most recent."""
    path = RESULTS_DIR / f"{name}.jsonl"
    if not path.exists():
        return []
    out: dict[str, dict] = {}
    for line in path.read_text().splitlines():
        if line.strip():
            rec = json.loads(line)
            out[str(rec.get(key))] = rec
    return list(out.values())


def save(name: str, payload: dict, markdown: str) -> pathlib.Path:
    """Persist raw JSON + rendered markdown under ``results/``."""
    RESULTS_DIR.mkdir(exist_ok=True)
    (RESULTS_DIR / f"{name}.json").write_text(
        json.dumps(payload, indent=2, default=str)
    )
    path = RESULTS_DIR / f"{name}.md"
    path.write_text(markdown + "\n")
    return path

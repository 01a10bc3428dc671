"""Dev script: inject results/*.md tables into EXPERIMENTS.md placeholders
and append derived shape-check ratios."""
import json
import pathlib
import re

root = pathlib.Path("/root/repo")
exp = (root / "EXPERIMENTS.md").read_text()

for marker, name in [
    ("<!-- TABLE2_OURS -->", "table2"),
    ("<!-- TABLE3_OURS -->", "table3"),
    ("<!-- ABLATION_OURS -->", "ablation"),
    ("<!-- PSWEEP_OURS -->", "psweep"),
]:
    md = (root / "results" / f"{name}.md").read_text().strip()
    assert marker in exp, marker
    exp = exp.replace(marker, md)

# derived ratios for the shape-check bullets
cols = json.loads((root / "results" / "table3.json").read_text())["columns"]
lines = ["", "Derived ratios from this run:", ""]
lines.append("| | " + " | ".join(c["label"] for c in cols) + " |")
lines.append("|---|" + "|".join("---" for _ in cols) + "|")
lines.append(
    "| ρ ParB / ρ RECEIPT | "
    + " | ".join(f"{c['rho_parb'] / c['rho_receipt']:.0f}×" for c in cols)
    + " |"
)
lines.append(
    "| ∧ BUP / ∧ RECEIPT | "
    + " | ".join(f"{c['w_bup'] / c['w_receipt']:.1f}×" for c in cols)
    + " |"
)
exp = exp.replace("<!-- TABLE3_RATIOS -->", "\n".join(lines))
(root / "EXPERIMENTS.md").write_text(exp)
print("filled")

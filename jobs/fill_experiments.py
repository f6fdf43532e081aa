"""Inject measured results/table*.csv pivots into EXPERIMENTS.md.

Replaces the `<!-- TABLEn_RESULTS -->` placeholders with markdown pivots of
the measured numbers, so `EXPERIMENTS.md` always reflects the latest bench
run. Pure pandas — no Spark needed.

Usage: python jobs/fill_experiments.py
"""
from __future__ import annotations

import re
from pathlib import Path

import pandas as pd

ROOT = Path(__file__).resolve().parents[1]


def _pivot_md(df: pd.DataFrame) -> str:
    lines = []
    for model in df["model"].drop_duplicates():
        g = df[df.model == model]
        piv = g.pivot_table(index="method", columns="dataset", values="value",
                            sort=False)
        piv = piv.round(4)
        lines.append(f"\n**{model}**\n")
        header = "| method | " + " | ".join(piv.columns) + " |"
        sep = "|---" * (len(piv.columns) + 1) + "|"
        lines.append(header)
        lines.append(sep)
        for method, row in piv.iterrows():
            cells = " | ".join("-" if pd.isna(v) else f"{v:.4f}" for v in row)
            lines.append(f"| {method} | {cells} |")
    return "\n".join(lines) + "\n"


def main() -> None:
    md_path = ROOT / "EXPERIMENTS.md"
    text = md_path.read_text()
    for n in (3, 6, 7, 8):
        csv = ROOT / "results" / f"table{n}.csv"
        marker = f"<!-- TABLE{n}_RESULTS -->"
        if not csv.exists():
            print(f"table{n}.csv missing — placeholder left in place")
            continue
        block = _pivot_md(pd.read_csv(csv))
        # idempotent: replace marker and any previously injected block
        pattern = re.escape(marker) + r"(?:\n<!-- injected -->.*?<!-- /injected -->)?"
        repl = marker + "\n<!-- injected -->\n" + block + "<!-- /injected -->"
        text = re.sub(pattern, repl, text, flags=re.S)
        print(f"table{n} injected")
    md_path.write_text(text)


if __name__ == "__main__":
    main()

"""Benchmark helpers: persist each regenerated table under results/."""
import sys
from pathlib import Path

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


def save(name: str, pdf) -> None:
    RESULTS_DIR.mkdir(exist_ok=True)
    out = RESULTS_DIR / f"{name}.csv"
    pdf.to_csv(out, index=False)
    print(f"\n[{name}]\n{pdf.to_string(index=False)}", file=sys.stderr)

"""Helper: emit a measured table past pytest's output capture.

pytest captures test stdout, so plain ``print`` would never reach
``bench_output.txt``; printing inside ``capsys.disabled()`` goes straight to
the real stdout (and any ``tee``). Each table is also persisted under
``benchmarks/results/`` so EXPERIMENTS.md can be diffed against files.
"""
from pathlib import Path

RESULTS_DIR = Path(__file__).parent / "results"


def emit(capsys, title: str, df) -> None:
    text = f"\n{title}\n\n{df.to_string(index=False)}\n"
    with capsys.disabled():
        print(text)
    RESULTS_DIR.mkdir(exist_ok=True)
    slug = title.split(":")[0].strip().lower().replace(" ", "_")
    (RESULTS_DIR / f"{slug}.txt").write_text(text)

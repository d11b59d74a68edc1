"""Run every table/figure job once and save the printed tables.

Usage: python jobs/run_all.py [outdir]
Writes one ``results/<job>.txt`` per job at the same scale factors the
benchmarks use, sharing a single SparkSession. EXPERIMENTS.md quotes
these tables.
"""
from __future__ import annotations

import contextlib
import io
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark  # noqa: E402

JOBS = [
    ("table7_datasets", dict(sf=0.3)),
    ("fig4_bk_variants", dict(sf=0.25)),
    ("fig5_kclique", dict(sf=0.25, ks=(3, 4))),
    ("fig6_reordering", dict(sf=0.25)),
    ("fig7_subgraph_iso", dict(sf=1.0)),
    ("fig8a_synthetic_sweep", dict(sf=1.0, scales=(8, 9), degrees=(1, 4, 16))),
    ("fig8b_scaling", dict(sf=0.5, partitions=(1, 4, 16))),
    ("fig8c_memory", dict(sf=0.5)),
    ("fig9_kclique_systems", dict(sf=0.5, ks=(4,))),
    ("sec86_higher_order", dict(sf=0.5)),
    ("table5_bounds", dict(sf=1.0, sizes=(200, 400, 800))),
]


def main() -> None:
    outdir = Path(sys.argv[1] if len(sys.argv) > 1 else "results")
    outdir.mkdir(exist_ok=True)
    spark = get_spark("gms-run-all")
    import importlib

    try:
        for name, kwargs in JOBS:
            mod = importlib.import_module(name)
            buf = io.StringIO()
            with contextlib.redirect_stdout(buf):
                mod.run(spark, **kwargs)
            (outdir / f"{name}.txt").write_text(buf.getvalue())
            print(f"[run_all] wrote {outdir / (name + '.txt')}", file=sys.stderr)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()

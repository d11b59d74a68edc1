"""Fig. 8c reproduction — set-centric representation memory footprints.

For three graphs matching the paper's h-wen (web), s-ork (social) and
v-usa (road) regimes: the size of each constructed representation and
the peak construction footprint, for SortedSet / BitmapSet /
RoaringLike / HashSet and the Das-et-al. baseline; plus the
Log(Graph)-style compression sizes (Appendix B).
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.core.graph import Graph
from repro.core.metrics import print_table
from repro.graphs import generators as gen
from repro.reprs.layouts import compression_sizes, representation_sizes


def run(spark: SparkSession, sf: float = 1.0) -> list[dict]:
    graphs = {
        "web (h-wen analog, RMAT)": gen.rmat(11, 6.0, seed=61),
        "social (s-ork analog, BA)": gen.barabasi_albert(int(2000 * sf) + 20,
                                                         8, seed=62),
        "road (v-usa analog, grid)": gen.grid_road(int(45 * max(sf, 0.2)) + 4,
                                                   int(45 * max(sf, 0.2)) + 4),
    }
    rows, crows = [], []
    for gname, pdf in graphs.items():
        g = Graph.from_pandas(spark, pdf)
        sizes = representation_sizes(g)
        for rep, s in sizes.items():
            rows.append(
                {
                    "graph": gname,
                    "representation": rep,
                    "size_MB": round(s["size_b"] / 1e6, 4),
                    "peak_MB": round(s["peak_b"] / 1e6, 4),
                }
            )
        comp = compression_sizes(g)
        crows.append({"graph": gname, **{k: round(v / 1e6, 4)
                                         for k, v in comp.items()}})
    print_table("Fig. 8c: representation sizes & construction peaks", rows)
    print_table("App. B: Log(Graph)-style compression sizes (MB)", crows)
    return rows + crows


if __name__ == "__main__":
    from _common import main

    main(run)

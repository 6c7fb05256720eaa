"""Figure 24 series: DistDGL partitioner effectiveness vs scale-out factor.

Scales GraphSage (feature 512, hidden 64, 3 layers) from 4 to 32 workers on
a road graph (DI) and two skewed graphs (EU, OR). The paper finds the
effectiveness *increases* with scale-out on DI but slightly *decreases* on
the skewed graphs, tracked by remote vertices / edge-cut in % of Random.
"""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

import pandas as pd

from _common import make_session, save_and_print
from repro.exp.harness import run_distdgl_suite


def run(spark, *, scale: float = 1e-3, seed: int = 0) -> dict[str, pd.DataFrame]:
    suite = run_distdgl_suite(
        spark,
        graphs=("DI", "EU", "OR"),
        ks=(4, 8, 16, 32),
        features=(512,),
        hiddens=(64,),
        layer_counts=(3,),
        scale=scale,
        seed=seed,
    )
    sp = suite[suite["partitioner"] != "Random"].pivot_table(
        index=["graph", "partitioner"], columns="k", values="speedup"
    ).round(3)
    remote = suite[suite["partitioner"] != "Random"].pivot_table(
        index=["graph", "partitioner"], columns="k", values="remote_pct_of_random"
    ).round(1)
    cut = suite[suite["partitioner"] != "Random"].pivot_table(
        index=["graph", "partitioner"], columns="k", values="cut_pct_of_random"
    ).round(1)
    return {
        "suite": suite,
        "fig24a_speedup": sp.reset_index(),
        "fig24b_remote_pct": remote.reset_index(),
        "fig24c_cut_pct": cut.reset_index(),
    }


if __name__ == "__main__":
    spark = make_session("fig24_scaleout")
    save_and_print(
        "fig24_scaleout",
        run(spark),
        print_keys=("fig24a_speedup", "fig24b_remote_pct", "fig24c_cut_pct"),
    )
    spark.stop()

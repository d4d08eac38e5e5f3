"""Table 5: dataset statistics (our synthetic stand-ins, DESIGN.md §2).

Prints |E|, |V|, max/avg/avg-in degree for every generated graph at the
experiment scale, next to the paper's values for the real datasets.
"""
import pandas as pd

from repro.graphs.generators import (
    ldbc_like,
    livejournal_like,
    orkut_like,
    patents_like,
    skitter_like,
)
from repro.harness.tables import SCALE, emit, get_spark

PAPER = {
    "livejournal_like": ("LiveJournal", "69M", "4.8M", 4000, 8.5, 14.2),
    "skitter_like": ("Skitter", "11M", "1.7M", 35000, 8.2, 12.6),
    "patents_like": ("Patents", "16.5M", "3.8M", 704, 2.3, 4.7),
    "orkut_like": ("Orkut", "117.2M", "3M", 29600, 17.7, 34.4),
    "ldbc_like": ("LDBC SNB SF10", "77.6M", "7.2M", 20800, 7.3, 9.8),
}


def run(spark=None) -> pd.DataFrame:
    rows = []
    for gen in (livejournal_like, skitter_like, patents_like, orkut_like, ldbc_like):
        g = gen(scale=SCALE)
        s = g.stats()
        paper = PAPER[g.name]
        rows.append(
            {
                "dataset": g.name,
                "paper_name": paper[0],
                "|E|": s["|E|"],
                "|V|": s["|V|"],
                "max_deg": s["max_degree"],
                "avg_deg": s["avg_degree"],
                "avg_in_deg": s["avg_in_degree"],
                "paper_|E|": paper[1],
                "paper_|V|": paper[2],
                "paper_max_deg": paper[3],
                "paper_avg_deg": paper[4],
                "paper_avg_in_deg": paper[5],
            }
        )
    return emit("table5_datasets", pd.DataFrame(rows))


def main() -> None:
    run(get_spark("table5"))


if __name__ == "__main__":
    main()

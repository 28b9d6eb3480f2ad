"""Table II — statistics of the evaluation dataset.

The paper's Table II reports statistics of eu-2015-tpd (6,650,532 nodes,
170,145,510 edges, avg degree 25.584). Offline we substitute a Chung–Lu
power-law web graph (DESIGN.md Section 4); this job prints our graph's
statistics next to the paper's so a reader can diff shape (node/edge ratio,
average degree, degree skew).

Run: ``spark-submit jobs/table2_dataset.py [n] [avg_degree] [seed]``
(Spark is only used to show the data loads as a DataFrame; the statistics
themselves come from the generator.)
"""
import sys

from repro.webgraph.generator import graph_stats, web_graph

PAPER = {
    "nodes": 6_650_532,
    "edges": 170_145_510,
    "avg_degree": 25.584,
    "max_degree": 398_599,  # paper reports max out-degree 398,599
}


def rows(n: int = 20_000, avg_degree: float = 25.0, seed: int = 0):
    """Compute the Table II rows: list of (statistic, paper, ours)."""
    stats = graph_stats(web_graph(n=n, avg_degree=avg_degree, seed=seed))
    return [
        ("# nodes", PAPER["nodes"], stats["nodes"]),
        ("# edges", PAPER["edges"], stats["edges"]),
        ("avg. degree", PAPER["avg_degree"], round(stats["avg_degree"], 3)),
        ("max degree", PAPER["max_degree"], stats["max_degree"]),
    ]


def main(argv):
    n = int(argv[1]) if len(argv) > 1 else 20_000
    avg = float(argv[2]) if len(argv) > 2 else 25.0
    seed = int(argv[3]) if len(argv) > 3 else 0
    print(f"Table II — dataset statistics (synthetic substitute, n={n})")
    print(f"{'statistic':<14}{'paper (eu-2015-tpd)':>22}{'ours (synthetic)':>20}")
    for name, paper, ours in rows(n, avg, seed):
        print(f"{name:<14}{paper:>22}{ours:>20}")


if __name__ == "__main__":
    main(sys.argv)

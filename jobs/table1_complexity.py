"""Job: reproduce Table 1 — measured EdgePush/LocalPush work ratios vs the
predicted improvement factors (1-α)cos²φ and (1-α)/2m·Σn_v·cos²φ_v.

Usage: spark-submit jobs/table1_complexity.py [--datasets TH,TA] [--out f.csv]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, emit, make_spark

from repro.analysis.experiments import table1_complexity
from repro.graphs import datasets as ds
from repro.graphs import generators as gen
from repro.graphs.graph import WeightedGraph


def main(argv=None) -> None:
    p = base_parser(__doc__)
    p.add_argument("--datasets", default="TH,TA,BC")
    p.add_argument("--eps", type=float, default=0.01)
    p.add_argument("--rmax", type=float, default=1e-4)
    p.add_argument("--sources", type=int, default=3)
    p.add_argument("--impl", choices=("batch", "sequential"), default="batch")
    args = p.parse_args(argv)
    spark = make_spark("table1_complexity")
    graphs = {
        "star(fig1,n=1000)": WeightedGraph.from_undirected_pandas(
            spark, gen.star_bad_case(1000)
        ),
        "complete_unbalanced(n=128)": WeightedGraph.from_undirected_pandas(
            spark, gen.complete_unbalanced(128)
        ),
    }
    for key in args.datasets.split(","):
        graphs[f"{key}-lite"] = ds.load(spark, key)
    emit(
        table1_complexity(
            spark,
            graphs,
            eps=args.eps,
            rmax=args.rmax,
            n_sources=args.sources,
            seed=args.seed,
            impl=args.impl,
        ),
        args.out,
    )


if __name__ == "__main__":
    main()

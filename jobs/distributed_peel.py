"""spark-submit entrypoint: distributed batched peeling on a difference graph.

The scalable DataFrame counterpart of DCSGreedy's exact driver greedy
(Bahmani et al. batched peeling; see core/distributed_greedy.py). Usage:

    spark-submit jobs/distributed_peel.py --family wiki --config consistent
"""
import argparse

from _common import session

from repro.core.dcsad import dcs_greedy
from repro.core.distributed_greedy import distributed_peel
from repro.datasets import get_dataset

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--family", default="wiki")
    ap.add_argument("--config", default="consistent")
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    ap.add_argument("--eps", type=float, default=0.1)
    args = ap.parse_args()

    spark = session("distributed_peel")
    ds = get_dataset(spark, args.family, args.config, args.scale)
    S, rho = distributed_peel(ds.edges, eps=args.eps)
    exact = dcs_greedy(ds.local)
    print(
        f"distributed peeling: |S|={len(S)} rho={rho:.4f}  "
        f"(exact DCSGreedy: |S|={len(exact.S)} rho={exact.rho:.4f})"
    )

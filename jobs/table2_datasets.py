"""Table 2 — dataset statistics.

Prints, for every Table-2 stand-in, the generated |U| / |V| / |E| /
type / k next to the paper's values, so the scale-down factors are
explicit.  Usage: ``python jobs/table2_datasets.py [--size-factor F]``.
"""
import argparse

import _session  # noqa: F401  (sys.path setup)

from repro.synth_data import LARGE_DATASETS, SMALL_DATASETS, TABLE2_SPECS, make_dataset

PAPER = {  # |U|, |V|, |E|, type, k  (paper Table 2)
    "CORA": ("2.7K", "1.4K", "49.2K", "unweighted", 7),
    "CiteSeer": ("3.3K", "3.7K", "105.2K", "unweighted", 6),
    "Flickr": ("7.6K", "12K", "182.5K", "unweighted", 9),
    "BlogCatalog": ("5.2K", "8.2K", "369.4K", "unweighted", 6),
    "PubMed": ("19.7K", "0.5K", "988K", "weighted", 3),
    "CORA-F": ("19.8K", "8.7K", "1.13M", "unweighted", 70),
    "LastFM-Asia": ("7.6K", "7.8K", "3.01M", "unweighted", 18),
    "MIND": ("94.4K", "711.2K", "16.5M", "weighted", 18),
    "LastFM": ("359.4K", "160.2K", "17.6M", "weighted", 239),
    "MAG": ("10.5M", "2.78M", "1.1B", "weighted", 8),
}


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--size-factor", type=float, default=1.0)
    args = ap.parse_args()

    hdr = (f"{'Dataset':<13s} {'|U|':>9s} {'|V|':>9s} {'|E|':>10s} "
           f"{'k':>4s} {'scale':>6s} | paper |U|/|V|/|E|/k")
    print(hdr)
    print("-" * len(hdr))
    for name in SMALL_DATASETS + LARGE_DATASETS:
        ds = make_dataset(name, seed=0, size_factor=args.size_factor)
        spec = TABLE2_SPECS[name]
        p = PAPER[name]
        print(f"{name:<13s} {ds.n_u:>9,d} {ds.n_v:>9,d} {ds.n_edges:>10,d} "
              f"{ds.k:>4d} {spec['scale']:>5d}x | "
              f"{p[0]}/{p[1]}/{p[2]}/k={p[4]} ({p[3]})")


if __name__ == "__main__":
    main()

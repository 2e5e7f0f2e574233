"""Print the Figure 13/14 speedup table (full 25 program-input pairs)."""
from _common import arg_parser
from repro.experiments import fig13_14_speedup

if __name__ == "__main__":
    p = arg_parser(__doc__)
    p.add_argument("--full", action="store_true", help="all five sizes (slow)")
    args = p.parse_args()
    sizes = (100.0, 200.0, 300.0, 400.0, 500.0) if args.full else (100.0, 300.0, 500.0)
    df = fig13_14_speedup.run(cluster=args.cluster, seed=args.seed, sizes=sizes)
    print(df.to_string(index=False))
    print(fig13_14_speedup.summarize(df).to_string(index=False))

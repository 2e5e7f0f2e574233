"""Print the Figure 20 tuning-overhead growth table."""
from _common import arg_parser
from repro.experiments import fig20_overhead

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    print(fig20_overhead.run(cluster=args.cluster, seed=args.seed).to_string(index=False))

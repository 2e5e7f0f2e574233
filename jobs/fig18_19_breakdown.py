"""Print the Figure 18/19 CSQ-CIQ and GC-time breakdowns."""
from _common import arg_parser
from repro.experiments import fig18_19_breakdown

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    print(fig18_19_breakdown.run_fig18(cluster=args.cluster, seed=args.seed).to_string(index=False))
    print(fig18_19_breakdown.run_fig19(cluster=args.cluster, seed=args.seed).to_string(index=False))

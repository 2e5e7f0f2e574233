"""Print the Figure 6 kernel comparison."""
from _common import arg_parser
from repro.experiments import fig06_kernels

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    print(fig06_kernels.run(cluster=args.cluster).to_string(index=False))

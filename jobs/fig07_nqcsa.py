"""Print the Figure 7 N_QCSA saturation sweep."""
from _common import arg_parser
from repro.experiments import fig07_nqcsa

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    print(fig07_nqcsa.run(cluster=args.cluster).to_string(index=False))

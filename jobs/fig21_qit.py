"""Print the Figure 21 QCSA/IICP-grafting table."""
from _common import arg_parser
from repro.experiments import fig21_qit

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    print(fig21_qit.run(cluster=args.cluster, seed=args.seed).to_string(index=False))

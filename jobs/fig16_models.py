"""Print the Figure 16 model-accuracy table."""
from _common import arg_parser
from repro.experiments import fig16_models

if __name__ == "__main__":
    args = arg_parser(__doc__).parse_args()
    df = fig16_models.run(cluster=args.cluster)
    print(df.pivot(index="benchmark", columns="model", values="rel_error").round(3).to_string())

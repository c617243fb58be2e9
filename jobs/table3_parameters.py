"""Table III — Parameters of L2R (the parameter grid and defaults)."""
import pandas as pd

from repro.core.transfer import AMR_DEFAULT, MU1_DEFAULT, MU2_DEFAULT


def main() -> None:
    print("\n=== Table III: Parameters of L2R ===")
    print(
        pd.DataFrame(
            [
                {"parameter": "# T-edge partitions", "values": "1X 2X 3X 4X 5X", "default": "5X"},
                {"parameter": "threshold amr", "values": "0.5 0.6 0.7 0.8 0.9", "default": f"{AMR_DEFAULT:g}"},
                {"parameter": "mu1 (transfer term)", "values": "-", "default": f"{MU1_DEFAULT:g}"},
                {"parameter": "mu2 (L2 regulariser)", "values": "-", "default": f"{MU2_DEFAULT:g}"},
            ]
        ).to_string(index=False)
    )


if __name__ == "__main__":
    main()

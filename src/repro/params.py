"""Table II parameter grid (defaults underlined in the paper)."""
from __future__ import annotations

K_VALUES = (10, 20, 30, 40, 50)
Q_VALUES = (10, 20, 30, 40, 50)
THETA_VALUES = (10, 11, 12, 13, 14)
DELTA_VALUES = (0, 5, 10, 15, 20)
F_VALUES = (10, 20, 30, 40, 50)

K_DEFAULT = 10
Q_DEFAULT = 10
THETA_DEFAULT = 12
DELTA_DEFAULT = 5
F_DEFAULT = 10

#: Fig. 21/22 update/insert batch sizes.
BETA_VALUES = (100, 150, 200, 250, 300)

#: Network bandwidth used to turn transferred bytes into transmission time
#: (Figs 14/20): the paper states time = bytes / bandwidth at constant
#: bandwidth; we fix 100 Mbit/s.
BANDWIDTH_BYTES_PER_S = 100e6 / 8

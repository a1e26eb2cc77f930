"""Synthetic AV perception substrate.

The paper evaluates on the Lyft Level 5 perception dataset and an
internal TRI dataset — LIDAR scenes densely labeled with 3D boxes by
commercial vendors, plus LIDAR-detector predictions. Neither is
available offline, and Fixy consumes only the *box observations*, so
this subpackage simulates the generating process end to end:

- :mod:`repro.perception.world` — latent ground truth: object tracks
  with class-conditional sizes and kinematics.
- :mod:`repro.perception.labels` — the human labeling vendor, including
  the paper's error taxonomy (whole missing tracks, missing
  observations within tracks) and an exact error manifest.
- :mod:`repro.perception.detector` — the LIDAR detector, including the
  paper's model-error taxonomy (ghost tracks, §8.4's consistent
  high-confidence "subtle" errors).
- :mod:`repro.perception.datasets` — the "lyft" and "internal" dataset
  configurations and end-to-end builders.

See DESIGN.md §2 for why this substitution preserves the paper's
behaviour.
"""

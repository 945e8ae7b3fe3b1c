"""The paper's contribution: mini-batch generation (VPS / METIS-CPS),
structure channel, name channel (NFF), data augmentation, and fusion."""

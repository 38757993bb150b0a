"""Baselines the paper compares against: NFS, AutoFS_R, DL family."""

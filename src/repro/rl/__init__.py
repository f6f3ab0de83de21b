"""From-scratch numpy deep-RL substrate (MLP + PPO) for WOODBLOCK.

The paper trains WOODBLOCK with Ray RLlib's PPO; neither Ray nor a deep
learning framework is available offline, so this package implements the
pieces PPO needs: a shared-trunk policy/value MLP with manual backprop
(:mod:`repro.rl.mlp`) and the PPO clipped-surrogate update with Adam
(:mod:`repro.rl.ppo`). Both are gradient-checked in the test suite.
"""

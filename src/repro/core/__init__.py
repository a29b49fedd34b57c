"""The paper's contribution: upward-route follower search, truss
component tree, and the greedy BASE / BASE+ / GAS anchoring algorithms."""

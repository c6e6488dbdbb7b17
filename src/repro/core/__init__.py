"""The paper's primary contribution: KVCC-ENUM with neighbor/group sweeps."""
